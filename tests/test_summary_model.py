"""HierSummary container invariants and derived structure."""
import numpy as np
import pandas as pd
import pytest

from repro.graphs import generators as gen
from repro.model.summary import HierSummary, empty_hedges, empty_pedges


def tiny_summary() -> HierSummary:
    """{0,1} under supernode 10, {2} free; one p-edge (10, 2)."""
    nodes = pd.DataFrame({"nid": [0, 1, 2, 10], "size": [1, 1, 1, 2]})
    hedges = pd.DataFrame({"parent": [10, 10], "child": [0, 1]})
    pedges = pd.DataFrame({"x": [2], "y": [10], "sign": [1]})
    return HierSummary(n_sub=3, nodes=nodes, hedges=hedges, pedges=pedges)


class TestIdentity:
    def test_identity_matches_graph(self):
        e = gen.clique(5)
        s = HierSummary.identity(e, 5)
        assert len(s.pedges) == len(e)
        assert len(s.hedges) == 0
        assert (s.pedges["sign"] == 1).all()
        s.validate()

    def test_identity_roots_are_singletons(self):
        s = HierSummary.identity(gen.path(4), 4)
        assert sorted(s.roots()) == [0, 1, 2, 3]


class TestDerived:
    def test_parent_children_maps(self):
        s = tiny_summary()
        assert s.parent_map() == {0: 10, 1: 10}
        assert s.children_map() == {10: [0, 1]}

    def test_roots(self):
        assert sorted(tiny_summary().roots()) == [2, 10]

    def test_leaf_members(self):
        m = tiny_summary().leaf_members()
        assert m[10] == [0, 1] and m[2] == [2]

    def test_membership_closure(self):
        mem = tiny_summary().membership()
        got = set(zip(mem["sub"], mem["sup"]))
        assert got == {(0, 0), (0, 10), (1, 1), (1, 10), (2, 2)}


class TestValidate:
    def test_ok(self):
        tiny_summary().validate()

    def test_detects_size_mismatch(self):
        s = tiny_summary()
        s.nodes.loc[s.nodes["nid"] == 10, "size"] = 5
        with pytest.raises(AssertionError, match="size"):
            s.validate()

    def test_detects_two_parents(self):
        s = tiny_summary()
        s.nodes = pd.concat(
            [s.nodes, pd.DataFrame({"nid": [11], "size": [1]})], ignore_index=True
        )
        s.hedges = pd.concat(
            [s.hedges, pd.DataFrame({"parent": [11], "child": [0]})], ignore_index=True
        )
        with pytest.raises(AssertionError):
            s.validate()

    def test_detects_childless_internal(self):
        s = tiny_summary()
        s.hedges = empty_hedges()
        with pytest.raises(AssertionError, match="children"):
            s.validate()

    def test_detects_bad_sign(self):
        s = tiny_summary()
        s.pedges.loc[0, "sign"] = 2
        with pytest.raises(AssertionError, match="sign"):
            s.validate()

    def test_detects_noncanonical_pedge(self):
        s = tiny_summary()
        s.pedges = pd.DataFrame({"x": [10], "y": [2], "sign": [1]})
        with pytest.raises(AssertionError, match="canonical"):
            s.validate()

    def test_detects_duplicate_pedge(self):
        s = tiny_summary()
        s.pedges = pd.DataFrame({"x": [2, 2], "y": [10, 10], "sign": [1, 1]})
        with pytest.raises(AssertionError, match="duplicate"):
            s.validate()

    def test_copy_is_deep(self):
        s = tiny_summary()
        c = s.copy()
        c.pedges.loc[0, "sign"] = -1
        assert s.pedges.loc[0, "sign"] == 1
