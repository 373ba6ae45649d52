"""Decoder tests: pandas/Spark agreement, oracle cross-checks, and the
net-coverage guard that catches encoding bugs."""
import pandas as pd
import pytest

from repro.core.slugger import slugger
from repro.graphs import generators as gen
from repro.model.decode import assert_lossless_pd, decode, decode_pd, membership_df
from repro.model.summary import HierSummary
from repro.oracle import assert_equivalent


def hier_example() -> tuple[HierSummary, pd.DataFrame]:
    """Fig.2-style example: {0,1} and {2,3} under {0,1,2,3}; node 5 linked
    to all of {0,1,2,3} except 2 and 3 via p-edge + n-edge."""
    nodes = pd.DataFrame(
        {"nid": [0, 1, 2, 3, 4, 5, 10, 11, 12],
         "size": [1, 1, 1, 1, 1, 1, 2, 2, 4]}
    )
    hedges = pd.DataFrame(
        {"parent": [10, 10, 11, 11, 12, 12], "child": [0, 1, 2, 3, 10, 11]}
    )
    pedges = pd.DataFrame(
        {"x": [12, 11, 12], "y": [12, 5, 5], "sign": [1, -1, 1]}
    )
    s = HierSummary(n_sub=6, nodes=nodes, hedges=hedges, pedges=pedges)
    # expected: clique on {0,1,2,3} (p-loop on 12) plus edges 0-5, 1-5
    want = pd.DataFrame(
        {"src": [0, 0, 0, 1, 1, 2, 0, 1],
         "dst": [1, 2, 3, 2, 3, 3, 5, 5]}
    )
    return s, want


class TestDecodePandas:
    def test_identity_roundtrip(self):
        e = gen.er(40, 4.0, seed=0)
        s = HierSummary.identity(e, 40)
        assert_lossless_pd(s, e)

    def test_hierarchical_example(self):
        s, want = hier_example()
        got = decode_pd(s)
        pd.testing.assert_frame_equal(
            got, want.sort_values(["src", "dst"]).reset_index(drop=True).astype("int64")
        )

    def test_paper_interpretation_p_minus_n(self):
        # p-edge (supernode, 5) + n-edge (child supernode, 5): net 0 on the
        # masked pairs, net 1 elsewhere — the Fig. 2 semantics
        s, _ = hier_example()
        got = decode_pd(s)
        pairs = set(zip(got["src"], got["dst"]))
        assert (0, 5) in pairs and (1, 5) in pairs
        assert (2, 5) not in pairs and (3, 5) not in pairs

    def test_net_guard_triggers_on_double_cover(self):
        nodes = pd.DataFrame({"nid": [0, 1, 10], "size": [1, 1, 2]})
        hedges = pd.DataFrame({"parent": [10, 10], "child": [0, 1]})
        pedges = pd.DataFrame({"x": [0, 10], "y": [1, 10], "sign": [1, 1]})
        s = HierSummary(n_sub=2, nodes=nodes, hedges=hedges, pedges=pedges)
        with pytest.raises(AssertionError, match="net coverage"):
            decode_pd(s)


class TestDecodeSpark:
    def test_matches_pandas_on_summary(self, spark):
        e = gen.nested_partition(50, levels=2, branching=3, p_top=0.06, ratio=6, seed=1)
        res = slugger(e, 50, T=4, seed=0, engine="local")
        got_pd = decode_pd(res.summary)
        got_sp = decode(spark, res.summary).toPandas().sort_values(["src", "dst"]).reset_index(drop=True)
        pd.testing.assert_frame_equal(got_sp, got_pd)

    def test_oracle_roundtrip(self, spark):
        e = gen.caveman_cliques(40, clique_size=6, p_rewire=0.1, seed=2)
        res = slugger(e, 40, T=4, seed=0, engine="local")
        assert_equivalent(
            decode(spark, res.summary),
            "SELECT src, dst FROM e",
            e=e,
        )

    def test_membership_closure_spark(self, spark):
        s, _ = hier_example()
        mem = membership_df(spark, s).toPandas()
        got = set(zip(mem["sub"], mem["sup"]))
        assert (0, 12) in got and (2, 11) in got and (5, 5) in got
        assert all((u, u) in got for u in range(6))

    def test_empty_pedges_decodes_empty(self, spark):
        s = HierSummary.identity(gen.path(3).iloc[0:0], 3)
        assert decode(spark, s).count() == 0
