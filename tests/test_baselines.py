"""Baseline summarizer tests: losslessness + evaluated behaviour shape."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines.mosso import mosso
from repro.baselines.randomized import randomized
from repro.baselines.sags import sags
from repro.baselines.sweg import sweg
from repro.graphs import generators as gen
from repro.model.flat import decode_flat_pd


def _lossless(fs, edges):
    got = decode_flat_pd(fs).sort_values(["src", "dst"]).reset_index(drop=True)
    want = edges.sort_values(["src", "dst"]).reset_index(drop=True)
    pd.testing.assert_frame_equal(got, want)


GRAPHS = [
    ("clique", lambda: (gen.clique(8), 8)),
    ("caveman", lambda: (gen.caveman_cliques(36, clique_size=6, p_rewire=0.1, seed=1), 36)),
    ("nested", lambda: (gen.nested_partition(50, levels=2, branching=3, p_top=0.06, ratio=7, seed=2), 50)),
    ("er", lambda: (gen.er(40, 4.0, seed=3), 40)),
]


class TestSweg:
    @pytest.mark.parametrize("name,make", GRAPHS, ids=[n for n, _ in GRAPHS])
    def test_lossless(self, spark, name, make):
        edges, n = make()
        res = sweg(spark, edges, n, T=3, seed=0, engine="local")
        _lossless(res.flat, edges)

    def test_deterministic(self, spark):
        edges, n = gen.caveman_cliques(30, clique_size=6, seed=0), 30
        r1 = sweg(spark, edges, n, T=2, seed=5, engine="local")
        r2 = sweg(spark, edges, n, T=2, seed=5, engine="local")
        assert (r1.flat.group == r2.flat.group).all()

    def test_spark_engine_equals_local(self, spark):
        edges, n = gen.caveman_cliques(30, clique_size=6, seed=1), 30
        rl = sweg(spark, edges, n, T=2, seed=0, engine="local")
        rs = sweg(spark, edges, n, T=2, seed=0, engine="spark")
        assert (rl.flat.group == rs.flat.group).all()

    def test_compresses_cliques(self, spark):
        edges, n = gen.caveman_cliques(36, clique_size=6, p_rewire=0.0, seed=0), 36
        res = sweg(spark, edges, n, T=4, seed=0, engine="local")
        assert res.flat.cost_eq11(len(edges)) < 0.7

    def test_own_objective_never_exceeds_identity(self, spark):
        # SWeG's objective excludes the membership cost |H*| (Eq. 11 adds
        # it when the SLUGGER paper re-measures baselines), so the invariant
        # it maintains is |P| + |C+| + |C−| <= |E|.
        edges, n = gen.path(12), 12
        res = sweg(spark, edges, n, T=3, seed=0, engine="local")
        fs = res.flat
        assert len(fs.p) + len(fs.cp) + len(fs.cn) <= len(edges)
        _lossless(fs, edges)


class TestSags:
    @pytest.mark.parametrize("name,make", GRAPHS[:3], ids=[n for n, _ in GRAPHS[:3]])
    def test_lossless(self, spark, name, make):
        edges, n = make()
        res = sags(spark, edges, n, seed=0)
        _lossless(res.flat, edges)

    def test_deterministic(self, spark):
        edges, n = gen.clique(10), 10
        r1 = sags(spark, edges, n, seed=4)
        r2 = sags(spark, edges, n, seed=4)
        assert (r1.flat.group == r2.flat.group).all()

    def test_merges_identical_neighborhood_nodes(self, spark):
        # a clique gives every node the same signature; p=1 forces merging
        edges, n = gen.clique(10), 10
        res = sags(spark, edges, n, p=1.0, seed=0)
        assert len(set(res.flat.group)) < 10


class TestRandomized:
    @pytest.mark.parametrize("name,make", GRAPHS[:3], ids=[n for n, _ in GRAPHS[:3]])
    def test_lossless(self, spark, name, make):
        edges, n = make()
        res = randomized(spark, edges, n, seed=0)
        assert res.flat is not None
        _lossless(res.flat, edges)

    def test_compresses_cliques_well(self, spark):
        edges, n = gen.caveman_cliques(36, clique_size=6, p_rewire=0.0, seed=0), 36
        res = randomized(spark, edges, n, seed=0)
        assert res.flat.cost_eq11(len(edges)) < 0.7

    def test_oot_returns_none(self, spark):
        edges, n = gen.caveman_cliques(60, clique_size=6, seed=0), 60
        res = randomized(spark, edges, n, seed=0, time_limit_s=0.0)
        assert res.flat is None


class TestMosso:
    @pytest.mark.parametrize("name,make", GRAPHS[:2], ids=[n for n, _ in GRAPHS[:2]])
    def test_lossless(self, spark, name, make):
        edges, n = make()
        res = mosso(spark, edges, n, seed=0)
        assert res.flat is not None
        _lossless(res.flat, edges)

    def test_oot_returns_none(self, spark):
        edges, n = gen.er(60, 5.0, seed=0), 60
        res = mosso(spark, edges, n, seed=0, time_limit_s=0.0)
        assert res.flat is None

    def test_groups_clique_nodes(self, spark):
        edges, n = gen.clique(10), 10
        res = mosso(spark, edges, n, seed=1)
        assert len(set(res.flat.group)) < 10


class TestOrdering:
    """The paper's headline shape: SLUGGER most concise, SAGS least."""

    def test_slugger_beats_sweg_beats_sags_on_hierarchical(self, spark):
        from repro.core.slugger import slugger
        from repro.model.cost import metrics

        edges = gen.nested_partition(90, levels=2, branching=3, p_top=0.05, ratio=9, seed=0)
        n = 90
        sl = slugger(edges, n, T=6, seed=0, engine="local")
        rel_sl = metrics(sl.summary, len(edges)).relative_size
        sw = sweg(spark, edges, n, T=6, seed=0, engine="local")
        rel_sw = sw.flat.cost_eq11(len(edges))
        sa = sags(spark, edges, n, seed=0)
        rel_sa = sa.flat.cost_eq11(len(edges))
        assert rel_sl <= rel_sw + 0.02
        assert rel_sw <= rel_sa + 0.02
