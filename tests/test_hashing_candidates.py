"""Shingle and candidate-set tests, including numpy/Spark equivalence."""
import numpy as np
import pandas as pd
import pytest

from repro.core import candidates
from repro.core.hashing import P31, hash_params, node_hash_np, shingles_np, shingles_spark
from repro.graphs import generators as gen
from repro.graphs.ops import spark_edges


class TestHash:
    def test_params_deterministic(self):
        assert hash_params(3, 5) == hash_params(3, 5)

    def test_params_vary_with_iteration(self):
        assert hash_params(3, 5) != hash_params(3, 6)

    def test_node_hash_range(self):
        h = node_hash_np(100, *hash_params(0, 1))
        assert (h >= 0).all() and (h < P31).all()
        assert len(set(h.tolist())) == 100  # injective at this size whp


class TestShingles:
    def test_star_spokes_share_shingle(self):
        e = gen.star(10)
        lr = np.arange(10, dtype=np.int64)
        sh = shingles_np(e, lr, seed=0, t=1).set_index("root")["shingle"]
        # every spoke's neighborhood includes the hub -> min over {hub, self}
        hub_h = node_hash_np(10, *hash_params(0, 1))[0]
        assert (sh.loc[1:] <= max(hub_h, sh.loc[1:].max())).all()

    def test_clique_all_equal(self):
        e = gen.clique(8)
        lr = np.arange(8, dtype=np.int64)
        sh = shingles_np(e, lr, seed=0, t=1)
        assert sh["shingle"].nunique() == 1

    def test_root_granularity(self):
        e = gen.clique(6)
        lr = np.array([0, 0, 0, 1, 1, 1], dtype=np.int64)
        sh = shingles_np(e, lr, seed=0, t=2)
        assert sorted(sh["root"]) == [0, 1]

    def test_isolated_node_gets_own_hash(self):
        e = pd.DataFrame({"src": [0], "dst": [1]})
        lr = np.arange(3, dtype=np.int64)
        sh = shingles_np(e, lr, seed=0, t=1).set_index("root")["shingle"]
        h = node_hash_np(3, *hash_params(0, 1))
        assert sh.loc[2] == h[2]

    def test_spark_equals_numpy(self, spark):
        e = gen.nested_partition(50, levels=2, branching=3, p_top=0.06, ratio=6, seed=1)
        lr = np.arange(50, dtype=np.int64)
        lr[25:] = 25 + (np.arange(25) // 5) * 5  # some merged roots
        got_np = shingles_np(e, lr, seed=3, t=2).sort_values("root").reset_index(drop=True)
        got_sp = shingles_spark(
            spark, spark_edges(spark, e),
            pd.DataFrame({"sub": np.arange(50, dtype=np.int64), "root": lr}),
            seed=3, t=2,
        )
        pd.testing.assert_frame_equal(
            got_sp.astype({"shingle": np.int64}), got_np.astype({"shingle": np.int64})
        )


class TestCandidateSets:
    def test_partition_of_roots(self):
        e = gen.er(80, 5.0, seed=0)
        lr = np.arange(80, dtype=np.int64)
        g = candidates.assign_groups(e, lr, seed=0, t=1)
        assert sorted(g["root"]) == list(range(80))
        assert (g["gid"] >= 0).all()

    def test_max_size_respected(self):
        e = gen.clique(60)  # all shingles equal -> forced random splitting
        lr = np.arange(60, dtype=np.int64)
        g = candidates.assign_groups(e, lr, seed=0, t=1, max_size=10)
        assert g.groupby("gid").size().max() <= 10

    def test_varies_with_iteration(self):
        e = gen.er(100, 6.0, seed=0)
        lr = np.arange(100, dtype=np.int64)
        g1 = candidates.assign_groups(e, lr, seed=0, t=1)
        g2 = candidates.assign_groups(e, lr, seed=0, t=2)
        m1 = dict(zip(g1["root"], g1["gid"]))
        m2 = dict(zip(g2["root"], g2["gid"]))
        same1 = {(a, b) for a in range(100) for b in range(a + 1, 100) if m1[a] == m1[b]}
        same2 = {(a, b) for a in range(100) for b in range(a + 1, 100) if m2[a] == m2[b]}
        assert same1 != same2

    def test_deterministic(self):
        e = gen.er(60, 4.0, seed=1)
        lr = np.arange(60, dtype=np.int64)
        pd.testing.assert_frame_equal(
            candidates.assign_groups(e, lr, seed=2, t=3),
            candidates.assign_groups(e, lr, seed=2, t=3),
        )

    def test_groups_many_spokes_together(self):
        # spokes hashing above the hub share the hub's shingle, so a large
        # candidate set of identical-neighborhood spokes forms (in
        # expectation half of them; later iterations re-roll the hash)
        e = gen.star(20)
        lr = np.arange(20, dtype=np.int64)
        g = candidates.assign_groups(e, lr, seed=0, t=1)
        biggest = g.groupby("gid").size().max()
        assert biggest >= 5

    def test_same_shingle_means_same_group_when_small(self):
        from repro.core.hashing import shingles_np

        e = gen.er(60, 5.0, seed=2)
        lr = np.arange(60, dtype=np.int64)
        sh = shingles_np(e, lr, seed=0, t=1).set_index("root")["shingle"]
        g = candidates.assign_groups(e, lr, seed=0, t=1)
        gids = dict(zip(g["root"], g["gid"]))
        for a in range(60):
            for b in range(a + 1, 60):
                if sh[a] == sh[b]:
                    assert gids[a] == gids[b]
