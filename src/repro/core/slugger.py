"""SLUGGER driver (Algorithm 1): T rounds of candidate generation +
group-parallel merging + global consolidation, then pruning.

The per-iteration dataflow (DESIGN.md §3.2):

1. shingle-based candidate sets over current roots (numpy fast path; the
   Spark twin in :mod:`repro.core.hashing` is equivalence-tested);
2. a tall (gid, kind, x, y, v) DataFrame ships each group its member
   trees, intra-group p/n-edges, read-only external edges and root-level
   G-adjacency;
3. ``groupBy("gid").applyInPandas(run_group)`` runs Algorithm 2 per
   candidate set in parallel across Spark partitions
   (``engine="local"`` runs the identical worker in-process for tests);
4. cross-group edges are lifted by :func:`repro.core.consolidate.consolidate`;
5. driver state (supernode forest + edge tables) is re-materialized —
   the checkpoint between iterations.

``hb`` > 0 enables the Table-V height-bound variant. ``snapshot_ts``
yields pruned summaries at intermediate iteration counts so one T=40 run
produces the whole Table-III row.
"""
from __future__ import annotations

import time
from collections import defaultdict
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..model.summary import HierSummary, empty_hedges
from . import candidates, groupmerge
from .consolidate import consolidate
from .pruning import prune


@dataclass
class SluggerResult:
    """Final summary plus optional per-snapshot pruned summaries."""

    summary: HierSummary
    elapsed_s: float
    snapshots: dict[int, HierSummary] = field(default_factory=dict)


class _DriverState:
    """Driver-side forest + edge tables between iterations."""

    def __init__(self, edges: pd.DataFrame, n_sub: int):
        self.n_sub = n_sub
        self.size: dict[int, int] = {u: 1 for u in range(n_sub)}
        self.children: dict[int, list[int]] = {}
        self.parent: dict[int, int] = {}
        # tree_tag[nid] = root label at nid's creation; root_up chains to now
        self.tree_tag: dict[int, int] = {}
        self.root_up: dict[int, int] = {}
        self.pedges: list[tuple[int, int, int]] = [
            (int(s), int(d), 1) for s, d in zip(edges["src"], edges["dst"])
        ]
        self.leaf_root = np.arange(n_sub, dtype=np.int64)

    def current_root(self, nid: int) -> int:
        r = self.tree_tag.get(nid, nid)
        while r in self.root_up:
            up = self.root_up[r]
            if up in self.root_up:
                self.root_up[r] = self.root_up[up]
            r = self.root_up[r]
        return r

    def apply_merges(self, merges: list[tuple[int, int, int]]) -> None:
        for a, b, u in merges:
            self.children[u] = [a, b]
            self.parent[a] = u
            self.parent[b] = u
            self.size[u] = self.size[a] + self.size[b]
            self.tree_tag[u] = u
            self.root_up[a] = u
            self.root_up[b] = u
        # refresh the leaf -> root array once per round
        remap: dict[int, int] = {}
        for i in range(self.n_sub):
            r = int(self.leaf_root[i])
            if r not in remap:
                remap[r] = self.current_root(r)
            self.leaf_root[i] = remap[r]

    def to_summary(self) -> HierSummary:
        nids = sorted(self.size)
        nodes = pd.DataFrame(
            {"nid": np.array(nids, dtype=np.int64),
             "size": np.array([self.size[v] for v in nids], dtype=np.int64)}
        )
        if self.parent:
            childs = sorted(self.parent)
            hedges = pd.DataFrame(
                {"parent": np.array([self.parent[c] for c in childs], dtype=np.int64),
                 "child": np.array(childs, dtype=np.int64)}
            )
        else:
            hedges = empty_hedges()
        pe = sorted((min(x, y), max(x, y), s) for x, y, s in self.pedges)
        pedges = pd.DataFrame(
            {"x": np.array([e[0] for e in pe], dtype=np.int64),
             "y": np.array([e[1] for e in pe], dtype=np.int64),
             "sign": np.array([e[2] for e in pe], dtype=np.int64)}
        )
        return HierSummary(n_sub=self.n_sub, nodes=nodes, hedges=hedges, pedges=pedges)


def _tall_rows(state: _DriverState, edges: pd.DataFrame, gid_of: dict[int, int]):
    """Build the tall worker-input rows and the read-only cross edge list."""
    rows: list[tuple[int, str, int, int, int]] = []
    # roots + their trees
    node_root: dict[int, int] = {}
    for r, g in gid_of.items():
        rows.append((g, "root", r, 0, 0))
        stack = [r]
        while stack:
            v = stack.pop()
            node_root[v] = r
            rows.append((g, "node", v, state.size[v], r))
            for c in state.children.get(v, []):
                rows.append((g, "hedge", v, c, 0))
                stack.append(c)
    # p/n-edges: intra-group vs cross-group
    cross: list[tuple[int, int, int]] = []
    for x, y, s in state.pedges:
        rx, ry = node_root[x], node_root[y]
        gx, gy = gid_of[rx], gid_of[ry]
        if gx == gy:
            rows.append((gx, "pedge", x, y, s))
        else:
            cross.append((x, y, s))
            rows.append((gx, "ext", x, y, s))
            rows.append((gy, "ext", y, x, s))
    # root-level G-adjacency (distance filter); both directions
    lr = state.leaf_root
    ra = lr[edges["src"].to_numpy()]
    rb = lr[edges["dst"].to_numpy()]
    mask = ra != rb
    pairs = set(zip(ra[mask].tolist(), rb[mask].tolist()))
    for x, y in pairs:
        rows.append((gid_of[x], "radj", x, y, 0))
        rows.append((gid_of[y], "radj", y, x, 0))
    tall = pd.DataFrame(rows, columns=["gid", "kind", "x", "y", "v"])
    tall[["gid", "x", "y", "v"]] = tall[["gid", "x", "y", "v"]].astype(np.int64)
    return tall, cross


def _run_round(
    state: _DriverState,
    edges: pd.DataFrame,
    t: int,
    big_t: int,
    seed: int,
    hb: int,
    engine: str,
    spark: SparkSession | None,
) -> None:
    groups = candidates.assign_groups(edges, state.leaf_root, seed, t)
    gid_of = dict(zip(groups["root"].astype(int), groups["gid"].astype(int)))
    tall, cross = _tall_rows(state, edges, gid_of)
    if engine == "spark":
        assert spark is not None, "engine='spark' needs a SparkSession"
        tall_df = spark.createDataFrame(tall, schema=groupmerge.TALL_SCHEMA)
        out = (
            tall_df.groupBy("gid")
            .applyInPandas(
                lambda pdf: groupmerge.run_group(pdf, t, big_t, seed, hb),
                schema=groupmerge.OUT_SCHEMA,
            )
            .toPandas()
        )
    else:
        parts = [
            groupmerge.run_group(g, t, big_t, seed, hb)
            for _, g in tall.groupby("gid", sort=True)
        ]
        out = (
            pd.concat(parts, ignore_index=True)
            if parts
            else pd.DataFrame(columns=["gid", "kind", "x", "y", "v"])
        )
    merges = [
        (int(r.x), int(r.y), int(r.v))
        for r in out[out["kind"] == "merge"].itertuples()
    ]
    intra = [
        (int(r.x), int(r.y), int(r.v))
        for r in out[out["kind"] == "pedge"].itertuples()
    ]
    state.apply_merges(merges)
    lifted = consolidate(cross, state.children) if cross else []
    state.pedges = intra + [tuple(e) for e in lifted]


def slugger(
    edges: pd.DataFrame,
    n_sub: int,
    *,
    T: int = 20,
    seed: int = 0,
    hb: int = 0,
    engine: str = "local",
    spark: SparkSession | None = None,
    prune_cycles: int = 2,
    do_prune: bool = True,
    snapshot_ts: tuple[int, ...] = (),
) -> SluggerResult:
    """Run SLUGGER on a canonical pandas edge list.

    ``hb``: height bound (0 = unlimited, Table V). ``engine``: "spark"
    (groups via applyInPandas) or "local" (same worker, in-process).
    ``snapshot_ts``: iteration counts at which to snapshot a *pruned copy*
    of the state (Table III); the run continues unaffected.
    """
    t0 = time.perf_counter()
    state = _DriverState(edges, n_sub)
    snapshots: dict[int, HierSummary] = {}
    for t in range(1, T + 1):
        _run_round(state, edges, t, T, seed, hb, engine, spark)
        if t in snapshot_ts and t != T:
            snap = prune(state.to_summary(), edges, cycles=prune_cycles)
            snapshots[t] = snap
    summary = state.to_summary()
    if do_prune:
        summary = prune(summary, edges, cycles=prune_cycles)
    if T in snapshot_ts:
        snapshots[T] = summary
    return SluggerResult(
        summary=summary, elapsed_s=time.perf_counter() - t0, snapshots=snapshots
    )
