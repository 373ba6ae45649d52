"""RANDOMIZED baseline (Navlakha et al., SIGMOD'08).

Repeats: pick a random unfinished supernode u, evaluate the cost
reduction of merging u with every supernode within 2 hops, merge the
best if it reduces cost, otherwise finalize u. Exact flat-model costs
throughout. Inherently sequential (driver-side); the paper's experiments
show it timing out on larger graphs, which a wall-clock budget here
reproduces (a ``None`` return = OOT, shown as "—" in the tables).
"""
from __future__ import annotations

import random
import time
from collections import defaultdict
from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..model.flat import FlatSummary
from .flat_encode import encode_flat


@dataclass
class RandomizedResult:
    flat: FlatSummary | None  # None = ran out of time
    elapsed_s: float


def _merged_counts(
    cnt: dict[int, dict[int, int]], u: int, v: int
) -> dict[int, int]:
    """Counts of U = u∪v. The symmetric store holds the (u, v) cross count
    in both dicts, so the self-count is assembled explicitly
    (E_UU = E_uu + E_vv + E_uv)."""
    merged: dict[int, int] = defaultdict(int)
    for x, e in cnt[u].items():
        if x not in (u, v):
            merged[x] += e
    for x, e in cnt[v].items():
        if x not in (u, v):
            merged[x] += e
    self_cnt = cnt[u].get(u, 0) + cnt[v].get(v, 0) + cnt[u].get(v, 0)
    if self_cnt:
        merged[u] = self_cnt
    return merged


def _cost(cnt: dict[int, int], sizes: dict[int, int], a: int) -> int:
    sa = sizes[a]
    total = 0
    for x, e in cnt.items():
        if e <= 0:
            continue
        t = sa * (sa - 1) // 2 if x == a else sa * sizes[x]
        total += min(e, t - e + 1)
    return total


def randomized(
    spark: SparkSession,
    edges: pd.DataFrame,
    n_sub: int,
    *,
    seed: int = 0,
    time_limit_s: float = 600.0,
    max_candidates: int = 200,
) -> RandomizedResult:
    t0 = time.perf_counter()
    rng = random.Random(seed)
    # supernode-level state
    parent: dict[int, int] = {}

    def find(v: int) -> int:
        while v in parent:
            v = parent[v]
        return v

    sizes: dict[int, int] = {u: 1 for u in range(n_sub)}
    cnt: dict[int, dict[int, int]] = {u: defaultdict(int) for u in range(n_sub)}
    for s, d in zip(edges["src"].astype(int), edges["dst"].astype(int)):
        cnt[s][d] += 1
        cnt[d][s] += 1
    unfinished = set(range(n_sub))
    while unfinished:
        if time.perf_counter() - t0 > time_limit_s:
            return RandomizedResult(flat=None, elapsed_s=time.perf_counter() - t0)
        u = rng.choice(tuple(unfinished))
        # 2-hop candidate supernodes
        hop1 = [x for x in cnt[u] if x != u]
        cands: set[int] = set(hop1)
        for x in hop1:
            cands.update(y for y in cnt[x] if y != x)
        cands.discard(u)
        if len(cands) > max_candidates:
            cands = set(rng.sample(sorted(cands), max_candidates))
        cu = _cost(cnt[u], sizes, u)
        best, best_s = None, 0.0
        for v in cands:
            cv = _cost(cnt[v], sizes, v)
            if cu + cv == 0:
                continue
            merged = _merged_counts(cnt, u, v)
            su = sizes[u] + sizes[v]
            cm = 0
            for x, e in merged.items():
                if e <= 0:
                    continue
                t = su * (su - 1) // 2 if x == u else su * sizes[x]
                cm += min(e, t - e + 1)
            s = (cu + cv - cm) / (cu + cv)
            if s > best_s:
                best, best_s = v, s
        if best is None:
            unfinished.discard(u)
            continue
        v = best
        merged = _merged_counts(cnt, u, v)
        cnt[u] = defaultdict(int, merged)
        for x in list(merged.keys()):
            if x != u:
                m = cnt[x]
                m[u] = m.pop(u, 0) + m.pop(v, 0)
        del cnt[v]
        sizes[u] += sizes[v]
        del sizes[v]
        parent[v] = u
        unfinished.discard(v)
        unfinished.add(u)
    group = np.array([find(u) for u in range(n_sub)], dtype=np.int64)
    flat = encode_flat(spark, edges, group)
    return RandomizedResult(flat=flat, elapsed_s=time.perf_counter() - t0)
