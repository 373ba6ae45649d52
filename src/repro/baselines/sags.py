"""SAGS baseline (Khan et al. / Beg et al., PAKDD'18) — LSH-based.

SAGS skips cost evaluation entirely: it buckets nodes by banded min-hash
signatures of their neighborhoods (h hash functions, b bands) and merges
bucket-mates blindly with probability p. This makes it the fastest and
least concise method in the paper's evaluation — the behaviour this
reproduction preserves. Paper settings: h=30, b=10, p=0.3.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..core.hashing import P31
from ..model.flat import FlatSummary
from .flat_encode import encode_flat


@dataclass
class SagsResult:
    flat: FlatSummary
    elapsed_s: float


def sags(
    spark: SparkSession,
    edges: pd.DataFrame,
    n_sub: int,
    *,
    h: int = 30,
    b: int = 10,
    p: float = 0.3,
    seed: int = 0,
) -> SagsResult:
    t0 = time.perf_counter()
    g = np.random.default_rng(seed)
    src = edges["src"].to_numpy(dtype=np.int64)
    dst = edges["dst"].to_numpy(dtype=np.int64)
    # h min-hash signatures of N(v) ∪ {v}
    sig = np.empty((h, n_sub), dtype=np.int64)
    for i in range(h):
        a = int(g.integers(1, P31))
        c = int(g.integers(0, P31))
        hv = (a * np.arange(n_sub, dtype=np.int64) + c) % P31
        m = hv.copy()
        np.minimum.at(m, src, hv[dst])
        np.minimum.at(m, dst, hv[src])
        sig[i] = m
    r = h // b  # rows per band
    parent: dict[int, int] = {}

    def find(v: int) -> int:
        while v in parent:
            v = parent[v]
        return v

    for band in range(b):
        rows = sig[band * r : (band + 1) * r]
        # bucket nodes on the band slice
        df = pd.DataFrame({"key": [tuple(rows[:, v]) for v in range(n_sub)]})
        for _, idx in df.groupby("key").groups.items():
            members = list({find(int(v)) for v in idx})
            if len(members) < 2:
                continue
            g.shuffle(members)
            # blind chain-merging with probability p per bucket-mate
            head = members[0]
            for v in members[1:]:
                if g.random() < p:
                    parent[v] = head
    group = np.array([find(u) for u in range(n_sub)], dtype=np.int64)
    flat = encode_flat(spark, edges, group)
    return SagsResult(flat=flat, elapsed_s=time.perf_counter() - t0)
