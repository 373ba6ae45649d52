"""Dividing root nodes into candidate sets (Sect. III-B2).

Roots are grouped by shingle value; oversized groups are recursively
re-divided with further independent shingles (the paper uses up to 10
levels; shingle collisions make >3 levels moot at our scale) and finally
split randomly so no candidate set exceeds ``max_size`` (paper: 500).
Per-iteration seeds vary the candidate sets across iterations.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from .hashing import shingles_np

MAX_LEVELS = 4
MAX_SIZE = 500


def assign_groups(
    edges: pd.DataFrame,
    leaf_root: np.ndarray,
    seed: int,
    t: int,
    *,
    max_size: int = MAX_SIZE,
) -> pd.DataFrame:
    """(root, gid): candidate-set id per current root."""
    # level-0 shingles define the base grouping; further levels refine
    sh = [shingles_np(edges, leaf_root, seed + 7919 * lvl, t) for lvl in range(MAX_LEVELS)]
    roots = sh[0]["root"].to_numpy()
    cols = np.stack([s.set_index("root").loc[roots, "shingle"].to_numpy() for s in sh], axis=1)
    rng = np.random.default_rng((seed * 31 + t) & 0x7FFFFFFF)

    gid = np.full(len(roots), -1, dtype=np.int64)
    next_gid = 0
    # level-0 shingles are the *primary* grouping (roots sharing a shingle
    # are within distance 2); deeper levels only subdivide oversized groups
    stack: list[tuple[np.ndarray, int]] = [(np.arange(len(roots)), 0)]
    while stack:
        idx, lvl = stack.pop()
        must_split = lvl == 0 or len(idx) > max_size
        if must_split and lvl < MAX_LEVELS:
            vals = cols[idx, lvl]
            order = np.argsort(vals, kind="stable")
            sv = vals[order]
            cuts = np.flatnonzero(np.r_[True, sv[1:] != sv[:-1]])
            ends = np.r_[cuts[1:], len(sv)]
            if lvl == 0 or len(cuts) > 1:
                for s, e in zip(cuts, ends):
                    stack.append((idx[order[s:e]], lvl + 1))
                continue
            # all shingles equal at this level: fall through to the next
            stack.append((idx, lvl + 1))
            continue
        if len(idx) > max_size:  # levels exhausted: random chunking
            perm = rng.permutation(idx)
            for s in range(0, len(perm), max_size):
                gid[perm[s : s + max_size]] = next_gid
                next_gid += 1
            continue
        gid[idx] = next_gid
        next_gid += 1
    assert (gid >= 0).all()
    return pd.DataFrame({"root": roots.astype(np.int64), "gid": gid})
