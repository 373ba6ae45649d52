"""Partial decompression (Algorithm 4): neighbors of one subnode without
decoding the whole model.

``NeighborIndex`` precomputes the per-supernode structures Algorithm 4
walks (parents, incident p/n-edges, leaf lists) once; ``neighbors(v)``
then climbs v's ancestor chain, accumulates signed counts over the leaf
sets of adjacent supernodes and returns the subnodes with net count 1.
This is the access path that lets BFS/PageRank/Dijkstra run directly on
a summary (Sect. VIII-C).
"""
from __future__ import annotations

from collections import defaultdict

from .summary import HierSummary


class NeighborIndex:
    """Indexed summary supporting O(output)-ish neighbor queries."""

    def __init__(self, summary: HierSummary):
        self.summary = summary
        self.parent = summary.parent_map()
        self.members = summary.leaf_members()
        self.inc: dict[int, list[tuple[int, int]]] = defaultdict(list)
        for x, y, s in zip(
            summary.pedges["x"].astype(int),
            summary.pedges["y"].astype(int),
            summary.pedges["sign"].astype(int),
        ):
            self.inc[x].append((y, s))
            if x != y:
                self.inc[y].append((x, s))

    def neighbors(self, v: int) -> list[int]:
        """One-hop neighbors of subnode v in the decoded graph (Alg. 4)."""
        count: dict[int, int] = defaultdict(int)
        node = v
        chain = []
        while True:
            chain.append(node)
            if node not in self.parent:
                break
            node = self.parent[node]
        for x in chain:
            for y, s in self.inc.get(x, []):
                if y == x:  # self-loop: covers every member pair incl. v
                    for u in self.members[y]:
                        count[u] += s
                else:
                    for u in self.members[y]:
                        count[u] += s
        out = [u for u, c in count.items() if c == 1 and u != v]
        bad = [u for u, c in count.items() if u != v and c not in (0, 1)]
        assert not bad, f"net coverage outside {{0,1}} at {bad[:5]}"
        return sorted(out)

    def degree(self, v: int) -> int:
        return len(self.neighbors(v))
