"""Graph algorithms running directly on a hierarchical summary via
partial decompression (Sect. VIII-C: Algorithms 5 & 6) plus a Spark
PageRank over an edge DataFrame used as the ground-truth comparator.
"""
from __future__ import annotations

import heapq
from collections import deque

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from .neighbors import NeighborIndex


def bfs(idx: NeighborIndex, source: int) -> dict[int, int]:
    """BFS distances from ``source`` over the summary (Alg. 5 analogue)."""
    dist = {source: 0}
    dq = deque([source])
    while dq:
        v = dq.popleft()
        for u in idx.neighbors(v):
            if u not in dist:
                dist[u] = dist[v] + 1
                dq.append(u)
    return dist


def dijkstra_unit(idx: NeighborIndex, source: int) -> dict[int, int]:
    """Dijkstra with unit weights (equals BFS; exercises the PQ path)."""
    dist = {source: 0}
    pq = [(0, source)]
    while pq:
        d, v = heapq.heappop(pq)
        if d > dist.get(v, np.inf):
            continue
        for u in idx.neighbors(v):
            nd = d + 1
            if nd < dist.get(u, np.inf):
                dist[u] = nd
                heapq.heappush(pq, (nd, u))
    return dist


def pagerank_on_summary(
    idx: NeighborIndex, *, d: float = 0.85, iters: int = 20
) -> np.ndarray:
    """Undirected PageRank via neighbor retrieval (Alg. 6)."""
    n = idx.summary.n_sub
    r = np.full(n, 1.0 / n)
    neigh = [idx.neighbors(v) for v in range(n)]
    deg = np.array([len(x) for x in neigh], dtype=np.float64)
    for _ in range(iters):
        new = np.zeros(n)
        for u in range(n):
            if deg[u]:
                share = r[u] / deg[u]
                for w in neigh[u]:
                    new[w] += share
        new = d * new
        new += (1.0 - new.sum()) / n
        r = new
    return r


def triangle_count(idx: NeighborIndex) -> int:
    """Exact triangle count via adjacency-set intersections."""
    n = idx.summary.n_sub
    adj = [set(idx.neighbors(v)) for v in range(n)]
    total = 0
    for v in range(n):
        for u in adj[v]:
            if u > v:
                total += sum(1 for w in adj[v] & adj[u] if w > u)
    return total


def pagerank_spark(
    spark: SparkSession, edges: DataFrame, n: int, *, d: float = 0.85, iters: int = 20
) -> np.ndarray:
    """Ground-truth PageRank over the raw edge DataFrame (Spark joins)."""
    sym = edges.select(F.col("src").alias("u"), F.col("dst").alias("v")).unionByName(
        edges.select(F.col("dst").alias("u"), F.col("src").alias("v"))
    ).persist()
    deg = sym.groupBy("u").agg(F.count("*").alias("deg"))
    ranks = spark.createDataFrame(
        pd.DataFrame({"u": np.arange(n, dtype=np.int64), "r": np.full(n, 1.0 / n)}),
        schema="u long, r double",
    )
    for _ in range(iters):
        contribs = (
            sym.join(ranks, "u")
            .join(deg, "u")
            .select(F.col("v").alias("u"), (F.col("r") / F.col("deg")).alias("c"))
            .groupBy("u")
            .agg(F.sum("c").alias("mass"))
        )
        ranks = (
            ranks.select("u")
            .join(contribs, "u", "left")
            .withColumn("mass", F.coalesce("mass", F.lit(0.0)))
        )
        total = ranks.agg(F.sum(F.lit(d) * F.col("mass")).alias("t")).collect()[0]["t"]
        ranks = ranks.select(
            "u", (F.lit(d) * F.col("mass") + F.lit((1.0 - total) / n)).alias("r")
        )
    out = ranks.toPandas().sort_values("u")
    sym.unpersist()
    return out["r"].to_numpy()
