"""Graph utilities over canonical edge DataFrames (Spark and pandas).

Edges are always simple undirected, stored once with ``src < dst``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


def symmetrize(edges: DataFrame) -> DataFrame:
    """Both orientations of a canonical edge list: columns (u, v)."""
    return edges.select(F.col("src").alias("u"), F.col("dst").alias("v")).unionByName(
        edges.select(F.col("dst").alias("u"), F.col("src").alias("v"))
    )


def degrees(edges: DataFrame) -> DataFrame:
    """Per-node degree: columns (u, deg)."""
    return symmetrize(edges).groupBy("u").agg(F.count("*").alias("deg"))


def canonicalize_pd(edges: pd.DataFrame) -> pd.DataFrame:
    """Canonicalize a pandas edge list (order endpoints, dedup, drop loops)."""
    lo = np.minimum(edges["src"].to_numpy(), edges["dst"].to_numpy())
    hi = np.maximum(edges["src"].to_numpy(), edges["dst"].to_numpy())
    df = pd.DataFrame({"src": lo, "dst": hi})
    df = df[df["src"] != df["dst"]].drop_duplicates().reset_index(drop=True)
    return df.astype({"src": np.int64, "dst": np.int64})


def edge_key(edges: pd.DataFrame, n: int) -> np.ndarray:
    """Sorted int64 keys src*n+dst — O(1) membership via np.isin/searchsorted."""
    return np.sort(edges["src"].to_numpy(dtype=np.int64) * n + edges["dst"].to_numpy())


def induced_subgraph(edges: pd.DataFrame, nodes: np.ndarray) -> pd.DataFrame:
    """Subgraph induced by ``nodes``, relabeled to 0..len(nodes)-1."""
    nodes = np.asarray(sorted(set(nodes.tolist())))
    remap = {v: i for i, v in enumerate(nodes)}
    m = edges[edges["src"].isin(remap) & edges["dst"].isin(remap)].copy()
    m["src"] = m["src"].map(remap)
    m["dst"] = m["dst"].map(remap)
    return canonicalize_pd(m)


def sample_nodes_subgraph(edges: pd.DataFrame, frac: float, *, seed: int = 0) -> pd.DataFrame:
    """Node-sampled subgraph (the paper's Fig 1b scalability protocol:
    'sampling different numbers of nodes from the UK-05 dataset')."""
    g = np.random.default_rng(seed)
    n = int(max(edges["src"].max(), edges["dst"].max())) + 1
    keep = g.random(n) < frac
    nodes = np.flatnonzero(keep)
    return induced_subgraph(edges, nodes)


def adjacency_dict(edges: pd.DataFrame) -> dict[int, set[int]]:
    """Adjacency sets for driver-side algorithms (small graphs only)."""
    adj: dict[int, set[int]] = {}
    for s, d in zip(edges["src"].to_numpy(), edges["dst"].to_numpy()):
        adj.setdefault(int(s), set()).add(int(d))
        adj.setdefault(int(d), set()).add(int(s))
    return adj


def to_pandas_edges(spark_edges: DataFrame) -> pd.DataFrame:
    """Collect a Spark edge DataFrame into canonical pandas form."""
    return canonicalize_pd(spark_edges.toPandas())


def spark_edges(spark: SparkSession, edges: pd.DataFrame) -> DataFrame:
    """Create the canonical Spark edge DataFrame from pandas edges."""
    return spark.createDataFrame(edges[["src", "dst"]], schema="src long, dst long")
