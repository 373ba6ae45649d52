"""Min-hash shingles for candidate generation (Sect. III-B2, as in SWeG).

The shingle of a root A at iteration t is
``f_t(A) = min_{u ∈ A} min_{v ∈ N(u) ∪ {u}} h_t(v)``
over a per-iteration universal hash ``h_t(v) = (a·v + b) mod p`` with
p = 2^31 − 1. Roots sharing a shingle share a neighbor (or a node), so
they are within distance 2 — the only pairs whose merger can reduce the
encoding cost (Lemma 1).

Two equivalent implementations: a vectorized numpy path used inside the
driver loop, and a Spark DataFrame path (`shingles_spark`) exercising
the shuffle; a test pins them equal.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

P31 = (1 << 31) - 1  # Mersenne prime 2^31 - 1


def hash_params(seed: int, t: int) -> tuple[int, int]:
    """Per-(run, iteration) coefficients of the linear hash."""
    g = np.random.default_rng((seed * 1_000_003 + t) & 0x7FFFFFFF)
    return int(g.integers(1, P31)), int(g.integers(0, P31))


def node_hash_np(n: int, a: int, b: int) -> np.ndarray:
    v = np.arange(n, dtype=np.int64)
    return (a * v + b) % P31


def shingles_np(
    edges: pd.DataFrame, leaf_root: np.ndarray, seed: int, t: int
) -> pd.DataFrame:
    """(root, shingle) for every current root — numpy fast path."""
    n = len(leaf_root)
    a, b = hash_params(seed, t)
    h = node_hash_np(n, a, b)
    m = h.copy()
    src = edges["src"].to_numpy(dtype=np.int64)
    dst = edges["dst"].to_numpy(dtype=np.int64)
    np.minimum.at(m, src, h[dst])
    np.minimum.at(m, dst, h[src])
    df = pd.DataFrame({"root": leaf_root, "m": m})
    out = df.groupby("root", as_index=False)["m"].min()
    return out.rename(columns={"m": "shingle"})


def shingles_spark(
    spark: SparkSession, edges: DataFrame, leaf_root: pd.DataFrame, seed: int, t: int
) -> pd.DataFrame:
    """Spark twin of :func:`shingles_np`.

    ``edges``: (src, dst); ``leaf_root``: pandas (sub, root).
    """
    a, b = hash_params(seed, t)
    lr = spark.createDataFrame(leaf_root, schema="sub long, root long")
    hcol = lambda c: (F.lit(a) * F.col(c) + F.lit(b)) % F.lit(P31)  # noqa: E731
    sym = edges.select(F.col("src").alias("u"), F.col("dst").alias("v")).unionByName(
        edges.select(F.col("dst").alias("u"), F.col("src").alias("v"))
    )
    neigh_min = (
        sym.withColumn("hv", hcol("v")).groupBy("u").agg(F.min("hv").alias("mn"))
    )
    per_node = (
        lr.withColumnRenamed("sub", "u")
        .join(neigh_min, "u", "left")
        .withColumn("hu", hcol("u"))
        .withColumn("m", F.least(F.coalesce("mn", "hu"), "hu"))
    )
    out = per_node.groupBy("root").agg(F.min("m").alias("shingle"))
    return out.toPandas().sort_values("root").reset_index(drop=True)
