"""Unified experiment runner: one call = one (method, dataset) cell.

Every method returns the same record shape so the table builders in
:mod:`repro.eval.tables` can mix hierarchical (SLUGGER, Eq. 10) and flat
(baselines, Eq. 11) results. ``None``-valued metrics mark OOT runs (the
paper reports those as missing bars).
"""
from __future__ import annotations

import time
from typing import Any

import pandas as pd
from pyspark.sql import SparkSession

from ..baselines.mosso import mosso
from ..baselines.randomized import randomized
from ..baselines.sags import sags
from ..baselines.sweg import sweg
from ..core.slugger import slugger
from ..graphs import datasets
from ..graphs.generators import n_nodes
from ..model.cost import metrics

METHODS = ["slugger", "sweg", "sags", "randomized", "mosso"]


def load_dataset(name: str, scale: str, seed: int) -> tuple[pd.DataFrame, int]:
    edges = datasets.load(name, scale=scale, seed=seed)
    return edges, n_nodes(edges)


def run_method(
    spark: SparkSession | None,
    method: str,
    edges: pd.DataFrame,
    n_sub: int,
    *,
    seed: int = 0,
    T: int = 20,
    engine: str = "local",
    time_limit_s: float = 600.0,
    **kw: Any,
) -> dict:
    """Run one summarizer; returns {method, relative_size, elapsed_s, ...}."""
    m_edges = len(edges)
    t0 = time.perf_counter()
    if method == "slugger":
        res = slugger(edges, n_sub, T=T, seed=seed, engine=engine, spark=spark, **kw)
        met = metrics(res.summary, m_edges)
        elapsed = res.elapsed_s
    elif method == "sweg":
        res = sweg(spark, edges, n_sub, T=T, seed=seed, engine=engine)
        met = res.flat.metrics(m_edges)
        elapsed = res.elapsed_s
    elif method == "sags":
        res = sags(spark, edges, n_sub, seed=seed)
        met = res.flat.metrics(m_edges)
        elapsed = res.elapsed_s
    elif method == "randomized":
        res = randomized(spark, edges, n_sub, seed=seed, time_limit_s=time_limit_s)
        met = res.flat.metrics(m_edges) if res.flat is not None else None
        elapsed = res.elapsed_s
    elif method == "mosso":
        res = mosso(spark, edges, n_sub, seed=seed, time_limit_s=time_limit_s)
        met = res.flat.metrics(m_edges) if res.flat is not None else None
        elapsed = res.elapsed_s
    else:
        raise ValueError(f"unknown method {method}")
    _ = time.perf_counter() - t0
    if met is None:
        return {"method": method, "relative_size": None, "elapsed_s": elapsed}
    return {
        "method": method,
        "relative_size": met.relative_size,
        "elapsed_s": elapsed,
        "n_p_plus": met.n_p_plus,
        "n_p_minus": met.n_p_minus,
        "n_h": met.n_h,
        "max_height": met.max_height,
        "avg_leaf_depth": met.avg_leaf_depth,
        "frac_p": met.frac_p,
        "frac_n": met.frac_n,
        "frac_h": met.frac_h,
    }


def format_table(df: pd.DataFrame, floatfmt: str = "{:.3f}") -> str:
    """Markdown-ish fixed-width rendering used by jobs and EXPERIMENTS.md."""
    d = df.copy()
    for c in d.columns:
        if d[c].dtype.kind == "f":
            d[c] = d[c].map(lambda v: "—" if pd.isna(v) else floatfmt.format(v))
        else:
            d[c] = d[c].map(lambda v: "—" if v is None or (isinstance(v, float) and pd.isna(v)) else v)
    return d.to_string(index=False)
