"""Shared helpers for the table benchmarks.

Each benchmark runs its table builder once (rounds=1 — these are
minutes-long experiment harnesses, not microbenchmarks), prints the
formatted table, and persists a CSV under ``results/`` which
EXPERIMENTS.md quotes next to the paper's numbers.
"""
from __future__ import annotations

import pathlib

import pandas as pd

RESULTS_DIR = pathlib.Path(__file__).resolve().parent.parent / "results"


def persist(df: pd.DataFrame, name: str) -> None:
    RESULTS_DIR.mkdir(exist_ok=True)
    df.to_csv(RESULTS_DIR / f"{name}.csv", index=False)
    from repro.eval.harness import format_table

    print(f"\n=== {name} ===")
    print(format_table(df))
    for k, v in df.attrs.items():
        print(f"{k}: {v}")


def run_once(benchmark, fn):
    """pytest-benchmark wrapper: single round, return the result."""
    out = {}

    def wrapper():
        out["df"] = fn()

    benchmark.pedantic(wrapper, rounds=1, iterations=1)
    return out["df"]
