"""Spark-dataflow benchmark: the applyInPandas group-merge engine on one
bench dataset — the distributed path whose results are pinned equal to
the local engine by tests/test_slugger.py."""
import pytest

from repro.eval.harness import load_dataset
from repro.core.slugger import slugger
from repro.model.cost import metrics

from benchmarks._util import persist, run_once
import pandas as pd


@pytest.mark.benchmark(group="spark-engine")
def test_spark_engine_bench(benchmark, spark):
    edges, n = load_dataset("collab_cliques", "bench", 0)

    def run():
        res = slugger(edges, n, T=5, seed=0, engine="spark", spark=spark)
        m = metrics(res.summary, len(edges))
        return pd.DataFrame(
            [{"dataset": "collab_cliques", "engine": "spark", "T": 5,
              "relative_size": m.relative_size, "elapsed_s": res.elapsed_s}]
        )

    df = run_once(benchmark, run)
    persist(df, "spark_engine")
    assert df["relative_size"].iloc[0] < 1.0
