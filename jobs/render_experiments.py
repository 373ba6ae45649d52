"""Render the measured-results sections of EXPERIMENTS.md from the CSVs
benchmarks persist under results/ (no Spark needed)."""
import pathlib

import pandas as pd

RES = pathlib.Path(__file__).resolve().parent.parent / "results"


def _fmt(df: pd.DataFrame) -> str:
    from repro.eval.harness import format_table

    return format_table(df)


def main() -> None:
    for name in [
        "fig5_compactness",
        "table3_iterations",
        "table4_pruning",
        "table5_height",
        "fig6_composition",
        "scalability",
        "spark_engine",
        "neighbors",
    ]:
        p = RES / f"{name}.csv"
        print(f"\n## {name}")
        if not p.exists():
            print("(not yet generated — run pytest benchmarks/ --benchmark-only)")
            continue
        df = pd.read_csv(p)
        if name == "fig5_compactness":
            print("relative size (Eq. 10 for slugger, Eq. 11 for baselines):")
            print(_fmt(df.pivot(index="dataset", columns="method", values="relative_size").reset_index()))
            print("\nruntime (s):")
            print(_fmt(df.pivot(index="dataset", columns="method", values="elapsed_s").reset_index()))
        elif name == "table3_iterations":
            print(_fmt(df.pivot(index="dataset", columns="T", values="relative_size").reset_index()))
        elif name == "table5_height":
            print("relative size:")
            print(_fmt(df.pivot(index="dataset", columns="hb", values="relative_size").reset_index()))
            print("\navg leaf depth:")
            print(_fmt(df.pivot(index="dataset", columns="hb", values="avg_leaf_depth").reset_index()))
        elif name == "table4_pruning":
            for col in ("relative_size", "max_height", "avg_leaf_depth"):
                print(f"\n{col}:")
                print(_fmt(df.pivot(index="dataset", columns="stage", values=col).reset_index()))
        else:
            print(_fmt(df))


if __name__ == "__main__":
    main()
