"""spark-submit entrypoint for Table IV (pruning substep effectiveness)."""
from _common import base_parser, emit, session

from repro.eval.tables import table4_pruning


def main() -> None:
    args = base_parser("Table IV: metrics after each pruning substep").parse_args()
    spark = session("table4")
    df = table4_pruning(
        spark, scale=args.scale, names=args.datasets, T=args.T, seed=args.seed,
        engine=args.engine,
    )
    emit(df)


if __name__ == "__main__":
    main()
