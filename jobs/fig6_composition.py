"""spark-submit entrypoint for Fig. 6 (p/n/h edge composition)."""
from _common import base_parser, emit, session

from repro.eval.tables import fig6_composition


def main() -> None:
    args = base_parser("Fig 6: output composition").parse_args()
    spark = session("fig6")
    df = fig6_composition(
        spark, scale=args.scale, names=args.datasets, T=args.T, seed=args.seed,
        engine=args.engine,
    )
    emit(df)


if __name__ == "__main__":
    main()
