"""spark-submit entrypoint for Table V (height-bound variant H_b)."""
from _common import base_parser, emit, session

from repro.eval.tables import table5_height


def main() -> None:
    p = base_parser("Table V: avg leaf depth & relative size vs H_b")
    p.add_argument("--hbs", nargs="*", type=int, default=[2, 5, 7, 10, 0])
    args = p.parse_args()
    spark = session("table5")
    df = table5_height(
        spark, scale=args.scale, names=args.datasets, hbs=tuple(args.hbs),
        T=args.T, seed=args.seed, engine=args.engine,
    )
    emit(df)


if __name__ == "__main__":
    main()
