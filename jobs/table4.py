"""Reproduce paper Table IV: insertions NOT following the original
distribution (spark-submit jobs/table4.py)."""
from _common import emit, get_spark, make_parser, workdir_of

from repro.experiments.tables import table4


def main() -> None:
    p = make_parser("Table IV — insert, cross distribution")
    p.add_argument("--n-base", type=int, default=60_000)
    p.add_argument("--batch-size", type=int, default=5000)
    args = p.parse_args()
    spark = get_spark("repro-table4")
    emit(
        table4(spark, workdir_of(args), n_base=args.n_base, batch_size=args.batch_size),
        args.out,
    )


if __name__ == "__main__":
    main()
