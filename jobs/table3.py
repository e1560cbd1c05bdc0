"""Reproduce paper Table III: insertions following the original
distribution (spark-submit jobs/table3.py)."""
from _common import emit, get_spark, make_parser, workdir_of

from repro.experiments.tables import table3


def main() -> None:
    p = make_parser("Table III — insert, same distribution")
    p.add_argument("--n-base", type=int, default=60_000)
    p.add_argument("--batch-size", type=int, default=5000)
    args = p.parse_args()
    spark = get_spark("repro-table3")
    emit(
        table3(spark, workdir_of(args), n_base=args.n_base, batch_size=args.batch_size),
        args.out,
    )


if __name__ == "__main__":
    main()
