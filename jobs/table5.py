"""Reproduce paper Table V: deletions (spark-submit jobs/table5.py)."""
from _common import emit, get_spark, make_parser, workdir_of

from repro.experiments.tables import table5


def main() -> None:
    p = make_parser("Table V — delete")
    p.add_argument("--n-base", type=int, default=60_000)
    p.add_argument("--batch-size", type=int, default=5000)
    args = p.parse_args()
    spark = get_spark("repro-table5")
    emit(
        table5(spark, workdir_of(args), n_base=args.n_base, batch_size=args.batch_size),
        args.out,
    )


if __name__ == "__main__":
    main()
