"""Table 4 (paper Fig. 3 bottom): StaplesData income -> price report."""
from _common import argparser, banner, session


def main() -> None:
    args = argparser(__doc__).parse_args()
    spark = session("table4")
    from repro.experiments.reports import format_report, staples_report

    banner("Table 4 — StaplesData (paper Fig. 3 bottom)")
    print(format_report(staples_report(spark, n=args.n or 100_000, seed=args.seed, m=args.m)))
    spark.stop()


if __name__ == "__main__":
    main()
