"""Table 3 (paper Fig. 3 top): AdultData gender -> income report."""
from _common import argparser, banner, session


def main() -> None:
    args = argparser(__doc__).parse_args()
    spark = session("table3")
    from repro.experiments.reports import adult_report, format_report

    banner("Table 3 — AdultData (paper Fig. 3 top)")
    print(format_report(adult_report(spark, n=args.n or 30_000, seed=args.seed, m=args.m)))
    spark.stop()


if __name__ == "__main__":
    main()
