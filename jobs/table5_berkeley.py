"""Table 5 (paper Fig. 4 top): BerkeleyData gender -> admission report."""
from _common import argparser, banner, session


def main() -> None:
    args = argparser(__doc__).parse_args()
    spark = session("table5")
    from repro.experiments.reports import berkeley_report, format_report

    banner("Table 5 — BerkeleyData (paper Fig. 4 top)")
    print(format_report(berkeley_report(spark, m=args.m, seed=args.seed)))
    spark.stop()


if __name__ == "__main__":
    main()
