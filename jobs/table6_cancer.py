"""Table 6 (paper Fig. 4 bottom): CancerData lung-cancer -> car-accident."""
from _common import argparser, banner, session


def main() -> None:
    args = argparser(__doc__).parse_args()
    spark = session("table6")
    from repro.experiments.reports import cancer_report, format_report

    banner("Table 6 — CancerData / LUCAS (paper Fig. 4 bottom)")
    print(format_report(cancer_report(spark, n=args.n or 2_000, seed=args.seed, m=args.m)))
    spark.stop()


if __name__ == "__main__":
    main()
