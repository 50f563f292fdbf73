"""Table 2 (paper Fig. 1): FlightData carrier-delay report."""
from _common import argparser, banner, session


def main() -> None:
    args = argparser(__doc__).parse_args()
    spark = session("table2")
    from repro.experiments.reports import flight_report, format_report

    banner("Table 2 — FlightData (paper Fig. 1 / Ex. 1.1)")
    print(format_report(flight_report(spark, n=args.n or 40_000, seed=args.seed, m=args.m)))
    spark.stop()


if __name__ == "__main__":
    main()
