"""Table 7 (paper Fig. 5a / Sec. 7.2): false-discovery sweep over random
SQL queries on FlightData."""
from _common import argparser, banner, session


def main() -> None:
    p = argparser(__doc__)
    p.add_argument("--queries", type=int, default=200)
    p.add_argument("--fine", action="store_true", help="use the paper's exact covariate set incl. Day")
    args = p.parse_args()
    spark = session("table7")
    from repro.experiments.false_discovery import false_discovery_sweep

    banner("Table 7 — false discoveries of random SQL queries (Fig. 5a)")
    # Covariates: the paper uses {Airport, Day, Month, DayOfWeek} on 50M
    # rows; at our scale Day (causally inert in the generator) only
    # shreds the blocks' test power, so the default here drops it. Pass
    # --fine to use the paper's exact set.
    covs = (
        ("Airport", "Day", "Month", "DayOfWeek")
        if args.fine
        else ("Airport", "Month", "DayOfWeek")
    )
    res = false_discovery_sweep(
        spark,
        n=args.n or 400_000,
        n_queries=args.queries,
        covariates=covs,
        m=args.m,
        seed=args.seed,
    )
    print(res.summary.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
