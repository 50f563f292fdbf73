"""Table 10 (paper Fig. 6c,d): efficacy of entropy caching, contingency
materialization and pre-computed cubes."""
from _common import argparser, banner, session


def main() -> None:
    args = argparser(__doc__).parse_args()
    spark = session("table10")
    from repro.experiments.optimizations import ablation_table, cube_benefit_table

    banner("Table 10a — caching / materialization ablation (Fig. 6c)")
    print(ablation_table(spark, m=args.m, seed=args.seed).to_string(index=False))
    banner("Table 10b — pre-computed cube benefit vs data size (Fig. 6d)")
    print(
        cube_benefit_table(spark, m=args.m, seed=args.seed).to_string(index=False)
    )
    spark.stop()


if __name__ == "__main__":
    main()
