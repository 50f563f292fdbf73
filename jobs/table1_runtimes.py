"""Table 1: runtime (s) of Detect / Explain / Resolve per dataset."""
from _common import argparser, banner, session


def main() -> None:
    args = argparser(__doc__).parse_args()
    spark = session("table1")
    from repro.experiments.runtimes import runtime_table

    banner("Table 1 — runtime (s) for detection, explanation, resolution")
    t = runtime_table(spark, m=args.m, seed=args.seed)
    print(t.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
