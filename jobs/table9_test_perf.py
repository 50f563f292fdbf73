"""Table 9 (paper Fig. 6a,b): independence-test counts (CD vs FGS) and
per-test runtimes (chi2 / MIT / MIT-sampling / HyMIT / naive shuffle)."""
from _common import argparser, banner, session


def main() -> None:
    args = argparser(__doc__).parse_args()
    spark = session("table9")
    from repro.experiments.perf import cd_vs_fgs_test_counts, per_test_runtime_table

    banner("Table 9a — independence tests: CD (one node) vs FGS (full DAG)")
    print(
        cd_vs_fgs_test_counts(
            spark, n_nodes_list=(8, 16, 24), n_rows=args.n or 5_000, seed=args.seed
        ).to_string(index=False)
    )
    banner("Table 9b — mean runtime per conditional-independence test")
    print(
        per_test_runtime_table(
            spark, n_rows=args.n or 20_000, m=args.m, seed=args.seed
        ).to_string(index=False)
    )
    spark.stop()


if __name__ == "__main__":
    main()
