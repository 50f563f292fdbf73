"""Table 8 (paper Fig. 5b,c,d): parent-recovery F1 of CD vs baselines on
RandomData."""
from _common import argparser, banner, session


def main() -> None:
    p = argparser(__doc__)
    p.add_argument("--dags", type=int, default=3)
    args = p.parse_args()
    spark = session("table8")
    from repro.experiments.quality import quality_experiment

    banner("Table 8 — parent-recovery F1, CD vs bnlearn baselines (Fig. 5b-d)")
    res = quality_experiment(
        spark,
        n_nodes_list=(8, 12),
        n_rows_list=(2_000, 10_000),
        n_dags=args.dags,
        m=args.m,
        seed=args.seed,
    )
    print(res.to_string(index=False))
    print()
    print("mean F1 by method (all nodes / >=2-parent nodes):")
    agg = res.groupby("method")[["f1_all", "f1_multi_parent"]].mean().round(3)
    print(agg.sort_values("f1_multi_parent", ascending=False).to_string())
    spark.stop()


if __name__ == "__main__":
    main()
