"""Benchmark for Table 4: StaplesData direct-effect rewriting (the
mediator formula) — the paper's no-direct-income-effect finding."""
from repro.core.rewrite import avg_col, rewrite_direct


def test_bench_table4_staples_direct(benchmark, bench_staples_df):
    def run():
        return (
            rewrite_direct(
                bench_staples_df,
                "Income",
                ["Price"],
                ["Region", "Urban"],
                ["Distance"],
                "low",
            )
            .toPandas()
            .set_index("Income")[avg_col("Price")]
        )

    direct = benchmark.pedantic(run, rounds=3, iterations=1)
    assert abs(direct["high"] - direct["low"]) < 0.01
