"""Benchmark for Table 5: the full BerkeleyData report (detect, explain,
resolve, significance)."""
from repro.core.hypdb import HypDB


def test_bench_table5_berkeley_report(benchmark, bench_berkeley_df):
    def run():
        hy = HypDB(bench_berkeley_df, m=50, seed=0)
        return hy.analyze(
            "Gender",
            ["Accepted"],
            covariates=["Department"],
            mediators=[],
            t_ref="Male",
        )

    rep = benchmark.pedantic(run, rounds=3, iterations=1)
    ans = rep.answers().set_index("Gender")
    assert ans.loc["Male", "sql_answer"] > ans.loc["Female", "sql_answer"]
