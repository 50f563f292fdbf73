"""Benchmark for Table 1: the full detect/explain/resolve pipeline
(CD discovery + bias tests + rewriting) on CancerData."""
from repro.core.hypdb import HypDB


def test_bench_table1_full_pipeline(benchmark, bench_cancer_df):
    def run():
        hy = HypDB(bench_cancer_df, m=50, seed=0)
        return hy.analyze("Lung_Cancer", ["Car_Accident"])

    report = benchmark.pedantic(run, rounds=2, iterations=1)
    assert set(report.covariates) == {"Smoking", "Genetics"}
