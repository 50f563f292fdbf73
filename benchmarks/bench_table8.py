"""Benchmark for Table 8: one cell of the quality grid (CD with HyMIT
learning all parents of an 8-node RandomData DAG)."""
from repro.experiments.quality import quality_experiment


def test_bench_table8_quality_cell(benchmark, spark):
    def run():
        return quality_experiment(
            spark,
            n_nodes_list=(8,),
            n_rows_list=(2_000,),
            n_dags=1,
            methods=("cd-hymit",),
            m=50,
            seed=1,
        )

    res = benchmark.pedantic(run, rounds=2, iterations=1)
    assert res.iloc[0]["f1_all"] >= 0.0
