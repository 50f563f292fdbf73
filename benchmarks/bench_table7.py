"""Benchmark for Table 7: the false-discovery sweep (per-query cost of
interactive detection + rewriting off the pre-computed cube)."""
from repro.experiments.false_discovery import false_discovery_sweep


def test_bench_table7_sweep(benchmark, spark):
    def run():
        return false_discovery_sweep(
            spark,
            n=20_000,
            n_queries=10,
            covariates=("Airport", "Month", "DayOfWeek"),
            m=100,
            seed=0,
        )

    res = benchmark.pedantic(run, rounds=2, iterations=1)
    assert len(res.detail) > 0
