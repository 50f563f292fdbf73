"""Benchmark for Table 6: CD covariate discovery on CancerData (the
ground-truth recovery the paper validates in Fig. 4 bottom)."""
from repro.core.cd import discover_parents
from repro.core.contingency import ContingencyEngine
from repro.core.independence import IndependenceTester
from repro.datasets import cancer


def test_bench_table6_cancer_cd(benchmark, bench_cancer_df):
    engine = ContingencyEngine(bench_cancer_df)

    def run():
        tester = IndependenceTester(engine, method="hymit", m=50, seed=0)
        return discover_parents(
            tester,
            cancer.TREATMENT,
            cancer.NODES,
            outcomes=[cancer.OUTCOME],
            drop_dependencies=False,
        )

    res = benchmark.pedantic(run, rounds=2, iterations=1)
    assert set(res.parents) == {"Smoking", "Genetics"}
