"""Benchmarks for Table 9: single conditional-independence tests by
method — chi2 (entropy-cached G-test) vs the permutation tests."""
import numpy as np
import pandas as pd
import pytest

from repro.core.contingency import ContingencyEngine
from repro.core.independence import IndependenceTester


@pytest.fixture(scope="module")
def perf_engine(spark):
    rng = np.random.default_rng(0)
    n = 20_000
    pdf = pd.DataFrame(
        {
            "X": rng.integers(0, 2, n),
            "Y": rng.integers(0, 2, n),
            "Z1": rng.integers(0, 4, n),
            "Z2": rng.integers(0, 4, n),
            "Z3": rng.integers(0, 6, n),
        }
    )
    eng = ContingencyEngine(spark.createDataFrame(pdf))
    eng.counts(("X", "Y", "Z1", "Z2", "Z3"))  # warm the cube
    return eng


@pytest.mark.parametrize("method", ["chi2", "mit", "mit-sampling", "hymit"])
def test_bench_table9_per_test(benchmark, perf_engine, method):
    def run():
        tester = IndependenceTester(
            perf_engine, method=method, m=100, seed=0, cache_results=False
        )
        return tester.test("X", "Y", ("Z1", "Z2", "Z3"))

    res = benchmark.pedantic(run, rounds=3, iterations=1)
    assert res.p_value >= 0.01  # independent by construction
