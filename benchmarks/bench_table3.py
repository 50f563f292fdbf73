"""Benchmark for Table 3: AdultData detection + explanation with given
covariates/mediators (the per-query interactive path)."""
import pytest

from repro.core.bias import detect_bias
from repro.core.contingency import ContingencyEngine
from repro.core.explain import responsibilities
from repro.core.independence import IndependenceTester
from repro.datasets import adult


@pytest.fixture(scope="module")
def adult_engine(spark):
    return ContingencyEngine(spark.createDataFrame(adult.pandas_frame(12_000, seed=0)))


def test_bench_table3_adult_detect_explain(benchmark, adult_engine):
    V = ["MaritalStatus", "Education", "CapitalGain", "HoursPerWeek", "Age"]

    def run():
        tester = IndependenceTester(adult_engine, method="hymit", m=50, seed=0)
        bias = detect_bias(tester, "Gender", V)
        resp = responsibilities(adult_engine, "Gender", V)
        return bias, resp

    bias, resp = benchmark.pedantic(run, rounds=3, iterations=1)
    assert bias.biased
    assert resp[0].variable == "MaritalStatus"
