"""Benchmark for Table 10: CD with the Sec. 6 optimizations on vs off —
the materialization/caching speedup measured directly."""
import numpy as np
import pytest

from repro.core.cd import discover_parents
from repro.core.contingency import ContingencyEngine
from repro.core.independence import IndependenceTester
from repro.dags.random_dags import random_bayes_net


@pytest.fixture(scope="module")
def opt_df(spark):
    bn = random_bayes_net(8, seed=0)
    df = spark.createDataFrame(bn.sample(10_000, np.random.default_rng(0))).cache()
    df.count()
    return bn, df


def _run_cd(engine, bn):
    tester = IndependenceTester(engine, method="hymit", m=30, seed=0)
    for node in bn.dag.nodes[:4]:
        discover_parents(
            tester, node, bn.dag.nodes, outcomes=[], max_cond=2,
            drop_dependencies=False,
        )
    return tester.n_tests


def test_bench_table10_optimized(benchmark, opt_df):
    bn, df = opt_df

    def run():
        return _run_cd(ContingencyEngine(df), bn)

    assert benchmark.pedantic(run, rounds=2, iterations=1) > 0


def test_bench_table10_unoptimized(benchmark, opt_df):
    bn, df = opt_df

    def run():
        return _run_cd(
            ContingencyEngine(df, materialize=False, cache_entropy=False), bn
        )

    assert benchmark.pedantic(run, rounds=1, iterations=1) > 0
