"""Benchmark fixtures: small, session-scoped dataset DataFrames so the
pytest-benchmark timings measure the HypDB pipelines, not data setup."""
from __future__ import annotations

import pytest

from repro.datasets import berkeley, cancer, flight, staples


@pytest.fixture(scope="session")
def bench_flight_df(spark):
    return spark.createDataFrame(flight.pandas_frame(8_000, seed=0)).cache()


@pytest.fixture(scope="session")
def bench_cancer_df(spark):
    return spark.createDataFrame(cancer.pandas_frame(2_000, seed=0)).cache()


@pytest.fixture(scope="session")
def bench_staples_df(spark):
    return spark.createDataFrame(staples.pandas_frame(20_000, seed=0)).cache()


@pytest.fixture(scope="session")
def bench_berkeley_df(spark):
    return spark.createDataFrame(berkeley.pandas_frame()).cache()
