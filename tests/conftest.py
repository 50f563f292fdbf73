"""Shared fixtures: small deterministic datasets, engines and testers.

Everything is session-scoped — Spark DataFrame creation and contingency
materialization dominate test runtime, and all tests treat these objects
as read-only.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.core.contingency import ContingencyEngine
from repro.core.independence import IndependenceTester
from repro.datasets import adult, berkeley, cancer, flight, staples

FLIGHT_N = 12_000
ADULT_N = 12_000
STAPLES_N = 20_000
CANCER_N = 2_000


@pytest.fixture(scope="session")
def flight_pdf() -> pd.DataFrame:
    return flight.pandas_frame(FLIGHT_N, seed=0)


@pytest.fixture(scope="session")
def flight_df(spark, flight_pdf):
    return spark.createDataFrame(flight_pdf)


@pytest.fixture(scope="session")
def flight_engine(flight_df) -> ContingencyEngine:
    return ContingencyEngine(flight_df)


@pytest.fixture(scope="session")
def cancer_pdf() -> pd.DataFrame:
    return cancer.pandas_frame(CANCER_N, seed=0)


@pytest.fixture(scope="session")
def cancer_df(spark, cancer_pdf):
    return spark.createDataFrame(cancer_pdf)


@pytest.fixture(scope="session")
def cancer_engine(cancer_df) -> ContingencyEngine:
    return ContingencyEngine(cancer_df)


@pytest.fixture()
def cancer_tester(cancer_engine) -> IndependenceTester:
    # Function-scoped: tests mutate counters; the result cache would hide
    # counter behaviour across tests if shared.
    return IndependenceTester(cancer_engine, method="hymit", m=100, seed=7)


@pytest.fixture(scope="session")
def berkeley_pdf() -> pd.DataFrame:
    return berkeley.pandas_frame()


@pytest.fixture(scope="session")
def berkeley_df(spark, berkeley_pdf):
    return spark.createDataFrame(berkeley_pdf)


@pytest.fixture(scope="session")
def staples_pdf() -> pd.DataFrame:
    return staples.pandas_frame(STAPLES_N, seed=0)


@pytest.fixture(scope="session")
def staples_df(spark, staples_pdf):
    return spark.createDataFrame(staples_pdf)


@pytest.fixture(scope="session")
def adult_pdf() -> pd.DataFrame:
    return adult.pandas_frame(ADULT_N, seed=0)


@pytest.fixture(scope="session")
def adult_df(spark, adult_pdf):
    return spark.createDataFrame(adult_pdf)


@pytest.fixture(scope="session")
def rng() -> np.random.Generator:
    return np.random.default_rng(0)
