"""Tests for the CD algorithm (Alg. 1): parent discovery from data."""
import numpy as np
import pandas as pd
import pytest

from repro.core.cd import discover_covariates_and_mediators, discover_parents
from repro.core.contingency import ContingencyEngine
from repro.core.independence import IndependenceTester
from repro.datasets import cancer, staples


def _tester(engine, seed=0):
    return IndependenceTester(engine, method="hymit", m=100, seed=seed)


@pytest.fixture(scope="module")
def fig2_engine(spark):
    """The paper's Fig. 2 DAG: W -> T <- Z, T -> C <- D, T -> Y, W -> Y.

    D is a parent of T's child — condition (a) holds for D, and phase II
    must reject it because D is separable from T.
    """
    rng = np.random.default_rng(3)
    n = 12_000
    w = rng.integers(0, 2, n)
    z = rng.integers(0, 2, n)
    d = rng.integers(0, 2, n)
    t = (rng.random(n) < 0.12 + 0.38 * w + 0.38 * z).astype(int)
    c = (rng.random(n) < 0.15 + 0.35 * t + 0.35 * d).astype(int)
    y = (rng.random(n) < 0.2 + 0.3 * t + 0.3 * w).astype(int)
    pdf = pd.DataFrame({"W": w, "Z": z, "D": d, "T": t, "C": c, "Y": y})
    return ContingencyEngine(spark.createDataFrame(pdf))


def test_cd_fig2_parents(fig2_engine):
    res = discover_parents(
        _tester(fig2_engine),
        "T",
        ["W", "Z", "D", "T", "C", "Y"],
        outcomes=["Y"],
        drop_dependencies=False,
    )
    assert set(res.parents) == {"W", "Z"}
    assert not res.used_fallback


def test_cd_fig2_rejects_parent_of_child(fig2_engine):
    # D satisfies condition (a) via the collider at T's child C... but is
    # separable from T, so phase II must have removed it.
    res = discover_parents(
        _tester(fig2_engine),
        "T",
        ["W", "Z", "D", "T", "C", "Y"],
        outcomes=["Y"],
        drop_dependencies=False,
    )
    assert "D" not in res.parents
    assert "C" not in res.parents
    assert "Y" not in res.parents


def test_cd_lucas_treatment_parents(cancer_engine):
    res = discover_parents(
        _tester(cancer_engine),
        cancer.TREATMENT,
        cancer.NODES,
        outcomes=[cancer.OUTCOME],
        drop_dependencies=False,
    )
    assert set(res.parents) == set(cancer.TRUE_COVARIATES)
    assert not res.used_fallback


def test_cd_lucas_outcome_parents(cancer_engine):
    res = discover_parents(
        _tester(cancer_engine),
        cancer.OUTCOME,
        cancer.NODES,
        outcomes=[],
        drop_dependencies=False,
    )
    assert set(res.parents) == set(cancer.TRUE_MEDIATORS)


def test_cd_covariates_and_mediators(cancer_engine):
    cov, med = discover_covariates_and_mediators(
        _tester(cancer_engine),
        cancer.TREATMENT,
        cancer.OUTCOME,
        cancer.NODES,
        drop_dependencies=False,
    )
    assert set(cov.parents) == {"Smoking", "Genetics"}
    assert set(med) == {"Fatigue", "Attention_Disorder"}


def test_cd_counts_tests(cancer_engine):
    tester = _tester(cancer_engine)
    res = discover_parents(
        tester,
        cancer.TREATMENT,
        cancer.NODES,
        outcomes=[cancer.OUTCOME],
        drop_dependencies=False,
    )
    assert res.n_tests > 0
    assert res.n_tests == tester.n_tests


def test_cd_fallback_on_root_treatment(spark):
    # T is a root with a single child C: no identifiable parents, so CD
    # must fall back to MB(T) - {Y}.
    rng = np.random.default_rng(4)
    n = 6000
    t = rng.integers(0, 2, n)
    c = (rng.random(n) < np.where(t == 1, 0.8, 0.2)).astype(int)
    y = (rng.random(n) < np.where(c == 1, 0.7, 0.3)).astype(int)
    eng = ContingencyEngine(
        spark.createDataFrame(pd.DataFrame({"T": t, "C": c, "Y": y}))
    )
    res = discover_parents(
        _tester(eng), "T", ["T", "C", "Y"], outcomes=["Y"], drop_dependencies=False
    )
    assert res.used_fallback
    assert "Y" not in res.parents
    assert "C" in res.parents  # MB(T) = {C}


def test_cd_no_boundary_no_parents(spark):
    rng = np.random.default_rng(5)
    pdf = pd.DataFrame(
        {"T": rng.integers(0, 2, 4000), "U": rng.integers(0, 2, 4000)}
    )
    eng = ContingencyEngine(spark.createDataFrame(pdf))
    res = discover_parents(
        _tester(eng), "T", ["T", "U"], outcomes=[], drop_dependencies=False
    )
    assert res.parents == []
    assert not res.used_fallback  # empty MB -> nothing to fall back to


def test_cd_staples_income_parents(spark, staples_pdf):
    eng = ContingencyEngine(spark.createDataFrame(staples_pdf))
    res = discover_parents(
        _tester(eng),
        staples.TREATMENT,
        ["Region", "Urban", "Income", "Distance", "Price"],
        outcomes=[staples.OUTCOME],
        drop_dependencies=False,
    )
    assert set(res.parents) == set(staples.TRUE_COVARIATES)


def test_cd_drops_fd_attributes(flight_engine):
    res = discover_parents(
        _tester(flight_engine),
        "Carrier",
        ["Carrier", "Airport", "AirportWAC", "Year", "Delayed"],
        outcomes=["Delayed"],
        drop_dependencies=True,
        detect_high_entropy=False,
    )
    assert "AirportWAC" in res.dropped.all
    assert "AirportWAC" not in res.parents
    assert set(res.parents) == {"Airport", "Year"}
