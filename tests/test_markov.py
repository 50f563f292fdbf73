"""Tests for Markov-boundary discovery (Grow-Shrink and IAMB) against
ground truth on generated data."""
import numpy as np
import pandas as pd
import pytest

from repro.core.contingency import ContingencyEngine
from repro.core.independence import IndependenceTester
from repro.core.markov import grow_shrink, iamb, markov_boundaries
from repro.datasets import cancer


@pytest.fixture(scope="module")
def chain_engine(spark):
    # A -> B -> C: MB(A)={B}, MB(B)={A,C}, MB(C)={B}.
    rng = np.random.default_rng(0)
    n = 8000
    a = rng.integers(0, 2, n)
    b = (rng.random(n) < np.where(a == 1, 0.8, 0.2)).astype(int)
    c = (rng.random(n) < np.where(b == 1, 0.75, 0.25)).astype(int)
    pdf = pd.DataFrame({"A": a, "B": b, "C": c})
    return ContingencyEngine(spark.createDataFrame(pdf))


@pytest.fixture(scope="module")
def collider_engine(spark):
    # Z -> T <- W: MB(T)={Z,W}, MB(Z)={T,W} (W is Z's spouse).
    rng = np.random.default_rng(1)
    n = 8000
    z = rng.integers(0, 2, n)
    w = rng.integers(0, 2, n)
    t = (rng.random(n) < 0.15 + 0.35 * z + 0.35 * w).astype(int)
    pdf = pd.DataFrame({"Z": z, "W": w, "T": t})
    return ContingencyEngine(spark.createDataFrame(pdf))


@pytest.mark.parametrize("algo", [grow_shrink, iamb])
def test_chain_boundaries(chain_engine, algo):
    tester = IndependenceTester(chain_engine, method="hymit", m=100, seed=0)
    assert set(algo(tester, "A", ["A", "B", "C"])) == {"B"}
    assert set(algo(tester, "B", ["A", "B", "C"])) == {"A", "C"}
    assert set(algo(tester, "C", ["A", "B", "C"])) == {"B"}


@pytest.mark.parametrize("algo", [grow_shrink, iamb])
def test_collider_boundaries(collider_engine, algo):
    tester = IndependenceTester(collider_engine, method="hymit", m=100, seed=0)
    assert set(algo(tester, "T", ["Z", "W", "T"])) == {"Z", "W"}
    # Spouse enters through the collider.
    assert set(algo(tester, "Z", ["Z", "W", "T"])) == {"T", "W"}


def test_lucas_boundary_lung_cancer(cancer_engine):
    tester = IndependenceTester(cancer_engine, method="hymit", m=100, seed=0)
    mb = set(grow_shrink(tester, "Lung_Cancer", cancer.NODES, max_cond=3))
    truth = cancer.dag().markov_boundary("Lung_Cancer")
    # Finite-sample boundaries may include weak extras; they must at
    # least cover the truth and exclude the isolated node.
    assert truth <= mb
    assert "Born_an_Even_Day" not in mb


def test_lucas_boundary_car_accident(cancer_engine):
    tester = IndependenceTester(cancer_engine, method="hymit", m=100, seed=0)
    mb = set(grow_shrink(tester, "Car_Accident", cancer.NODES, max_cond=3))
    assert cancer.dag().markov_boundary("Car_Accident") <= mb


def test_markov_boundaries_all_nodes(chain_engine):
    tester = IndependenceTester(chain_engine, method="hymit", m=100, seed=0)
    mbs = markov_boundaries(tester, ["A", "B", "C"], algorithm="gs")
    assert set(mbs) == {"A", "B", "C"}
    assert set(mbs["B"]) == {"A", "C"}


def test_markov_boundaries_iamb_algorithm(chain_engine):
    tester = IndependenceTester(chain_engine, method="hymit", m=100, seed=0)
    mbs = markov_boundaries(tester, ["A", "B", "C"], algorithm="iamb")
    assert set(mbs["A"]) == {"B"}


def test_max_cond_caps_conditioning(collider_engine):
    # With max_cond=1 the algorithm still runs and returns a boundary.
    tester = IndependenceTester(collider_engine, method="hymit", m=100, seed=0)
    mb = grow_shrink(tester, "T", ["Z", "W", "T"], max_cond=1)
    assert set(mb) == {"Z", "W"}


def test_isolated_node_has_empty_boundary(cancer_engine):
    tester = IndependenceTester(cancer_engine, method="hymit", m=100, seed=0)
    mb = grow_shrink(tester, "Born_an_Even_Day", cancer.NODES, max_cond=3)
    assert mb == []
