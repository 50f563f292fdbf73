"""Tests for the bnlearn-style baseline structure learners (FGS, IAMB,
score-based hill climbing) and the parent-F1 metric."""
import numpy as np
import pandas as pd
import pytest

from repro.core.contingency import ContingencyEngine
from repro.core.independence import IndependenceTester
from repro.dags.baselines import (
    constraint_based_structure,
    hill_climb,
    parent_f1,
)
from repro.dags.dag import DAG
from repro.dags.random_dags import random_bayes_net


@pytest.fixture(scope="module")
def vstructure_engine(spark):
    # A -> C <- B with an extra child C -> D: the v-structure is
    # identifiable from data, so orientation should recover parents of C.
    rng = np.random.default_rng(0)
    n = 15_000
    a = rng.integers(0, 2, n)
    b = rng.integers(0, 2, n)
    c = (rng.random(n) < 0.1 + 0.4 * a + 0.4 * b).astype(int)
    d = (rng.random(n) < np.where(c == 1, 0.8, 0.2)).astype(int)
    pdf = pd.DataFrame({"A": a, "B": b, "C": c, "D": d})
    return ContingencyEngine(spark.createDataFrame(pdf))


@pytest.fixture(scope="module")
def vstructure_dag():
    return DAG.from_edges(list("ABCD"), [("A", "C"), ("B", "C"), ("C", "D")])


def _tester(engine):
    return IndependenceTester(engine, method="hymit", m=100, seed=0)


@pytest.mark.parametrize("boundary", ["gs", "iamb"])
def test_constraint_based_recovers_vstructure(vstructure_engine, boundary):
    parents = constraint_based_structure(
        _tester(vstructure_engine), ["A", "B", "C", "D"], boundary=boundary
    )
    assert parents["C"] == {"A", "B"}
    assert parents["A"] == set() and parents["B"] == set()


@pytest.mark.parametrize("score", ["aic", "bic", "bde"])
def test_hill_climb_recovers_skeleton(vstructure_engine, vstructure_dag, score):
    parents = hill_climb(vstructure_engine, ["A", "B", "C", "D"], score=score)
    # Score-equivalent classes may flip C -> D; the skeleton must match.
    undirected = {
        frozenset((u, v)) for v, ps in parents.items() for u in ps
    }
    want = {frozenset(e) for e in vstructure_dag.edges()}
    assert undirected == want


@pytest.mark.parametrize("score", ["aic", "bic", "bde"])
def test_hill_climb_orients_vstructure(vstructure_engine, score):
    parents = hill_climb(vstructure_engine, ["A", "B", "C", "D"], score=score)
    # The collider A -> C <- B is score-identifiable.
    assert {"A", "B"} <= parents["C"]


def test_hill_climb_empty_on_independent_data(spark):
    rng = np.random.default_rng(1)
    pdf = pd.DataFrame({f"X{i}": rng.integers(0, 2, 4000) for i in range(4)})
    eng = ContingencyEngine(spark.createDataFrame(pdf))
    parents = hill_climb(eng, list(pdf.columns), score="bic")
    assert all(not p for p in parents.values())


def test_hill_climb_respects_max_parents(vstructure_engine):
    parents = hill_climb(
        vstructure_engine, ["A", "B", "C", "D"], score="bic", max_parents=1
    )
    assert all(len(p) <= 1 for p in parents.values())


def test_hill_climb_on_random_net(spark):
    bn = random_bayes_net(6, seed=9, avg_degree=1.2)
    pdf = bn.sample(20_000, np.random.default_rng(0))
    eng = ContingencyEngine(spark.createDataFrame(pdf))
    parents = hill_climb(eng, list(pdf.columns), score="bic")
    # Skeleton recall should be high on 20k rows of a 6-node net.
    want = {frozenset(e) for e in bn.dag.edges()}
    got = {frozenset((u, v)) for v, ps in parents.items() for u in ps}
    if want:
        recall = len(want & got) / len(want)
        assert recall >= 0.7


# -- parent_f1 ----------------------------------------------------------------


def test_parent_f1_perfect(vstructure_dag):
    pred = {n: set(vstructure_dag.parents[n]) for n in vstructure_dag.nodes}
    assert parent_f1(vstructure_dag, pred) == 1.0


def test_parent_f1_empty_prediction(vstructure_dag):
    assert parent_f1(vstructure_dag, {n: set() for n in "ABCD"}) == 0.0


def test_parent_f1_half(vstructure_dag):
    pred = {"A": set(), "B": set(), "C": {"A"}, "D": {"C"}}
    # tp=2, fp=0, fn=1 -> precision 1, recall 2/3, F1 = 0.8.
    assert parent_f1(vstructure_dag, pred) == pytest.approx(0.8)


def test_parent_f1_penalizes_false_edges(vstructure_dag):
    pred = {"A": {"D"}, "B": set(), "C": {"A", "B"}, "D": {"C"}}
    assert parent_f1(vstructure_dag, pred) < 1.0


def test_parent_f1_restricted_nodes(vstructure_dag):
    pred = {"C": {"A", "B"}}
    assert parent_f1(vstructure_dag, pred, nodes=["C"]) == 1.0
    # Restricting to >= 2-parent nodes (only C here) ignores D's miss.
    multi = [n for n in vstructure_dag.nodes if len(vstructure_dag.parents[n]) >= 2]
    assert multi == ["C"]
