"""Tests for the DAG substrate: structure, d-separation, Markov
boundaries, random-DAG generation and forward sampling."""
import numpy as np
import pandas as pd
import pytest

from repro.dags.dag import DAG
from repro.dags.random_dags import random_bayes_net, random_dag
from repro.datasets import cancer


@pytest.fixture(scope="module")
def collider_dag():
    # Z -> T <- W, T -> Y  (the motivating structure for CD's phase I).
    return DAG.from_edges(list("ZTWY"), [("Z", "T"), ("W", "T"), ("T", "Y")])


@pytest.fixture(scope="module")
def chain_dag():
    return DAG.from_edges(list("ABC"), [("A", "B"), ("B", "C")])


@pytest.fixture(scope="module")
def lucas():
    return cancer.dag()


def test_from_edges_unknown_node():
    with pytest.raises(ValueError):
        DAG.from_edges(["A"], [("A", "B")])


def test_from_edges_cycle_detected():
    with pytest.raises(ValueError):
        DAG.from_edges(list("AB"), [("A", "B"), ("B", "A")])


def test_topological_order_respects_edges(lucas):
    order = lucas.topological_order()
    pos = {n: i for i, n in enumerate(order)}
    for u, v in lucas.edges():
        assert pos[u] < pos[v]


def test_children_and_parents(collider_dag):
    assert collider_dag.children("T") == {"Y"}
    assert set(collider_dag.parents["T"]) == {"Z", "W"}


def test_descendants(lucas):
    assert "Car_Accident" in lucas.descendants("Smoking")
    assert "Smoking" not in lucas.descendants("Car_Accident")
    assert lucas.descendants("Born_an_Even_Day") == set()


# -- d-separation ------------------------------------------------------------


def test_dsep_chain(chain_dag):
    assert not chain_dag.d_separated("A", "C", [])
    assert chain_dag.d_separated("A", "C", ["B"])


def test_dsep_collider(collider_dag):
    assert collider_dag.d_separated("Z", "W", [])
    assert not collider_dag.d_separated("Z", "W", ["T"])
    # Conditioning on a descendant of the collider also opens it.
    assert not collider_dag.d_separated("Z", "W", ["Y"])


def test_dsep_fork():
    d = DAG.from_edges(list("ABC"), [("B", "A"), ("B", "C")])
    assert not d.d_separated("A", "C", [])
    assert d.d_separated("A", "C", ["B"])


@pytest.mark.parametrize(
    "x,y,z,expected",
    [
        ("Anxiety", "Peer_Pressure", [], True),  # paper Ex. 10.1
        ("Anxiety", "Peer_Pressure", ["Smoking"], False),  # Berkson
        ("Smoking", "Genetics", [], True),
        ("Smoking", "Genetics", ["Lung_Cancer"], False),
        ("Lung_Cancer", "Car_Accident", [], False),
        ("Lung_Cancer", "Car_Accident", ["Fatigue", "Attention_Disorder"], True),
        ("Lung_Cancer", "Car_Accident", ["Fatigue"], False),  # via AD? no: blocked
        ("Peer_Pressure", "Yellow_Fingers", [], False),
        ("Peer_Pressure", "Yellow_Fingers", ["Smoking"], True),
        ("Born_an_Even_Day", "Smoking", [], True),
        ("Allergy", "Lung_Cancer", [], True),
        ("Allergy", "Lung_Cancer", ["Coughing"], False),
    ],
)
def test_dsep_lucas(lucas, x, y, z, expected):
    assert lucas.d_separated(x, y, z) is expected


def test_dsep_lucas_mediation_blocking(lucas):
    # Conditioning on Fatigue alone blocks LC -> Fatigue -> CA, but the
    # LC <- Genetics -> AD -> CA back-path remains open.
    assert not lucas.d_separated("Lung_Cancer", "Car_Accident", ["Fatigue"])
    assert lucas.d_separated(
        "Lung_Cancer", "Car_Accident", ["Fatigue", "Genetics"]
    )


# -- Markov boundary ---------------------------------------------------------


def test_markov_boundary_lucas(lucas):
    assert lucas.markov_boundary("Lung_Cancer") == {
        "Smoking",
        "Genetics",
        "Coughing",
        "Fatigue",
        "Allergy",
    }
    assert lucas.markov_boundary("Car_Accident") == {
        "Fatigue",
        "Attention_Disorder",
    }
    assert lucas.markov_boundary("Born_an_Even_Day") == set()


def test_markov_boundary_shields_rest(lucas):
    # MB(X) d-separates X from everything outside MB(X).
    for x in lucas.nodes:
        mb = lucas.markov_boundary(x)
        for y in lucas.nodes:
            if y == x or y in mb:
                continue
            assert lucas.d_separated(x, y, mb), (x, y, mb)


# -- random DAGs & sampling --------------------------------------------------


def test_random_dag_is_acyclic_and_sized():
    for seed in range(5):
        rng = np.random.default_rng(seed)
        d = random_dag(12, avg_degree=1.5, rng=rng)
        assert len(d.nodes) == 12
        d.topological_order()  # raises on cycles


def test_random_dag_edge_count_near_target():
    rng = np.random.default_rng(0)
    counts = [len(random_dag(16, avg_degree=1.5, rng=rng).edges()) for _ in range(30)]
    assert np.mean(counts) == pytest.approx(1.5 * 16, rel=0.25)


def test_random_bayes_net_deterministic():
    a = random_bayes_net(8, seed=3)
    b = random_bayes_net(8, seed=3)
    assert a.dag.edges() == b.dag.edges()
    for n in a.dag.nodes:
        np.testing.assert_array_equal(a.cpts[n], b.cpts[n])


def test_bayes_net_sample_shape_and_domain():
    bn = random_bayes_net(6, n_categories=3, seed=1)
    df = bn.sample(500, np.random.default_rng(0))
    assert df.shape == (500, 6)
    assert (df.min() >= 0).all()
    assert (df.max() < 3).all()


def test_bayes_net_root_marginal_matches_cpt():
    bn = random_bayes_net(5, n_categories=2, seed=2)
    roots = [n for n in bn.dag.nodes if not bn.dag.parents[n]]
    assert roots  # ER with avg_degree 1.5 on 5 nodes always has a root
    df = bn.sample(20_000, np.random.default_rng(1))
    r = roots[0]
    emp = df[r].value_counts(normalize=True).sort_index().to_numpy()
    np.testing.assert_allclose(emp, bn.cpts[r][0], atol=0.02)


def test_bayes_net_child_conditional_matches_cpt():
    bn = random_bayes_net(4, n_categories=2, seed=5)
    child = next((n for n in bn.dag.nodes if len(bn.dag.parents[n]) == 1), None)
    if child is None:
        pytest.skip("no single-parent node in this seed")
    parent = next(iter(bn.dag.parents[child]))
    df = bn.sample(40_000, np.random.default_rng(2))
    for pv in (0, 1):
        sub = df[df[parent] == pv][child]
        emp = sub.value_counts(normalize=True).sort_index().to_numpy()
        np.testing.assert_allclose(emp, bn.cpts[child][pv], atol=0.02)


def test_bayes_net_sampled_independencies_hold():
    # Marginally independent root pairs in the DAG should have ~zero MI
    # in a large sample.
    bn = random_bayes_net(8, seed=11)
    dag = bn.dag
    df = bn.sample(30_000, np.random.default_rng(3))
    pairs = [
        (a, b)
        for i, a in enumerate(dag.nodes)
        for b in dag.nodes[i + 1 :]
        if dag.d_separated(a, b, [])
    ]
    if not pairs:
        pytest.skip("no marginally independent pair in this seed")
    from repro.core.entropy import mi_from_table

    for a, b in pairs[:3]:
        tab = pd.crosstab(df[a], df[b]).to_numpy()
        assert mi_from_table(tab, miller_madow=False) < 0.005
