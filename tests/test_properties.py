"""Property-based tests (hypothesis) for the driver-side kernels —
no Spark involved, so these run wide and fast."""
import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.entropy import (
    contribution_table,
    entropy_from_counts,
    mi_from_table,
    plugin_entropy_from_counts,
)
from repro.core.stats import chi2_sf, random_table_with_margins
from repro.dags.dag import DAG
from repro.dags.random_dags import random_bayes_net

counts_arrays = st.lists(st.integers(0, 500), min_size=1, max_size=12).map(np.array)

tables = st.tuples(st.integers(2, 5), st.integers(2, 5)).flatmap(
    lambda shape: st.lists(
        st.integers(0, 60),
        min_size=shape[0] * shape[1],
        max_size=shape[0] * shape[1],
    ).map(lambda flat: np.array(flat).reshape(shape))
)


@given(counts_arrays)
def test_plugin_entropy_bounds(counts):
    h = plugin_entropy_from_counts(counts)
    m = int((counts > 0).sum())
    assert -1e-12 <= h <= np.log(max(m, 1)) + 1e-9


@given(counts_arrays)
def test_miller_madow_at_least_plugin(counts):
    assert entropy_from_counts(counts) >= plugin_entropy_from_counts(counts) - 1e-12


@given(counts_arrays)
def test_entropy_scale_invariant(counts):
    # Entropy depends on proportions only: doubling all counts leaves the
    # plug-in estimate unchanged.
    if counts.sum() == 0:
        return
    a = plugin_entropy_from_counts(counts)
    b = plugin_entropy_from_counts(counts * 2)
    assert a == np.float64(b) or abs(a - b) < 1e-12


@given(tables)
def test_mi_nonnegative_and_symmetric(t):
    if t.sum() == 0:
        return
    mi = mi_from_table(t, miller_madow=False)
    assert mi >= -1e-10
    assert abs(mi - mi_from_table(t.T, miller_madow=False)) < 1e-10


@given(tables)
def test_kappa_decomposes_mi(t):
    if t.sum() == 0:
        return
    assert abs(contribution_table(t).sum() - mi_from_table(t, miller_madow=False)) < 1e-9


@given(st.floats(0.0, 500.0), st.integers(1, 200))
def test_chi2_sf_in_unit_interval(x, df):
    p = chi2_sf(x, df)
    assert 0.0 <= p <= 1.0


@given(st.integers(1, 100))
def test_chi2_sf_decreasing(df):
    xs = np.linspace(0.0, 10.0 * df, 20)
    ps = [chi2_sf(float(x), df) for x in xs]
    assert all(a >= b - 1e-12 for a, b in zip(ps, ps[1:]))


@given(
    st.lists(st.integers(0, 40), min_size=1, max_size=6),
    st.lists(st.integers(1, 5), min_size=1, max_size=6),
    st.integers(0, 2**31 - 1),
)
@settings(max_examples=40)
def test_random_table_margins_always_hold(rows, cols_weights, seed):
    rows = np.array(rows)
    total = int(rows.sum())
    if total == 0:
        return
    w = np.array(cols_weights, dtype=float)
    cols = np.floor(w / w.sum() * total).astype(np.int64)
    cols[0] += total - cols.sum()  # fix rounding so margins agree
    t = random_table_with_margins(rows, cols, np.random.default_rng(seed))
    assert (t >= 0).all()
    np.testing.assert_array_equal(t.sum(axis=1), rows)
    np.testing.assert_array_equal(t.sum(axis=0), cols)


@given(st.integers(3, 10), st.integers(0, 10_000))
@settings(max_examples=25)
def test_dsep_symmetry_on_random_dags(n_nodes, seed):
    bn = random_bayes_net(n_nodes, seed=seed)
    dag = bn.dag
    rng = np.random.default_rng(seed)
    nodes = dag.nodes
    for _ in range(5):
        x, y = rng.choice(nodes, size=2, replace=False)
        z = [v for v in nodes if v not in (x, y) and rng.random() < 0.3]
        assert dag.d_separated(x, y, z) == dag.d_separated(y, x, z)


@given(st.integers(3, 10), st.integers(0, 10_000))
@settings(max_examples=25)
def test_markov_boundary_dseparates(n_nodes, seed):
    dag = random_bayes_net(n_nodes, seed=seed).dag
    for x in dag.nodes:
        mb = dag.markov_boundary(x)
        for y in dag.nodes:
            if y != x and y not in mb:
                assert dag.d_separated(x, y, mb)


@given(st.integers(2, 12), st.integers(0, 10_000))
@settings(max_examples=25)
def test_random_dag_topological_consistency(n_nodes, seed):
    dag = random_bayes_net(n_nodes, seed=seed).dag
    order = dag.topological_order()
    pos = {n: i for i, n in enumerate(order)}
    for u, v in dag.edges():
        assert pos[u] < pos[v]


@given(st.integers(2, 8), st.integers(0, 1000), st.integers(2, 4))
@settings(max_examples=15, deadline=None)
def test_bayes_net_cpt_rows_are_distributions(n_nodes, seed, cats):
    bn = random_bayes_net(n_nodes, seed=seed, n_categories=cats)
    for node, cpt in bn.cpts.items():
        assert cpt.shape[1] == cats
        np.testing.assert_allclose(cpt.sum(axis=1), 1.0, atol=1e-9)
        assert (cpt > 0).all()


def test_dag_chain_vs_collider_asymmetry():
    chain = DAG.from_edges(list("ABC"), [("A", "B"), ("B", "C")])
    collider = DAG.from_edges(list("ABC"), [("A", "B"), ("C", "B")])
    assert not chain.d_separated("A", "C", [])
    assert collider.d_separated("A", "C", [])
    assert chain.d_separated("A", "C", ["B"])
    assert not collider.d_separated("A", "C", ["B"])
