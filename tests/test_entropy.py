"""Tests for Miller-Madow entropy, mutual information and contribution
(kappa) estimators."""
import numpy as np
import pytest

from repro.core.entropy import (
    contribution_table,
    entropy_from_counts,
    mi_from_table,
    plugin_entropy_from_counts,
)


@pytest.mark.parametrize(
    "counts,expected",
    [
        ([100], 0.0),
        ([50, 50], np.log(2)),
        ([25, 25, 25, 25], np.log(4)),
        ([10, 10, 10, 10, 10, 10, 10, 10], np.log(8)),
    ],
)
def test_plugin_entropy_known_values(counts, expected):
    assert plugin_entropy_from_counts(np.array(counts)) == pytest.approx(expected)


def test_plugin_entropy_skewed_below_uniform():
    assert plugin_entropy_from_counts(np.array([90, 10])) < np.log(2)


def test_plugin_entropy_ignores_zero_cells():
    a = plugin_entropy_from_counts(np.array([50, 50, 0, 0]))
    b = plugin_entropy_from_counts(np.array([50, 50]))
    assert a == pytest.approx(b)


def test_plugin_entropy_empty():
    assert plugin_entropy_from_counts(np.array([])) == 0.0
    assert plugin_entropy_from_counts(np.array([0, 0])) == 0.0


def test_miller_madow_correction_value():
    counts = np.array([30, 20, 10])
    n, m = 60, 3
    assert entropy_from_counts(counts) == pytest.approx(
        plugin_entropy_from_counts(counts) + (m - 1) / (2 * n)
    )


def test_miller_madow_greater_than_plugin():
    counts = np.array([7, 3, 2, 1])
    assert entropy_from_counts(counts) > entropy_from_counts(
        counts, miller_madow=False
    )


def test_miller_madow_reduces_bias_on_uniform():
    # Average plug-in entropy over many small samples underestimates
    # log(k); the MM correction should move it closer.
    rng = np.random.default_rng(0)
    k, n, reps = 8, 60, 400
    plugin, mm = [], []
    for _ in range(reps):
        sample = rng.integers(0, k, n)
        counts = np.bincount(sample, minlength=k)
        plugin.append(entropy_from_counts(counts, miller_madow=False))
        mm.append(entropy_from_counts(counts))
    true_h = np.log(k)
    assert abs(np.mean(mm) - true_h) < abs(np.mean(plugin) - true_h)


@pytest.mark.parametrize(
    "table,expected",
    [
        ([[50, 0], [0, 50]], np.log(2)),  # perfect dependence
        ([[25, 25], [25, 25]], 0.0),  # exact independence
        ([[30, 20], [20, 30]], None),  # positive, computed below
    ],
)
def test_mi_known_tables(table, expected):
    mi = mi_from_table(np.array(table), miller_madow=False)
    if expected is None:
        assert 0 < mi < np.log(2)
    else:
        assert mi == pytest.approx(expected, abs=1e-12)


def test_mi_symmetric():
    t = np.array([[30, 12, 5], [8, 22, 9]])
    assert mi_from_table(t, miller_madow=False) == pytest.approx(
        mi_from_table(t.T, miller_madow=False)
    )


def test_mi_nonnegative_plugin():
    rng = np.random.default_rng(1)
    for _ in range(50):
        t = rng.integers(0, 30, size=(3, 4))
        if t.sum() == 0:
            continue
        assert mi_from_table(t, miller_madow=False) >= -1e-12


def test_mi_upper_bound_min_marginal_entropy():
    rng = np.random.default_rng(2)
    for _ in range(50):
        t = rng.integers(0, 30, size=(3, 3)) + 1
        mi = mi_from_table(t, miller_madow=False)
        hx = plugin_entropy_from_counts(t.sum(axis=1))
        hy = plugin_entropy_from_counts(t.sum(axis=0))
        assert mi <= min(hx, hy) + 1e-9


def test_kappa_sums_to_plugin_mi():
    rng = np.random.default_rng(3)
    for _ in range(20):
        t = rng.integers(0, 40, size=(3, 4))
        if t.sum() == 0:
            continue
        assert contribution_table(t).sum() == pytest.approx(
            mi_from_table(t, miller_madow=False), abs=1e-10
        )


def test_kappa_signs():
    # Over-represented cells contribute positively, under-represented
    # negatively (Eq. 5).
    t = np.array([[40, 10], [10, 40]])
    k = contribution_table(t)
    assert k[0, 0] > 0 and k[1, 1] > 0
    assert k[0, 1] < 0 and k[1, 0] < 0


def test_kappa_zero_for_independent_table():
    t = np.array([[20, 20], [20, 20]])
    np.testing.assert_allclose(contribution_table(t), 0.0, atol=1e-12)


def test_kappa_zero_count_cells_contribute_zero():
    t = np.array([[10, 0], [5, 5]])
    assert contribution_table(t)[0, 1] == 0.0


def test_mi_chain_identity_three_way():
    # I(X;Y) computed two ways: from the joint table directly, and via
    # H(X) + H(Y) - H(XY) on flattened counts.
    t = np.array([[12, 7, 1], [3, 9, 14]])
    hx = plugin_entropy_from_counts(t.sum(axis=1))
    hy = plugin_entropy_from_counts(t.sum(axis=0))
    hxy = plugin_entropy_from_counts(t.ravel())
    assert mi_from_table(t, miller_madow=False) == pytest.approx(hx + hy - hxy)
