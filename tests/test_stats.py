"""Tests for the chi-squared survival function and the fixed-margin
contingency-table sampler (Patefield-equivalent)."""
import math

import numpy as np
import pytest

from repro.core.stats import chi2_sf, random_table_with_margins

# Reference values from standard chi-squared tables.
CHI2_CASES = [
    (3.841, 1, 0.05),
    (6.635, 1, 0.01),
    (5.991, 2, 0.05),
    (9.210, 2, 0.01),
    (7.815, 3, 0.05),
    (11.070, 5, 0.05),
    (15.086, 5, 0.01),
    (18.307, 10, 0.05),
    (23.209, 10, 0.01),
    (31.410, 20, 0.05),
    (124.342, 100, 0.05),
    (0.004, 1, 0.95),
    (0.103, 1, 0.748),
]


@pytest.mark.parametrize("x,df,expected", CHI2_CASES)
def test_chi2_sf_reference_values(x, df, expected):
    assert chi2_sf(x, df) == pytest.approx(expected, abs=2e-3)


def test_chi2_sf_at_zero_is_one():
    for df in (1, 2, 5, 50):
        assert chi2_sf(0.0, df) == 1.0
        assert chi2_sf(-1.0, df) == 1.0


def test_chi2_sf_monotone_decreasing_in_x():
    vals = [chi2_sf(x, 4) for x in np.linspace(0.01, 40, 50)]
    assert all(a >= b for a, b in zip(vals, vals[1:]))


def test_chi2_sf_monotone_increasing_in_df():
    vals = [chi2_sf(10.0, df) for df in range(1, 30)]
    assert all(a <= b for a, b in zip(vals, vals[1:]))


def test_chi2_sf_far_tail_is_tiny():
    assert chi2_sf(100.0, 1) < 1e-20
    assert 0.0 <= chi2_sf(1000.0, 2) < 1e-100


def test_chi2_sf_mean_region():
    # Median of chi2_k is ~ k(1 - 2/(9k))^3; sf at median ~ 0.5.
    for df in (2, 10, 40):
        med = df * (1 - 2 / (9 * df)) ** 3
        assert chi2_sf(med, df) == pytest.approx(0.5, abs=0.02)


def test_chi2_sf_invalid_df():
    with pytest.raises(ValueError):
        chi2_sf(1.0, 0)


@pytest.mark.parametrize(
    "rows,cols",
    [
        ([10, 20, 5], [15, 12, 8]),
        ([1, 1], [1, 1]),
        ([100], [40, 60]),
        ([40, 60], [100]),
        ([7, 0, 3], [5, 5]),
        ([50, 50, 50, 50], [80, 40, 40, 40]),
    ],
)
def test_random_table_margins_preserved(rows, cols, rng):
    for _ in range(20):
        t = random_table_with_margins(np.array(rows), np.array(cols), rng)
        assert t.min() >= 0
        np.testing.assert_array_equal(t.sum(axis=1), rows)
        np.testing.assert_array_equal(t.sum(axis=0), cols)


def test_random_table_margin_mismatch_raises(rng):
    with pytest.raises(ValueError):
        random_table_with_margins(np.array([5, 5]), np.array([4, 4]), rng)


def test_random_table_mean_matches_independence(rng):
    # E[n_ij] under the shuffle distribution is r_i * c_j / n.
    rows, cols = np.array([30, 70]), np.array([40, 60])
    n = rows.sum()
    acc = np.zeros((2, 2))
    m = 3000
    for _ in range(m):
        acc += random_table_with_margins(rows, cols, rng)
    expected = np.outer(rows, cols) / n
    np.testing.assert_allclose(acc / m, expected, rtol=0.05)


def test_random_table_variance_is_hypergeometric(rng):
    # Var[n_11] = r c (n-r)(n-c) / (n^2 (n-1)) for a 2x2 table.
    rows, cols = np.array([30, 70]), np.array([40, 60])
    n = rows.sum()
    samples = np.array(
        [
            random_table_with_margins(rows, cols, rng)[0, 0]
            for _ in range(4000)
        ]
    )
    r, c = rows[0], cols[0]
    var_expected = r * c * (n - r) * (n - c) / (n**2 * (n - 1))
    assert samples.var() == pytest.approx(var_expected, rel=0.1)


def test_random_table_deterministic_given_seed():
    a = random_table_with_margins(
        np.array([10, 20]), np.array([12, 18]), np.random.default_rng(42)
    )
    b = random_table_with_margins(
        np.array([10, 20]), np.array([12, 18]), np.random.default_rng(42)
    )
    np.testing.assert_array_equal(a, b)


def test_random_table_degenerate_single_cell(rng):
    t = random_table_with_margins(np.array([5]), np.array([5]), rng)
    assert t.tolist() == [[5]]


def test_chi2_sf_matches_erf_for_df1():
    # chi2_sf(x, 1) == 2 * (1 - Phi(sqrt(x))) == erfc(sqrt(x/2)).
    for x in (0.5, 1.0, 2.0, 5.0, 9.0):
        assert chi2_sf(x, 1) == pytest.approx(math.erfc(math.sqrt(x / 2)), rel=1e-8)


def test_chi2_sf_matches_exp_for_df2():
    # chi2 with 2 df is Exp(1/2): sf(x) = exp(-x/2).
    for x in (0.1, 1.0, 4.0, 10.0):
        assert chi2_sf(x, 2) == pytest.approx(math.exp(-x / 2), rel=1e-8)
