"""Statistical kernels used throughout HypDB.

Two things live here, both driver-side micro-kernels that operate on
contingency tables (never on raw data):

* ``chi2_sf`` — the chi-squared survival function, needed by the G-test
  and by HyMIT. scipy is not available in this environment, so we
  implement the regularized incomplete gamma function directly
  (series expansion + Lentz continued fraction, cf. Numerical Recipes
  ``gammp``/``gammq``).

* ``random_table_with_margins`` — draw a random r x c contingency table
  with fixed row and column margins, distributed exactly as a table
  obtained by randomly shuffling one column of the underlying data.
  The paper uses Patefield's algorithm AS 159 for this; we obtain the
  identical distribution by sampling each row from a multivariate
  hypergeometric over the remaining column totals, which numpy provides
  natively (``Generator.multivariate_hypergeometric``). Sequentially
  conditioning row allocations this way is precisely the Fisher--Yates
  distribution with fixed margins, i.e. the distribution Patefield's
  algorithm samples from.
"""
from __future__ import annotations

import math

import numpy as np

__all__ = ["chi2_sf", "random_table_with_margins"]

_MAX_ITER = 500
_EPS = 3.0e-12


def _gamma_series(a: float, x: float) -> float:
    """Regularized lower incomplete gamma P(a, x) by series, for x < a + 1."""
    if x <= 0.0:
        return 0.0
    ap = a
    total = 1.0 / a
    delta = total
    for _ in range(_MAX_ITER):
        ap += 1.0
        delta *= x / ap
        total += delta
        if abs(delta) < abs(total) * _EPS:
            break
    return total * math.exp(-x + a * math.log(x) - math.lgamma(a))


def _gamma_cf(a: float, x: float) -> float:
    """Regularized upper incomplete gamma Q(a, x) by continued fraction,
    for x >= a + 1 (modified Lentz)."""
    tiny = 1.0e-300
    b = x + 1.0 - a
    c = 1.0 / tiny
    d = 1.0 / b
    h = d
    for i in range(1, _MAX_ITER + 1):
        an = -i * (i - a)
        b += 2.0
        d = an * d + b
        if abs(d) < tiny:
            d = tiny
        c = b + an / c
        if abs(c) < tiny:
            c = tiny
        d = 1.0 / d
        delta = d * c
        h *= delta
        if abs(delta - 1.0) < _EPS:
            break
    return h * math.exp(-x + a * math.log(x) - math.lgamma(a))


def chi2_sf(x: float, df: float) -> float:
    """Survival function P(X >= x) of a chi-squared variable with ``df``
    degrees of freedom. Accurate to ~1e-10 over the ranges used here."""
    if df <= 0:
        raise ValueError(f"df must be positive, got {df}")
    if x <= 0.0:
        return 1.0
    a = df / 2.0
    half_x = x / 2.0
    if half_x < a + 1.0:
        return max(0.0, min(1.0, 1.0 - _gamma_series(a, half_x)))
    return max(0.0, min(1.0, _gamma_cf(a, half_x)))


def random_table_with_margins(
    row_margins: np.ndarray,
    col_margins: np.ndarray,
    rng: np.random.Generator,
) -> np.ndarray:
    """Sample an r x c non-negative integer table with the given margins,
    uniformly w.r.t. the shuffle distribution (multivariate Fisher's
    noncentral hypergeometric with odds 1 — same family AS 159 samples).

    Row ``i`` is drawn from a multivariate hypergeometric: of the
    ``sum(remaining)`` items still unassigned, ``row_margins[i]`` are
    taken, colored by the remaining column totals.
    """
    rows = np.asarray(row_margins, dtype=np.int64)
    cols = np.asarray(col_margins, dtype=np.int64)
    if rows.sum() != cols.sum():
        raise ValueError("row and column margins must have equal totals")
    out = np.zeros((len(rows), len(cols)), dtype=np.int64)
    remaining = cols.copy()
    for i, r in enumerate(rows[:-1]):
        draw = rng.multivariate_hypergeometric(remaining, int(r))
        out[i] = draw
        remaining -= draw
    if len(rows) > 0:
        out[-1] = remaining
    return out
