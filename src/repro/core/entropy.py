"""Entropy and mutual-information estimators over contingency tables.

All quantities are estimated from *counts* (a contingency table is a
pandas DataFrame with one ``n`` column of group counts), never from raw
rows: the raw-data -> counts step is Spark's job
(:mod:`repro.core.contingency`).

The paper (Sec. 2 / Appendix 10.1) uses the Miller-Madow entropy
estimator: the plug-in entropy plus the first-order bias correction
``(m - 1) / (2 n)`` where ``m`` is the number of observed distinct
values and ``n`` the sample size. All entropies are in **nats** so the
G-test identity ``G = 2 n I_hat`` (used by the chi-squared test and
HyMIT) holds without conversion factors.
"""
from __future__ import annotations

import numpy as np

__all__ = [
    "entropy_from_counts",
    "plugin_entropy_from_counts",
    "mi_from_table",
    "contribution_table",
]


def plugin_entropy_from_counts(counts: np.ndarray) -> float:
    """Plug-in (maximum-likelihood) entropy, in nats, of a count vector."""
    c = np.asarray(counts, dtype=np.float64)
    c = c[c > 0]
    n = c.sum()
    if n <= 0:
        return 0.0
    p = c / n
    return float(-(p * np.log(p)).sum())


def entropy_from_counts(counts: np.ndarray, *, miller_madow: bool = True) -> float:
    """Miller-Madow entropy, in nats, of a count vector.

    ``H_hat = H_plugin + (m - 1) / (2 n)`` with ``m`` the number of
    cells with positive count. Setting ``miller_madow=False`` gives the
    plug-in estimate (used inside the permutation test where the same
    estimator must be applied to observed and permuted tables — the MM
    correction is margin-determined and identical on both, so it cancels
    anyway; we keep it switchable for clarity and tests).
    """
    c = np.asarray(counts, dtype=np.float64)
    c = c[c > 0]
    n = c.sum()
    if n <= 0:
        return 0.0
    h = plugin_entropy_from_counts(c)
    if miller_madow:
        h += (len(c) - 1) / (2.0 * n)
    return h


def mi_from_table(table: np.ndarray, *, miller_madow: bool = True) -> float:
    """Mutual information I(X;Y), in nats, from an r x c contingency table.

    ``I = H(X) + H(Y) - H(XY)`` with each entropy estimated by
    Miller-Madow (or plug-in). The estimate can be slightly negative for
    the MM variant on independent data; we do NOT clamp, because the
    permutation test compares like against like.
    """
    t = np.asarray(table, dtype=np.float64)
    hx = entropy_from_counts(t.sum(axis=1), miller_madow=miller_madow)
    hy = entropy_from_counts(t.sum(axis=0), miller_madow=miller_madow)
    hxy = entropy_from_counts(t.ravel(), miller_madow=miller_madow)
    return hx + hy - hxy


def contribution_table(table: np.ndarray) -> np.ndarray:
    """Degree of contribution ``kappa_(x,y)`` (Eq. 5) for every cell of a
    contingency table: ``Pr(x,y) * log(Pr(x,y) / (Pr(x) Pr(y)))``.

    The cells sum to the plug-in I(X;Y). Zero-count cells contribute 0.
    """
    t = np.asarray(table, dtype=np.float64)
    n = t.sum()
    if n <= 0:
        return np.zeros_like(t)
    p = t / n
    px = p.sum(axis=1, keepdims=True)
    py = p.sum(axis=0, keepdims=True)
    with np.errstate(divide="ignore", invalid="ignore"):
        ratio = np.where(p > 0, p / (px * py), 1.0)
        kappa = np.where(p > 0, p * np.log(ratio), 0.0)
    return kappa
