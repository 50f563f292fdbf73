"""Conditional-independence tests (paper Sec. 5 and Sec. 6).

Four testing procedures over a :class:`~repro.core.contingency.ContingencyEngine`:

* ``chi2`` — the classical G-test: ``G = 2 n I_hat(X;Y|Z)`` (plug-in, in
  nats) is asymptotically chi-squared with
  ``df = (|X|-1)(|Y|-1) |Pi_Z(D)|`` degrees of freedom.
* ``mit`` — the paper's Monte-Carlo permutation test (Alg. 2): instead of
  shuffling rows, draw ``m`` random contingency tables with the observed
  margins per conditioning group (Patefield-equivalent sampler in
  :mod:`repro.core.stats`), and read the p-value off the permutation
  distribution of ``I_hat(X;Y|Z) = sum_z Pr(z) I_hat_z(X;Y)``.
* ``mit-sampling`` — MIT restricted to a weighted sample of conditioning
  groups with weights ``w_z = Pr(z) * max(H(X|z), H(Y|z))`` (Sec. 5,
  "Sampling from groups"); sample size ``ceil(c * log(1 + #groups))``
  as used in Sec. 7.3.
* ``hymit`` — the hybrid (Sec. 6): chi2 when the sample is large relative
  to the degrees of freedom (``df <= n / beta``, beta = 5), otherwise
  the permutation test.

The observed statistic uses the same estimator as the permuted replicas,
so estimator bias cancels inside the test.
"""
from __future__ import annotations

import math
import time
from dataclasses import dataclass, field

import numpy as np

from repro.core.contingency import ContingencyEngine
from repro.core.entropy import mi_from_table, plugin_entropy_from_counts
from repro.core.stats import chi2_sf, random_table_with_margins

__all__ = ["TestResult", "IndependenceTester"]

METHODS = ("chi2", "mit", "mit-sampling", "hymit")


@dataclass(frozen=True)
class TestResult:
    """Outcome of one conditional-independence test."""

    x: str
    y: str | tuple[str, ...]  # a tuple means the joint of several attrs
    z: tuple[str, ...]
    statistic: float  # observed I_hat(X;Y|Z), nats
    p_value: float
    method: str  # method that actually ran (hymit resolves to chi2/mit-sampling)
    df: int | None = None  # chi-squared degrees of freedom (chi2 path)
    ci: tuple[float, float] | None = None  # 95% CI around p (permutation path)
    m: int | None = None  # permutation count (permutation path)

    def independent(self, alpha: float) -> bool:
        return self.p_value >= alpha


def _weighted_stat(tables, probs, *, miller_madow: bool) -> float:
    return float(
        sum(p * mi_from_table(t, miller_madow=miller_madow) for p, t in zip(probs, tables))
    )


@dataclass
class IndependenceTester:
    """Conditional-independence oracle bound to one engine.

    ``method`` selects the procedure; ``alpha`` the significance level
    (the paper uses 0.01 throughout); ``m`` the permutation count;
    ``beta`` the HyMIT switch threshold; ``sample_c`` the group-sampling
    constant. Deterministic given ``seed`` (an internal counter varies
    the stream between calls).
    """

    engine: ContingencyEngine
    method: str = "hymit"
    alpha: float = 0.01
    m: int = 100
    beta: float = 5.0
    sample_c: float = 3.0
    seed: int = 0
    miller_madow: bool = True
    cache_results: bool = True
    n_tests: int = 0
    cache_hits: int = 0
    total_test_time: float = 0.0
    _call: int = field(default=0, repr=False)
    _cache: dict = field(default_factory=dict, repr=False)

    def __post_init__(self) -> None:
        if self.method not in METHODS:
            raise ValueError(f"unknown method {self.method!r}; expected one of {METHODS}")
        if self.method != "chi2":
            # A permutation test can never report p below 1/(m+1); with m
            # under 1/alpha every test would be "insignificant" no matter
            # how strong the dependence. Clamp m so the floor stays below
            # alpha (the paper pairs m=100..1000 with alpha=0.01).
            self.m = max(self.m, int(math.ceil(1.0 / self.alpha)))

    # -- public API ----------------------------------------------------------

    def test(self, x: str, y, z=()) -> TestResult:
        t0 = time.perf_counter()
        z = tuple(z)
        if not isinstance(y, str):
            y = tuple(y)
        # I(X;Y|Z) is symmetric in (X, Y); canonicalize the cache key so
        # repeated tests (GS and CD re-ask constantly) are free.
        if isinstance(y, str):
            key = (frozenset((x, y)), frozenset(z))
        else:
            key = ((x, y), frozenset(z))
        if self.cache_results and key in self._cache:
            self.cache_hits += 1
            return self._cache[key]
        self.n_tests += 1
        self.engine.stats.independence_tests += 1
        self._call += 1
        res = self._dispatch(x, y, z)
        if self.cache_results:
            self._cache[key] = res
        self.total_test_time += time.perf_counter() - t0
        return res

    def independent(self, x: str, y: str, z=()) -> bool:
        return self.test(x, y, z).independent(self.alpha)

    # -- internals -----------------------------------------------------------

    def _rng(self) -> np.random.Generator:
        return np.random.default_rng(np.random.SeedSequence([self.seed, self._call]))

    def _groups(self, x: str, y, z: tuple[str, ...]):
        tables = [t for _, t in self.engine.grouped_tables(x, y, z)]
        n = sum(int(t.sum()) for t in tables)
        probs = [t.sum() / n for t in tables] if n else []
        return tables, probs, n

    def _dispatch(self, x: str, y, z: tuple[str, ...]) -> TestResult:
        n = self.engine.n
        if n == 0:
            return TestResult(x, y, z, 0.0, 1.0, "degenerate")
        if self.method == "chi2":
            return self._chi2(x, y, z, n)
        if self.method == "hymit":
            # chi2 when the sample is large relative to the degrees of
            # freedom, else the permutation test with group sampling.
            df = self._df(x, y, z)
            if df <= 0 or df <= n / self.beta:
                return self._chi2(x, y, z, n)
            tables, probs, n = self._groups(x, y, z)
            if not tables:
                return TestResult(x, y, z, 0.0, 1.0, "degenerate")
            return self._mit(x, y, z, tables, probs, sample_groups=True)
        tables, probs, n = self._groups(x, y, z)
        if n == 0 or not tables:
            return TestResult(x, y, z, 0.0, 1.0, "degenerate")
        return self._mit(
            x, y, z, tables, probs, sample_groups=self.method == "mit-sampling"
        )

    def _df(self, x: str, y, z: tuple[str, ...]) -> int:
        ys = (y,) if isinstance(y, str) else tuple(y)
        rx = len(self.engine.counts((x,)))
        ry = len(self.engine.counts(ys))
        groups = len(self.engine.counts(z)) if z else 1
        return (rx - 1) * (ry - 1) * groups

    def _chi2(self, x, y, z, n) -> TestResult:
        # Plug-in CMI from four cached entropies (no per-group tables):
        # G = 2 n I_hat (nats) ~ chi-squared with df degrees of freedom.
        stat = self.engine.plugin_cmi(x, y, z)
        df = self._df(x, y, z)
        if df <= 0:
            return TestResult(x, y, z, stat, 1.0, "chi2", df=max(df, 0))
        g = max(0.0, 2.0 * n * stat)
        return TestResult(x, y, z, stat, chi2_sf(g, df), "chi2", df=df)

    def _mit(self, x, y, z, tables, probs, *, sample_groups: bool) -> TestResult:
        rng = self._rng()
        mm = self.miller_madow
        if sample_groups and len(tables) > 1:
            # Weight groups by Pr(z) * max(H(X|z), H(Y|z)); groups with
            # ~zero weight cannot move the statistic (Sec. 5).
            w = np.array(
                [
                    p
                    * max(
                        plugin_entropy_from_counts(t.sum(axis=1)),
                        plugin_entropy_from_counts(t.sum(axis=0)),
                    )
                    for p, t in zip(probs, tables)
                ]
            )
            if w.sum() <= 0:
                return TestResult(
                    x, y, z, 0.0, 1.0, "mit-sampling", ci=(1.0, 1.0), m=self.m
                )
            nonzero = int((w > 0).sum())
            k = min(
                nonzero,
                len(tables),
                max(1, math.ceil(self.sample_c * math.log1p(len(tables)))),
            )
            idx = rng.choice(len(tables), size=k, replace=False, p=w / w.sum())
            tables = [tables[i] for i in idx]
            tot = sum(probs[i] for i in idx)
            probs = [probs[i] / tot for i in idx]
            method = "mit-sampling"
        else:
            method = "mit" if not sample_groups else "mit-sampling"

        s0 = _weighted_stat(tables, probs, miller_madow=mm)
        # Degenerate groups (single row or column margin) have MI == 0 in
        # every permutation; skip their sampling entirely.
        live = [
            (i, t)
            for i, t in enumerate(tables)
            if (t.sum(axis=1) > 0).sum() > 1 and (t.sum(axis=0) > 0).sum() > 1
        ]
        s = np.zeros(self.m)
        for i, t in live:
            rm, cm = t.sum(axis=1), t.sum(axis=0)
            p = probs[i]
            for j in range(self.m):
                perm = random_table_with_margins(rm, cm, rng)
                s[j] += p * mi_from_table(perm, miller_madow=mm)
        exceed = int((s >= s0 - 1e-12).sum())
        p_hat = exceed / self.m
        half = 1.96 * math.sqrt(max(p_hat * (1 - p_hat), 0.0) / self.m)
        # A permutation p-value of exactly 0 only means "< 1/m"; report
        # the standard add-one estimate so downstream thresholds behave.
        p_rep = max(p_hat, 1.0 / (self.m + 1)) if exceed == 0 else p_hat
        ci = (max(0.0, p_hat - half), min(1.0, p_hat + half))
        return TestResult(x, y, z, s0, p_rep, method, ci=ci, m=self.m)
