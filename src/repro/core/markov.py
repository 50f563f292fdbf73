"""Markov-boundary discovery: Grow-Shrink [Margaritis & Thrun 2000] and
IAMB [Tsamardinos et al. 2003].

The CD algorithm (paper Sec. 4) needs MB(T) and MB(Z) for Z in MB(T);
the paper computes them with Grow-Shrink. IAMB is also provided because
the baseline comparison (Sec. 7.4) includes it. Both consume an
:class:`~repro.core.independence.IndependenceTester` as the CI oracle.
"""
from __future__ import annotations

from typing import Sequence

from repro.core.independence import IndependenceTester

__all__ = ["grow_shrink", "iamb", "markov_boundaries"]


def grow_shrink(
    tester: IndependenceTester,
    target: str,
    attrs: Sequence[str],
    *,
    max_cond: int | None = None,
) -> list[str]:
    """Grow-Shrink Markov boundary of ``target`` among ``attrs``.

    Grow: repeatedly admit any X with X !indep T | B. Shrink: evict any X
    with X indep T | B - {X}. ``max_cond`` caps the size of conditioning
    sets (tests whose conditioning set exceeds it are performed on the
    ``max_cond`` attributes most associated with the target, a standard
    large-boundary safeguard).
    """
    others = [a for a in attrs if a != target]
    boundary: list[str] = []

    def _cond(exclude: str | None) -> list[str]:
        cond = [b for b in boundary if b != exclude]
        if max_cond is not None and len(cond) > max_cond:
            cond = sorted(cond, key=lambda v: -tester.engine.cmi(target, v))[:max_cond]
        return cond

    changed = True
    while changed:
        changed = False
        for x in others:
            if x in boundary:
                continue
            if not tester.independent(x, target, _cond(None)):
                boundary.append(x)
                changed = True
    for x in list(boundary):
        if tester.independent(x, target, _cond(x)):
            boundary.remove(x)
    return boundary


def iamb(
    tester: IndependenceTester,
    target: str,
    attrs: Sequence[str],
    *,
    max_cond: int | None = None,
) -> list[str]:
    """IAMB: like Grow-Shrink but the grow phase admits, per round, the
    single candidate with maximal I(X;T|B), which keeps the boundary
    small and the conditioning sets relevant."""
    others = [a for a in attrs if a != target]
    boundary: list[str] = []

    def _cond(exclude: str | None) -> list[str]:
        cond = [b for b in boundary if b != exclude]
        if max_cond is not None and len(cond) > max_cond:
            cond = sorted(cond, key=lambda v: -tester.engine.cmi(target, v))[:max_cond]
        return cond

    while True:
        candidates = [x for x in others if x not in boundary]
        if not candidates:
            break
        best = max(candidates, key=lambda x: tester.engine.cmi(x, target, _cond(None)))
        if tester.independent(best, target, _cond(None)):
            break
        boundary.append(best)
    for x in list(boundary):
        if tester.independent(x, target, _cond(x)):
            boundary.remove(x)
    return boundary


def markov_boundaries(
    tester: IndependenceTester,
    attrs: Sequence[str],
    *,
    algorithm: str = "gs",
    max_cond: int | None = None,
) -> dict[str, list[str]]:
    """Markov boundary of every attribute (used by the full-structure
    baselines and by CD's phase I, which needs MB(Z) for Z in MB(T))."""
    fn = {"gs": grow_shrink, "iamb": iamb}[algorithm]
    return {a: fn(tester, a, attrs, max_cond=max_cond) for a in attrs}
