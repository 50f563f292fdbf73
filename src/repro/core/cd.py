"""The CD algorithm (paper Alg. 1): discover the parents of a treatment
attribute directly from data, without learning the whole causal DAG.

Phase I scans Z in MB(T): Z is a parent candidate if T is a collider on
a path between Z and some W in MB(T) that are themselves (conditionally)
independent — condition (a): exists S subseteq MB(Z) - {T} and W with
(Z indep W | S) and (Z !indep W | S + {T}). Phase II removes candidates
that are not neighbors of T — condition (b): exists S subseteq
MB(T) - {C} with (T indep C | S).

Fallback (Sec. 4): when CD returns nothing but MB(T) is nonempty (the
single-parent / all-parents-adjacent regime where parents are not
identifiable), HypDB uses Z = MB(T) - {outcomes}.

Subset enumeration is capped at ``max_cond`` attributes; the paper's
largest conditioning set over all experiments had 6 attributes on a
101-attribute dataset.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from itertools import combinations
from typing import Sequence

from repro.core.fd import DroppedAttrs, drop_logical_dependencies
from repro.core.independence import IndependenceTester
from repro.core.markov import grow_shrink

__all__ = ["CDResult", "discover_parents", "discover_covariates_and_mediators"]


@dataclass
class CDResult:
    """Output of parent discovery for one target attribute."""

    target: str
    parents: list[str]
    markov_boundary: list[str]
    used_fallback: bool
    dropped: DroppedAttrs
    n_tests: int
    mb_of: dict[str, list[str]] = field(default_factory=dict)


def _subsets(items: Sequence[str], max_size: int):
    for k in range(0, min(len(items), max_size) + 1):
        yield from combinations(items, k)


def discover_parents(
    tester: IndependenceTester,
    target: str,
    attrs: Sequence[str],
    *,
    outcomes: Sequence[str] = (),
    max_cond: int = 3,
    drop_dependencies: bool = True,
    detect_high_entropy: bool = False,
    fd_eps: float = 1e-6,
    indep_accept_alpha: float = 0.2,
) -> CDResult:
    """Run CD for ``target`` over candidate ``attrs``.

    ``outcomes`` are only used by the fallback (they are never valid
    covariates). ``detect_high_entropy`` triggers the Spark sampling
    heuristic and is off by default — callers that know their schema
    (tests, RandomData) skip the extra jobs; the dataset reports enable
    it.

    ``indep_accept_alpha``: phase I enumerates many (S, W) combinations,
    so *accepting* independence at the bare significance level would let
    low-power tests admit spurious candidates (a child of T admitted
    once is never removed by phase II, since children are not separable
    from T). Independence claims therefore require p >= this larger
    threshold, while dependence claims use the tester's alpha — the
    asymmetric-threshold convention of robust constraint-based
    discovery.
    """
    t0 = tester.n_tests
    engine = tester.engine
    if drop_dependencies:
        dropped = drop_logical_dependencies(
            engine, target, attrs, eps=fd_eps, detect_high_entropy=detect_high_entropy
        )
    else:
        dropped = DroppedAttrs(fd=(), high_entropy=())
    pool = [a for a in attrs if a != target and a not in dropped.all]

    mb_t = grow_shrink(tester, target, pool, max_cond=max_cond)
    mb_of: dict[str, list[str]] = {target: mb_t}

    # Phase I — collect parent candidates via the collider criterion (a).
    # The query outcomes are excluded from every conditioning set S: an
    # outcome is a descendant of the treatment and its mediators, so
    # conditioning on it opens Berkson paths that mimic the
    # collider-at-T signal and admit mediators as false parents (the
    # back-door criterion likewise forbids descendants of T in Z).
    outcome_set = set(outcomes)
    candidates: set[str] = set()
    for z in mb_t:
        if z in candidates:
            continue
        if z not in mb_of:
            mb_of[z] = grow_shrink(tester, z, pool, max_cond=max_cond)
        mb_z = [v for v in mb_of[z] if v != target and v not in outcome_set]
        found = False
        for s in _subsets(mb_z, max_cond):
            if found:
                break
            for w in mb_t:
                if w == z or w in s:
                    continue
                if (
                    tester.test(z, w, s).p_value >= indep_accept_alpha
                    and tester.test(z, w, tuple(s) + (target,)).p_value
                    < tester.alpha
                ):
                    candidates.add(z)
                    candidates.add(w)
                    found = True
                    break

    # Phase II — drop candidates separable from T (not neighbors of T).
    # Outcomes are again kept out of S: conditioning on them only opens
    # paths (never blocks), so they can only mask a true separation.
    parents = []
    for c in sorted(candidates):
        separable = False
        rest = [v for v in mb_t if v != c and v not in outcome_set]
        for s in _subsets(rest, max_cond):
            if tester.test(target, c, s).p_value >= indep_accept_alpha:
                separable = True
                break
        if not separable:
            parents.append(c)

    used_fallback = False
    if not parents and mb_t:
        used_fallback = True
        parents = [v for v in mb_t if v not in set(outcomes)]

    return CDResult(
        target=target,
        parents=parents,
        markov_boundary=mb_t,
        used_fallback=used_fallback,
        dropped=dropped,
        n_tests=tester.n_tests - t0,
        mb_of=mb_of,
    )


def discover_covariates_and_mediators(
    tester: IndependenceTester,
    treatment: str,
    outcome: str,
    attrs: Sequence[str],
    *,
    max_cond: int = 3,
    drop_dependencies: bool = True,
    detect_high_entropy: bool = False,
) -> tuple[CDResult, list[str]]:
    """Covariates Z = PA_T and mediators M = PA_Y - {T} (paper Sec. 2),
    both learned with CD. Returns (CD result for the treatment, mediator
    list)."""
    cov = discover_parents(
        tester,
        treatment,
        attrs,
        outcomes=[outcome],
        max_cond=max_cond,
        drop_dependencies=drop_dependencies,
        detect_high_entropy=detect_high_entropy,
    )
    pa_y = discover_parents(
        tester,
        outcome,
        attrs,
        outcomes=[],
        max_cond=max_cond,
        drop_dependencies=drop_dependencies,
        detect_high_entropy=False,
    )
    mediators = [m for m in pa_y.parents if m != treatment and m != outcome]
    return cov, mediators
