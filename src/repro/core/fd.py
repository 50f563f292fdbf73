"""Dropping logical dependencies before causal analysis (paper Sec. 4).

Functional dependencies and key-like attributes "totally confuse"
constraint-based causal discovery: if X => T then MB(T) = {X}, isolating
T from the DAG. Before computing any Markov boundary, HypDB

1. discards attributes X that determine the treatment, H(T|X) ~ 0
   (approximate FDs such as AirportWAC => Airport — when the dependency
   is two-way, i.e. also H(X|T) ~ 0, the attributes are interchangeable
   codes for one another and X carries no extra causal content), and
2. discards ID-like attributes (FlightNum, TailNum, ...) whose entropy
   is an artifact of sample size rather than a property of the
   generating distribution: the paper's heuristic draws small random
   samples of different sizes and checks whether the attribute's entropy
   tracks the sample size. For a genuine categorical attribute the
   entropy plateaus; for a key it grows like log(sample size).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.core.contingency import ContingencyEngine
from repro.core.entropy import entropy_from_counts

__all__ = [
    "DroppedAttrs",
    "fd_attributes",
    "mutually_fd_pairs",
    "high_entropy_attributes",
    "drop_logical_dependencies",
]


@dataclass(frozen=True)
class DroppedAttrs:
    """Attributes removed before Markov-boundary computation, with reasons."""

    fd: tuple[str, ...] = ()  # X with H(T|X) ~ 0 (X functionally determines T)
    high_entropy: tuple[str, ...] = ()  # sample-size-dependent entropy (ID-like)
    mutual_fd: tuple[str, ...] = ()  # later member of a two-way FD pair

    @property
    def all(self) -> frozenset[str]:
        return frozenset(self.fd) | frozenset(self.high_entropy) | frozenset(self.mutual_fd)


def fd_attributes(
    engine: ContingencyEngine,
    treatment: str,
    attrs,
    *,
    eps: float = 1e-6,
) -> list[str]:
    """Attributes X (≠ treatment) with H(treatment | X) <= eps: X
    functionally determines the treatment and would hijack MB(T)."""
    out = []
    for x in attrs:
        if x == treatment:
            continue
        if engine.cond_entropy(treatment, [x]) <= eps:
            out.append(x)
    return out


def mutually_fd_pairs(
    engine: ContingencyEngine,
    attrs,
    *,
    eps: float = 1e-6,
) -> list[str]:
    """Drop-list for two-way approximate FDs: for each pair (X, W) with
    H(X|W) ~ 0 and H(W|X) ~ 0 (interchangeable codes, e.g.
    AirportWAC <=> Airport), keep the earlier attribute in ``attrs``
    order and drop the later one. One-way FDs are left alone — they are
    genuine structure, not recoding."""
    attrs = list(attrs)
    dropped: set[str] = set()
    for i, x in enumerate(attrs):
        if x in dropped:
            continue
        for w in attrs[i + 1 :]:
            if w in dropped:
                continue
            if (
                engine.cond_entropy(x, [w]) <= eps
                and engine.cond_entropy(w, [x]) <= eps
            ):
                dropped.add(w)
    return sorted(dropped)


def high_entropy_attributes(
    df: DataFrame,
    attrs,
    *,
    sizes: tuple[int, ...] = (500, 1000, 2000),
    growth_tol: float = 0.05,
    seed: int = 0,
) -> list[str]:
    """ID-like attributes, detected by the paper's sample-size heuristic.

    Draw one random sample per size in ``sizes`` (via Spark ``sample``),
    compute the attribute's Miller-Madow entropy in each, and flag the
    attribute when entropy keeps growing with sample size: relative
    growth from the smallest to the largest sample exceeding
    ``growth_tol`` means the entropy is a function of n (as for keys,
    where H ~ log n), not of the underlying distribution.
    """
    total = df.count()
    samples: list[pd.DataFrame] = []
    for i, target in enumerate(sorted(sizes)):
        frac = min(1.0, target / max(total, 1))
        samples.append(df.select(list(attrs)).sample(fraction=frac, seed=seed + i).toPandas())
    flagged = []
    for a in attrs:
        ent = []
        for s in samples:
            counts = s[a].value_counts().to_numpy()
            ent.append(entropy_from_counts(counts))
        lo, hi = ent[0], ent[-1]
        if lo <= 0:
            # constant in the small sample but varying later: still ID-ish
            if hi > 0.5:
                flagged.append(a)
            continue
        if (hi - lo) / lo > growth_tol and hi > lo + 0.05:
            flagged.append(a)
    return flagged


def drop_logical_dependencies(
    engine: ContingencyEngine,
    treatment: str,
    attrs,
    *,
    eps: float = 1e-6,
    detect_high_entropy: bool = True,
    sizes: tuple[int, ...] = (500, 1000, 2000),
    seed: int = 0,
) -> DroppedAttrs:
    """Full Sec. 4 pre-filter: FD attributes w.r.t. the treatment plus
    ID-like high-entropy attributes. Returns what was dropped and why."""
    he: list[str] = []
    if detect_high_entropy:
        he = high_entropy_attributes(
            engine.df, [a for a in attrs if a != treatment], sizes=sizes, seed=seed
        )
    remaining = [a for a in attrs if a not in he]
    fd = fd_attributes(engine, treatment, remaining, eps=eps)
    remaining = [a for a in remaining if a not in fd]
    mfd = mutually_fd_pairs(engine, remaining, eps=eps)
    return DroppedAttrs(fd=tuple(fd), high_entropy=tuple(he), mutual_fd=tuple(mfd))


def is_high_entropy_series(values: np.ndarray, sizes=(500, 1000, 2000), growth_tol=0.05, seed=0) -> bool:
    """Pure-numpy variant of the sample-size heuristic (used in tests and
    by in-driver baselines): subsample ``values`` at each size and check
    entropy growth."""
    rng = np.random.default_rng(seed)
    ent = []
    for target in sorted(sizes):
        k = min(len(values), target)
        sub = rng.choice(values, size=k, replace=False)
        _, counts = np.unique(sub, return_counts=True)
        ent.append(entropy_from_counts(counts))
    lo, hi = ent[0], ent[-1]
    if lo <= 0:
        return hi > 0.5
    return (hi - lo) / lo > growth_tol and hi > lo + 0.05
