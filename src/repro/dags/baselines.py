"""Baseline causal-structure-discovery algorithms (paper Sec. 7.4).

The paper compares CD against the R ``bnlearn`` implementations of:

* **FGS** — full Grow-Shrink structure learning [Margaritis & Thrun]:
  Markov boundaries for every node via GS, neighbor resolution by
  subset separation tests, v-structure orientation, Meek propagation,
  and extension of the remaining skeleton to a DAG.
* **IAMB** structure learning — same pipeline with IAMB boundaries.
* **Score-based greedy hill climbing** with AIC, BIC and BDeu scores.

All baselines consume the same :class:`ContingencyEngine` /
:class:`IndependenceTester` stack as the CD algorithm, so quality and
test-count comparisons are apples to apples.

``parent_f1`` is the evaluation metric: micro-averaged F1 of predicted
parent edges against the ground-truth DAG, optionally restricted to
nodes with >= 2 parents (the paper's Fig. 5(c) slice — CD targets
parent discovery, not whole-DAG recovery).
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field
from itertools import combinations
from typing import Mapping, Sequence

import numpy as np

from repro.core.contingency import ContingencyEngine
from repro.core.independence import IndependenceTester
from repro.core.markov import grow_shrink, iamb
from repro.dags.dag import DAG

__all__ = [
    "constraint_based_structure",
    "hill_climb",
    "parent_f1",
]


# ---------------------------------------------------------------------------
# Constraint-based: FGS / IAMB
# ---------------------------------------------------------------------------


def _subsets(items, max_size):
    for k in range(0, min(len(items), max_size) + 1):
        yield from combinations(items, k)


def constraint_based_structure(
    tester: IndependenceTester,
    attrs: Sequence[str],
    *,
    boundary: str = "gs",
    max_cond: int = 3,
) -> dict[str, set[str]]:
    """Learn a DAG with the GS/IAMB structure-learning pipeline; returns
    the parent sets of an extension-consistent DAG."""
    attrs = list(attrs)
    mb_fn = {"gs": grow_shrink, "iamb": iamb}[boundary]
    mb = {a: set(mb_fn(tester, a, attrs, max_cond=max_cond)) for a in attrs}
    # Symmetrize (AND rule) — standard correction for one-sided errors.
    for a in attrs:
        mb[a] = {b for b in mb[a] if a in mb[b]}

    # Skeleton + separating sets.
    neighbors: dict[str, set[str]] = {a: set() for a in attrs}
    sepset: dict[frozenset, tuple[str, ...]] = {}
    for a, b in combinations(attrs, 2):
        if b not in mb[a]:
            continue
        base = mb[a] - {b} if len(mb[a]) <= len(mb[b]) else mb[b] - {a}
        separated = False
        for s in _subsets(sorted(base), max_cond):
            if tester.independent(a, b, s):
                sepset[frozenset((a, b))] = s
                separated = True
                break
        if not separated:
            neighbors[a].add(b)
            neighbors[b].add(a)

    # V-structures: a - c - b with a, b non-adjacent and c outside their
    # separating set  =>  a -> c <- b.
    directed: set[tuple[str, str]] = set()
    for a, b in combinations(attrs, 2):
        if b in neighbors[a]:
            continue
        for c in neighbors[a] & neighbors[b]:
            s = sepset.get(frozenset((a, b)))
            if s is not None and c not in s:
                directed.add((a, c))
                directed.add((b, c))

    undirected = {
        frozenset((a, b))
        for a in attrs
        for b in neighbors[a]
        if (a, b) not in directed and (b, a) not in directed
    }

    def _adjacent(u, v):
        return v in neighbors[u]

    # Meek rules 1 & 2 to fixpoint.
    changed = True
    while changed:
        changed = False
        for e in list(undirected):
            a, b = tuple(e)
            for u, v in ((a, b), (b, a)):
                # Rule 1: w -> u, u - v, w and v non-adjacent  =>  u -> v
                if any(
                    (w, u) in directed and not _adjacent(w, v) and w != v
                    for w in attrs
                ):
                    directed.add((u, v))
                    undirected.discard(e)
                    changed = True
                    break
                # Rule 2: u -> w -> v and u - v  =>  u -> v
                if any(
                    (u, w) in directed and (w, v) in directed for w in attrs
                ):
                    directed.add((u, v))
                    undirected.discard(e)
                    changed = True
                    break

    # Extend what is left along a fixed node order (bnlearn's cextend,
    # modulo tie-breaking); flip if the preferred direction would close a
    # cycle.
    order = {a: i for i, a in enumerate(attrs)}
    parents: dict[str, set[str]] = {a: set() for a in attrs}
    for u, v in directed:
        parents[v].add(u)

    def _creates_cycle(u, v) -> bool:
        # would u -> v close a cycle? i.e. is u reachable from v?
        stack, seen = [v], set()
        while stack:
            n = stack.pop()
            if n == u:
                return True
            for c in (x for x in attrs if n in parents[x]):
                if c not in seen:
                    seen.add(c)
                    stack.append(c)
        return False

    for e in sorted(undirected, key=lambda e: tuple(sorted(e))):
        a, b = sorted(e, key=lambda n: order[n])
        if not _creates_cycle(a, b):
            parents[b].add(a)
        else:
            parents[a].add(b)
    return parents


# ---------------------------------------------------------------------------
# Score-based greedy hill climbing (AIC / BIC / BDeu)
# ---------------------------------------------------------------------------


@dataclass
class _ScoreCache:
    engine: ContingencyEngine
    score: str
    ess: float = 1.0
    cards: dict[str, int] = field(default_factory=dict)
    cache: dict[tuple[str, frozenset], float] = field(default_factory=dict)

    def card(self, a: str) -> int:
        if a not in self.cards:
            self.cards[a] = len(self.engine.counts((a,)))
        return self.cards[a]

    def local(self, node: str, parents: frozenset) -> float:
        key = (node, parents)
        if key in self.cache:
            return self.cache[key]
        pa = tuple(sorted(parents))
        c = self.engine.counts((node,) + pa)
        n_xp = c["n"].to_numpy(dtype=np.float64)
        if pa:
            n_p = (
                c.groupby(list(pa), observed=True)["n"].transform("sum").to_numpy(
                    dtype=np.float64
                )
            )
        else:
            n_p = np.full_like(n_xp, n_xp.sum())
        r = self.card(node)
        q = int(np.prod([self.card(p) for p in pa])) if pa else 1
        n_total = float(n_xp.sum())
        if self.score in ("aic", "bic"):
            ll = float((n_xp * np.log(n_xp / n_p)).sum())
            k = (r - 1) * q
            pen = k if self.score == "aic" else 0.5 * math.log(n_total) * k
            val = ll - pen
        elif self.score == "bde":
            a_pa = self.ess / q
            a_cell = self.ess / (q * r)
            # Per observed parent configuration (unobserved configs
            # contribute 0 to both terms).
            pa_groups = (
                c.groupby(list(pa), observed=True)["n"].sum().to_numpy(dtype=np.float64)
                if pa
                else np.array([n_total])
            )
            val = float(
                sum(math.lgamma(a_pa) - math.lgamma(a_pa + npa) for npa in pa_groups)
                + sum(math.lgamma(a_cell + nx) - math.lgamma(a_cell) for nx in n_xp)
            )
        else:
            raise ValueError(f"unknown score {self.score!r}")
        self.cache[key] = val
        return val


def hill_climb(
    engine: ContingencyEngine,
    attrs: Sequence[str],
    *,
    score: str = "bic",
    max_parents: int = 4,
    max_iter: int = 200,
) -> dict[str, set[str]]:
    """Greedy search over DAGs with add/delete/reverse edge operators and
    a decomposable score; the bnlearn `hc` baseline. Returns parent sets."""
    attrs = list(attrs)
    sc = _ScoreCache(engine=engine, score=score)
    parents: dict[str, set[str]] = {a: set() for a in attrs}

    def _creates_cycle(u, v) -> bool:
        # Would adding u -> v close a cycle, i.e. is v an ancestor of u?
        stack, seen = [u], set()
        while stack:
            n = stack.pop()
            if n == v:
                return True
            for p in parents[n]:
                if p not in seen:
                    seen.add(p)
                    stack.append(p)
        return False

    for _ in range(max_iter):
        best_delta, best_op = 1e-9, None
        for u in attrs:
            for v in attrs:
                if u == v:
                    continue
                if u in parents[v]:
                    # delete u -> v
                    cur = sc.local(v, frozenset(parents[v]))
                    new = sc.local(v, frozenset(parents[v] - {u}))
                    d = new - cur
                    if d > best_delta:
                        best_delta, best_op = d, ("del", u, v)
                    # reverse u -> v  (becomes v -> u); cycle check runs
                    # with the original edge temporarily removed.
                    if len(parents[u]) < max_parents:
                        parents[v].discard(u)
                        cyc = _creates_cycle(v, u)
                        parents[v].add(u)
                        if not cyc:
                            d_rev = (
                                (new - cur)
                                + sc.local(u, frozenset(parents[u] | {v}))
                                - sc.local(u, frozenset(parents[u]))
                            )
                            if d_rev > best_delta:
                                best_delta, best_op = d_rev, ("rev", u, v)
                elif v not in parents[u]:
                    # add u -> v
                    if len(parents[v]) >= max_parents or _creates_cycle(u, v):
                        continue
                    d = sc.local(v, frozenset(parents[v] | {u})) - sc.local(
                        v, frozenset(parents[v])
                    )
                    if d > best_delta:
                        best_delta, best_op = d, ("add", u, v)
        if best_op is None:
            break
        op, u, v = best_op
        if op == "add":
            parents[v].add(u)
        elif op == "del":
            parents[v].remove(u)
        else:
            parents[v].remove(u)
            parents[u].add(v)
    return parents


# ---------------------------------------------------------------------------
# Metric
# ---------------------------------------------------------------------------


def parent_f1(
    true_dag: DAG,
    predicted: Mapping[str, Sequence[str]],
    *,
    nodes: Sequence[str] | None = None,
) -> float:
    """Micro-F1 of predicted parent edges over ``nodes`` (default: all).
    Restrict ``nodes`` to >= 2-parent nodes for the paper's Fig. 5(c)."""
    nodes = list(nodes if nodes is not None else true_dag.nodes)
    tp = fp = fn = 0
    for n in nodes:
        truth = set(true_dag.parents[n])
        pred = set(predicted.get(n, ()))
        tp += len(truth & pred)
        fp += len(pred - truth)
        fn += len(truth - pred)
    if tp == 0:
        return 0.0
    prec = tp / (tp + fp)
    rec = tp / (tp + fn)
    return 2 * prec * rec / (prec + rec)
