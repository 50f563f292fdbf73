"""Causal DAGs: representation, d-separation, ground-truth Markov
boundaries.

Used as ground truth for the RandomData quality experiments (paper
Sec. 7.4) and inside the structure-learning baselines. d-separation is
implemented with the standard reachability ("Bayes-ball") procedure over
the appendix's definition: a path is blocked by Z iff it contains a
non-collider in Z, or a collider whose descendants (including itself)
avoid Z.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterable, Mapping, Sequence

__all__ = ["DAG"]


@dataclass(frozen=True)
class DAG:
    """Immutable DAG over named nodes. ``parents`` maps node -> parents."""

    parents: Mapping[str, frozenset[str]]

    @staticmethod
    def from_edges(nodes: Sequence[str], edges: Iterable[tuple[str, str]]) -> "DAG":
        pa: dict[str, set[str]] = {n: set() for n in nodes}
        for u, v in edges:
            if u not in pa or v not in pa:
                raise ValueError(f"edge ({u}, {v}) references unknown node")
            pa[v].add(u)
        d = DAG(parents={n: frozenset(p) for n, p in pa.items()})
        d.topological_order()  # raises on cycles
        return d

    # -- basic structure -----------------------------------------------------

    @property
    def nodes(self) -> list[str]:
        return list(self.parents)

    def children(self, x: str) -> set[str]:
        return {n for n, p in self.parents.items() if x in p}

    def edges(self) -> list[tuple[str, str]]:
        return [(u, v) for v, ps in self.parents.items() for u in sorted(ps)]

    def topological_order(self) -> list[str]:
        order: list[str] = []
        temp: set[str] = set()
        done: set[str] = set()

        def visit(n: str) -> None:
            if n in done:
                return
            if n in temp:
                raise ValueError("graph has a cycle")
            temp.add(n)
            for p in self.parents[n]:
                visit(p)
            temp.discard(n)
            done.add(n)
            order.append(n)

        for n in self.parents:
            visit(n)
        return order

    def descendants(self, x: str) -> set[str]:
        out: set[str] = set()
        stack = [x]
        while stack:
            for c in self.children(stack.pop()):
                if c not in out:
                    out.add(c)
                    stack.append(c)
        return out

    # -- Markov boundary (Prop. 2.5) -----------------------------------------

    def markov_boundary(self, x: str) -> set[str]:
        """Parents + children + parents-of-children (spouses)."""
        ch = self.children(x)
        spouses = set().union(*(self.parents[c] for c in ch)) if ch else set()
        return (set(self.parents[x]) | ch | spouses) - {x}

    # -- d-separation --------------------------------------------------------

    def d_separated(self, x: str, y: str, z: Iterable[str]) -> bool:
        """True iff every path between x and y is blocked by Z (appendix
        10.1). Reachability formulation: walk edges remembering the
        direction of arrival; a collider is passable only if it (or a
        descendant) is in Z; a non-collider is passable only if it is
        not in Z."""
        zset = set(z)
        if x == y:
            return False
        # Ancestors of Z (a collider opens iff itself-or-descendant in Z,
        # i.e. the collider is an ancestor of Z or in Z).
        anc_z: set[str] = set(zset)
        stack = list(zset)
        while stack:
            for p in self.parents[stack.pop()]:
                if p not in anc_z:
                    anc_z.add(p)
                    stack.append(p)
        # State: (node, direction) with direction 'up' (arrived via an
        # edge pointing out of node, i.e. moving to parents allowed) or
        # 'down' (arrived from a parent).
        visited: set[tuple[str, str]] = set()
        frontier: list[tuple[str, str]] = [(x, "up")]
        while frontier:
            node, direction = frontier.pop()
            if (node, direction) in visited:
                continue
            visited.add((node, direction))
            if node == y and node != x:
                return False
            if direction == "up" and node not in zset:
                for p in self.parents[node]:
                    frontier.append((p, "up"))
                for c in self.children(node):
                    frontier.append((c, "down"))
            elif direction == "down":
                if node not in zset:
                    for c in self.children(node):
                        frontier.append((c, "down"))
                if node in anc_z:
                    for p in self.parents[node]:
                        frontier.append((p, "up"))
        return True
