"""RandomData: random causal DAGs with categorical CPTs and forward
sampling (paper Sec. 7.1's `catnet`-based generator, rebuilt).

The paper draws Erdős–Rényi DAGs with 8/16/32 nodes, attaches
conditional probability tables, and samples categorical datasets of
10K–50M rows with 2–20 categories per attribute. We reproduce the same
recipe: an ER DAG (edge present with probability p over a fixed
topological order), Dirichlet-distributed CPT rows (concentration < 1
gives the strong dependencies constraint-based discovery needs), and a
vectorized ancestral sampler.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.dags.dag import DAG

__all__ = ["BayesNet", "random_dag", "random_bayes_net"]


def random_dag(
    n_nodes: int,
    *,
    avg_degree: float = 1.5,
    rng: np.random.Generator,
) -> DAG:
    """Erdős–Rényi DAG: nodes X0..X{n-1} in random topological order;
    each forward pair is an edge with probability chosen so the expected
    number of edges is ``avg_degree * n_nodes``."""
    nodes = [f"X{i}" for i in range(n_nodes)]
    order = rng.permutation(n_nodes)
    max_edges = n_nodes * (n_nodes - 1) / 2
    p = min(1.0, (avg_degree * n_nodes) / max_edges) if max_edges else 0.0
    edges = []
    for i in range(n_nodes):
        for j in range(i + 1, n_nodes):
            if rng.random() < p:
                edges.append((nodes[order[i]], nodes[order[j]]))
    return DAG.from_edges(nodes, edges)


@dataclass(frozen=True)
class BayesNet:
    """A DAG plus CPTs; samples categorical data in topological order.

    ``cpts[node]`` is an array of shape ``(prod(parent cards), card)``:
    one categorical distribution per parent configuration, parents
    enumerated in sorted name order with row-major mixed-radix indexing.
    """

    dag: DAG
    cards: dict[str, int]
    cpts: dict[str, np.ndarray]

    def sorted_parents(self, node: str) -> list[str]:
        return sorted(self.dag.parents[node])

    def sample(self, n: int, rng: np.random.Generator) -> pd.DataFrame:
        cols: dict[str, np.ndarray] = {}
        for node in self.dag.topological_order():
            pa = self.sorted_parents(node)
            cpt = self.cpts[node]
            if not pa:
                probs = cpt[0]
                cols[node] = rng.choice(len(probs), size=n, p=probs)
                continue
            # Mixed-radix index of each row's parent configuration.
            idx = np.zeros(n, dtype=np.int64)
            for p in pa:
                idx = idx * self.cards[p] + cols[p]
            u = rng.random(n)
            cum = np.cumsum(cpt[idx], axis=1)
            cols[node] = (u[:, None] < cum).argmax(axis=1)
        return pd.DataFrame({k: v.astype(np.int32) for k, v in cols.items()})


def random_bayes_net(
    n_nodes: int,
    *,
    avg_degree: float = 1.5,
    n_categories: int = 2,
    concentration: float = 0.35,
    seed: int = 0,
) -> BayesNet:
    """Random DAG + random Dirichlet CPTs. Low ``concentration`` makes
    CPT rows peaked, i.e. parent-child dependencies strong enough to be
    detectable at the paper's sample sizes."""
    rng = np.random.default_rng(seed)
    dag = random_dag(n_nodes, avg_degree=avg_degree, rng=rng)
    cards = {n: n_categories for n in dag.nodes}
    cpts: dict[str, np.ndarray] = {}
    for node in dag.nodes:
        pa = sorted(dag.parents[node])
        n_conf = int(np.prod([cards[p] for p in pa])) if pa else 1
        cpt = rng.dirichlet([concentration] * cards[node], size=n_conf)
        # Avoid numerically-degenerate rows (a category with ~0 mass in
        # every configuration would shrink the effective domain).
        cpt = np.clip(cpt, 0.02, None)
        cpt /= cpt.sum(axis=1, keepdims=True)
        cpts[node] = cpt
    return BayesNet(dag=dag, cards=cards, cpts=cpts)
