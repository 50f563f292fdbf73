"""Table 8 / paper Fig. 5(b,c,d): parent-recovery quality (F1) of the
CD algorithm vs the bnlearn-style baselines on RandomData.

For each random DAG we learn the parents of every node with:

* CD with chi2, MIT-with-sampling and HyMIT independence tests,
* FGS and IAMB constraint-based structure learning,
* greedy hill climbing with AIC / BIC / BDeu scores,

and score micro-F1 of predicted parent edges over (b) all nodes and
(c) nodes with >= 2 parents (CD's design target — the paper notes the
all-nodes comparison is "not fair" to CD). Fig. 5(d)'s sparse-data
slice falls out of running the same grid at decreasing row counts.
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.cd import discover_parents
from repro.core.contingency import ContingencyEngine
from repro.core.independence import IndependenceTester
from repro.dags.baselines import constraint_based_structure, hill_climb, parent_f1
from repro.dags.random_dags import random_bayes_net

__all__ = ["quality_experiment", "CD_METHODS", "BASELINES"]

CD_METHODS = ("cd-hymit", "cd-chi2", "cd-mit-sampling")
BASELINES = ("fgs", "iamb", "hc-aic", "hc-bic", "hc-bde")


def _run_method(method, engine, nodes, max_cond, m, seed):
    """Returns (predicted parent sets, #independence tests performed)."""
    if method.startswith("cd-"):
        tester = IndependenceTester(
            engine, method=method.removeprefix("cd-"), m=m, seed=seed
        )
        pred = {}
        for node in nodes:
            res = discover_parents(
                tester,
                node,
                nodes,
                outcomes=[],
                max_cond=max_cond,
                drop_dependencies=False,
            )
            # The fallback (Z = MB(T), Sec. 4) is part of CD's contract —
            # for childless targets MB(T) IS the parent set, so it is
            # scored like any other prediction.
            pred[node] = set(res.parents)
        return pred, tester.n_tests
    if method in ("fgs", "iamb"):
        tester = IndependenceTester(engine, method="hymit", m=m, seed=seed)
        boundary = "gs" if method == "fgs" else "iamb"
        pred = constraint_based_structure(
            tester, nodes, boundary=boundary, max_cond=max_cond
        )
        return pred, tester.n_tests
    if method.startswith("hc-"):
        pred = hill_climb(engine, nodes, score=method.removeprefix("hc-"))
        return pred, 0
    raise ValueError(f"unknown method {method!r}")


def quality_experiment(
    spark: SparkSession,
    *,
    n_nodes_list=(8, 12),
    n_rows_list=(2_000, 10_000),
    n_cats: int = 2,
    n_dags: int = 3,
    methods=CD_METHODS + BASELINES,
    max_cond: int = 3,
    m: int = 100,
    avg_degree: float = 1.5,
    seed: int = 0,
) -> pd.DataFrame:
    """Grid over (#nodes, #rows, DAG seed, method); one result row each,
    with F1 over all nodes, F1 over >= 2-parent nodes, independence
    tests per node and wall time."""
    rows = []
    for n_nodes in n_nodes_list:
        for dag_i in range(n_dags):
            bn = random_bayes_net(
                n_nodes,
                avg_degree=avg_degree,
                n_categories=n_cats,
                seed=seed * 1000 + dag_i,
            )
            nodes = bn.dag.nodes
            multi = [n for n in nodes if len(bn.dag.parents[n]) >= 2]
            for n_rows in n_rows_list:
                pdf = bn.sample(n_rows, np.random.default_rng(seed * 77 + dag_i))
                engine = ContingencyEngine(spark.createDataFrame(pdf))
                for method in methods:
                    t0 = time.perf_counter()
                    pred, n_tests = _run_method(
                        method, engine, nodes, max_cond, m, seed
                    )
                    elapsed = time.perf_counter() - t0
                    rows.append(
                        {
                            "nodes": n_nodes,
                            "rows": n_rows,
                            "dag": dag_i,
                            "method": method,
                            "f1_all": round(parent_f1(bn.dag, pred), 3),
                            "f1_multi_parent": round(
                                parent_f1(bn.dag, pred, nodes=multi), 3
                            )
                            if multi
                            else float("nan"),
                            "tests_per_node": round(n_tests / len(nodes), 1),
                            "seconds": round(elapsed, 2),
                        }
                    )
    return pd.DataFrame(rows)
