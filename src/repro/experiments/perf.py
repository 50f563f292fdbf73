"""Table 9 / paper Fig. 6(a,b): cost of independence testing.

(a) number of independence tests conducted per node by CD vs FGS — CD's
    two-phase local search needs far fewer tests than learning the full
    undirected structure.
(b) mean wall time per test for chi2, MIT, MIT-with-sampling and HyMIT,
    plus the naive shuffle-the-data permutation test the paper's MIT
    replaces (the paper: "one permutation test with shuffling data
    consumes hours ... with MIT takes less than a second").
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.contingency import ContingencyEngine
from repro.core.entropy import mi_from_table
from repro.core.independence import IndependenceTester

__all__ = ["cd_vs_fgs_test_counts", "per_test_runtime_table", "naive_shuffle_test"]


def cd_vs_fgs_test_counts(
    spark: SparkSession,
    *,
    n_nodes_list=(8, 16, 24),
    n_rows: int = 5_000,
    n_dags: int = 2,
    avg_degree: float = 1.0,
    seed: int = 0,
) -> pd.DataFrame:
    """Fig. 6(a): independence tests needed to learn the parents of ONE
    node with CD, vs the tests FGS needs for the full DAG (the paper's
    point: a single CD invocation is far cheaper than the full-structure
    learning FGS must run before it can report any node's parents).

    Columns: nodes, cd_one_node (mean over nodes, fresh cache per
    node), fgs_full_dag.
    """
    from repro.core.cd import discover_parents
    from repro.core.contingency import ContingencyEngine
    from repro.core.independence import IndependenceTester
    from repro.dags.baselines import constraint_based_structure
    from repro.dags.random_dags import random_bayes_net

    rows = []
    for n_nodes in n_nodes_list:
        cd_counts, fgs_counts = [], []
        for dag_i in range(n_dags):
            bn = random_bayes_net(
                n_nodes, avg_degree=avg_degree, seed=seed * 100 + dag_i
            )
            pdf = bn.sample(n_rows, np.random.default_rng(seed + dag_i))
            engine = ContingencyEngine(spark.createDataFrame(pdf))
            for node in bn.dag.nodes:
                tester = IndependenceTester(engine, method="hymit", m=50, seed=seed)
                discover_parents(
                    tester, node, bn.dag.nodes, outcomes=[], max_cond=3,
                    drop_dependencies=False,
                )
                cd_counts.append(tester.n_tests)
            tester = IndependenceTester(engine, method="hymit", m=50, seed=seed)
            constraint_based_structure(tester, bn.dag.nodes, boundary="gs", max_cond=3)
            fgs_counts.append(tester.n_tests)
        rows.append(
            {
                "nodes": n_nodes,
                "cd_one_node": round(float(np.mean(cd_counts)), 1),
                "fgs_full_dag": round(float(np.mean(fgs_counts)), 1),
            }
        )
    return pd.DataFrame(rows)


def naive_shuffle_test(
    pdf: pd.DataFrame, x: str, y: str, z: list[str], m: int, rng
) -> float:
    """The textbook permutation test MIT replaces: physically shuffle the
    treatment column within each conditioning group, m times, over the
    row-level data. Kept as the paper's cost yardstick."""
    def stat(frame: pd.DataFrame) -> float:
        total = 0.0
        n = len(frame)
        groups = frame.groupby(z, observed=True) if z else [(None, frame)]
        for _, g in groups:
            tab = pd.crosstab(g[x], g[y]).to_numpy()
            total += (len(g) / n) * mi_from_table(tab)
        return total

    s0 = stat(pdf)
    work = pdf.copy()
    count = 0
    for _ in range(m):
        if z:
            work[x] = work.groupby(z, observed=True)[x].transform(
                lambda s: s.sample(frac=1.0, random_state=rng.integers(2**31)).to_numpy()
            )
        else:
            work[x] = work[x].sample(frac=1.0, random_state=rng.integers(2**31)).to_numpy()
        if stat(work) >= s0 - 1e-12:
            count += 1
    return count / m


def per_test_runtime_table(
    spark: SparkSession,
    *,
    n_rows: int = 20_000,
    n_repeats: int = 5,
    m: int = 100,
    shuffle_m: int = 5,
    seed: int = 0,
) -> pd.DataFrame:
    """Fig. 6(b): mean milliseconds per conditional-independence test.

    Workload: I(X;Y|Z) on synthetic categorical data with a 3-attribute
    conditioning set (hundreds of groups), the regime where test cost
    matters. The shuffle baseline is timed at ``shuffle_m`` permutations
    and scaled to ``m`` for a fair per-m comparison.
    """
    rng = np.random.default_rng(seed)
    z1 = rng.integers(0, 4, n_rows)
    z2 = rng.integers(0, 4, n_rows)
    z3 = rng.integers(0, 6, n_rows)
    x = (rng.random(n_rows) < 0.3 + 0.05 * z1).astype(int)
    y = (rng.random(n_rows) < 0.5 - 0.04 * z2).astype(int)
    pdf = pd.DataFrame({"X": x, "Y": y, "Z1": z1, "Z2": z2, "Z3": z3})
    engine = ContingencyEngine(spark.createDataFrame(pdf))
    zset = ("Z1", "Z2", "Z3")
    engine.grouped_tables("X", "Y", zset)  # warm the cube outside timing

    rows = []
    for method in ("chi2", "mit", "mit-sampling", "hymit"):
        times = []
        for i in range(n_repeats):
            tester = IndependenceTester(
                engine, method=method, m=m, seed=seed + i, cache_results=False
            )
            t0 = time.perf_counter()
            tester.test("X", "Y", zset)
            times.append(time.perf_counter() - t0)
        rows.append(
            {"method": method, "ms_per_test": round(1000 * float(np.mean(times)), 2)}
        )

    t0 = time.perf_counter()
    naive_shuffle_test(pdf, "X", "Y", list(zset), shuffle_m, rng)
    shuffle_time = (time.perf_counter() - t0) * (m / shuffle_m)
    rows.append(
        {"method": f"shuffle (scaled to m={m})", "ms_per_test": round(1000 * shuffle_time, 2)}
    )
    return pd.DataFrame(rows)
