"""Table 10 / paper Fig. 6(c,d): efficacy of the Sec. 6 optimizations.

(c) ablation of entropy caching and contingency-table materialization on
    the CD algorithm's runtime;
(d) benefit of a pre-computed OLAP cube: with the cube (our materialized
    joint contingency table, the finest cuboid with a Count measure) CD
    answers every marginal locally; without it every entropy needs a
    Spark ``count(*) GROUP BY`` job over the base data.
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.cd import discover_parents
from repro.core.contingency import ContingencyEngine
from repro.core.independence import IndependenceTester
from repro.dags.random_dags import random_bayes_net

__all__ = ["ablation_table", "cube_benefit_table"]


def _cd_all_nodes(engine, nodes, m, seed, max_cond=2, limit=None):
    tester = IndependenceTester(engine, method="hymit", m=m, seed=seed)
    for node in nodes[: limit or len(nodes)]:
        discover_parents(
            tester, node, nodes, outcomes=[], max_cond=max_cond,
            drop_dependencies=False,
        )
    return tester


def ablation_table(
    spark: SparkSession,
    *,
    n_nodes: int = 8,
    n_rows: int = 10_000,
    m: int = 50,
    seed: int = 0,
    limit_nodes: int = 3,
) -> pd.DataFrame:
    """Fig. 6(c): CD runtime with/without entropy caching and with/
    without the materialized contingency table (all four combinations),
    plus the engine's operation counters.

    Only ``limit_nodes`` targets are discovered per configuration: the
    fully-unoptimized corner pays one Spark job per entropy request
    (that is the figure's point), so the workload is kept small enough
    that the ratio — not the wait — is the result."""
    bn = random_bayes_net(n_nodes, seed=seed)
    pdf = bn.sample(n_rows, np.random.default_rng(seed))
    df = spark.createDataFrame(pdf).cache()
    df.count()  # materialize the Spark cache so all configs read warm data
    rows = []
    for materialize in (True, False):
        for cache_entropy in (True, False):
            engine = ContingencyEngine(
                df, materialize=materialize, cache_entropy=cache_entropy
            )
            t0 = time.perf_counter()
            _cd_all_nodes(engine, bn.dag.nodes, m, seed, limit=limit_nodes)
            elapsed = time.perf_counter() - t0
            s = engine.stats
            rows.append(
                {
                    "materialized": materialize,
                    "entropy_cache": cache_entropy,
                    "seconds": round(elapsed, 2),
                    "spark_jobs": s.spark_jobs,
                    "cache_hits": s.entropy_cache_hits,
                    "cache_misses": s.entropy_cache_misses,
                }
            )
    df.unpersist()
    return pd.DataFrame(rows)


def cube_benefit_table(
    spark: SparkSession,
    *,
    n_nodes: int = 8,
    n_rows_list=(5_000, 20_000, 80_000),
    m: int = 50,
    seed: int = 0,
) -> pd.DataFrame:
    """Fig. 6(d): CD runtime with the pre-computed cube vs from raw data,
    as the input size grows — the cube advantage widens with data size
    because the cube's size tracks the attribute domains, not the rows."""
    bn = random_bayes_net(n_nodes, seed=seed)
    rows = []
    for n_rows in n_rows_list:
        pdf = bn.sample(n_rows, np.random.default_rng(seed))
        df = spark.createDataFrame(pdf).cache()
        df.count()
        for cube in (True, False):
            # Entropy/counts caching stays ON in both arms: this figure
            # isolates the cube (materialization) benefit only.
            engine = ContingencyEngine(df, materialize=cube)
            t0 = time.perf_counter()
            tester = _cd_all_nodes(engine, bn.dag.nodes, m, seed, limit=4)
            elapsed = time.perf_counter() - t0
            rows.append(
                {
                    "rows": n_rows,
                    "cube": cube,
                    "seconds": round(elapsed, 2),
                    "spark_jobs": engine.stats.spark_jobs,
                    "tests": tester.n_tests,
                }
            )
        df.unpersist()
    return pd.DataFrame(rows)
