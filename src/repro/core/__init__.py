"""HypDB core: detection, explanation, and removal of bias in OLAP
queries (Salimi, Gehrke, Suciu — SIGMOD 2018)."""
from repro.core.bias import BiasResult, detect_bias
from repro.core.cd import CDResult, discover_covariates_and_mediators, discover_parents
from repro.core.contingency import ContingencyEngine, EngineStats
from repro.core.explain import fine_grained, pair_contributions, responsibilities
from repro.core.hypdb import HypDB, Report
from repro.core.independence import IndependenceTester, TestResult
from repro.core.markov import grow_shrink, iamb, markov_boundaries
from repro.core.rewrite import (
    avg_col,
    group_by_avg,
    group_by_avg_sql,
    rewrite_direct,
    rewrite_direct_sql,
    rewrite_total,
    rewrite_total_sql,
)

__all__ = [
    "BiasResult",
    "CDResult",
    "ContingencyEngine",
    "EngineStats",
    "HypDB",
    "IndependenceTester",
    "Report",
    "TestResult",
    "avg_col",
    "detect_bias",
    "discover_covariates_and_mediators",
    "discover_parents",
    "fine_grained",
    "grow_shrink",
    "group_by_avg",
    "group_by_avg_sql",
    "iamb",
    "markov_boundaries",
    "pair_contributions",
    "responsibilities",
    "rewrite_direct",
    "rewrite_direct_sql",
    "rewrite_total",
    "rewrite_total_sql",
]
