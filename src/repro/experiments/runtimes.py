"""Table 1: runtime (seconds) of bias Detection, Explanation and
Resolution on each evaluation dataset, with full covariate discovery
(CD + HyMIT) exactly as in Sec. 7.3."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.experiments import reports

__all__ = ["runtime_table"]


def runtime_table(
    spark: SparkSession,
    *,
    flight_n: int = 40_000,
    adult_n: int = 30_000,
    staples_n: int = 100_000,
    cancer_n: int = 2_000,
    m: int = 100,
    seed: int = 0,
) -> pd.DataFrame:
    """One row per dataset: columns/rows plus Det./Exp./Res. seconds.

    Mirrors the paper's Table 1 (their row counts differ — see
    EXPERIMENTS.md for the side-by-side)."""
    runs = [
        reports.adult_report(spark, n=adult_n, seed=seed, m=m),
        reports.staples_report(spark, n=staples_n, seed=seed, m=m),
        reports.berkeley_report(spark, m=m, seed=seed),
        reports.cancer_report(spark, n=cancer_n, seed=seed, m=m),
        reports.flight_report(spark, n=flight_n, seed=seed, m=m),
    ]
    rows = []
    for dr in runs:
        t = dr.report.timings
        rows.append(
            {
                "dataset": dr.name,
                "columns": dr.n_cols,
                "rows": dr.n_rows,
                "detect_s": round(t["detect"], 2),
                "explain_s": round(t["explain"], 2),
                "resolve_s": round(t["resolve"], 2),
            }
        )
    return pd.DataFrame(rows)
