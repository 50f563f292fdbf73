"""Table 7 / paper Fig. 5(a) and Sec. 7.2: how often does a plain SQL
group-by query produce a false discovery?

The paper generates 1000 random queries of the Listing-1 form over
FlightData (random airports, months, ... comparing the two carriers),
rewrites each w.r.t. the covariates {Airport, Day, Month, DayOfWeek},
and reports how many significant SQL differences become insignificant
(>10%) or reverse their trend (20%) after rewriting.

The sweep exploits the pre-computed-cube optimization (Sec. 6): one
Spark job materializes the contingency table over
(Carrier, Delayed, covariates); every query's naive answer, rewritten
answer and MIT significance test is then served from that cube via
:meth:`ContingencyEngine.restrict` — this is exactly how the paper makes
the analysis interactive at query time.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.contingency import ContingencyEngine
from repro.core.independence import IndependenceTester
from repro.datasets import flight

__all__ = ["SweepResult", "false_discovery_sweep", "adjusted_means_from_counts"]

DEFAULT_COVARIATES = ("Airport", "Day", "Month", "DayOfWeek")


def adjusted_means_from_counts(
    counts: pd.DataFrame,
    treatment: str,
    outcome: str,
    covariates,
) -> dict | None:
    """Adjusted per-treatment means (the Listing-2 aggregation) computed
    from a contingency table with columns [treatment, outcome, *covariates,
    'n'] for a BINARY outcome. Returns None when exact matching leaves no
    block. Equivalent to :func:`repro.core.rewrite.rewrite_total` (tested
    against it); used where thousands of rewritten queries must be
    answered from one cube."""
    z = list(covariates)
    treatments = sorted(counts[treatment].unique())
    if len(treatments) < 2:
        return None
    c = counts.copy()
    c["y1"] = np.where(c[outcome] == 1, c["n"], 0)
    g = (
        c.groupby(z + [treatment], observed=True)[["n", "y1"]]
        .sum()
        .reset_index()
    )
    wide_n = g.pivot_table(index=z, columns=treatment, values="n", observed=True)
    matched = wide_n.dropna()
    matched = matched[(matched > 0).all(axis=1)]
    if matched.empty:
        return None
    block_tot = matched.sum(axis=1)
    w = block_tot / block_tot.sum()
    wide_y = g.pivot_table(index=z, columns=treatment, values="y1", observed=True)
    means = {}
    for t in treatments:
        rate = (wide_y.loc[matched.index, t] / matched[t]).fillna(0.0)
        means[t] = float((rate * w).sum())
    return means


@dataclass
class SweepResult:
    detail: pd.DataFrame  # one row per evaluated query
    summary: pd.DataFrame  # the Table-7 rows

    def __str__(self) -> str:
        return self.summary.to_string(index=False)


def false_discovery_sweep(
    spark: SparkSession,
    *,
    n: int = 200_000,
    n_queries: int = 200,
    covariates=DEFAULT_COVARIATES,
    alpha: float = 0.01,
    m: int = 100,
    seed: int = 0,
    min_rows: int = 200,
) -> SweepResult:
    """Run the random-query sweep and classify each significant SQL
    answer as consistent / insignificant-after-rewriting / reversed.

    ``m`` is clamped so the permutation floor 1/(m+1) stays below
    ``alpha`` — otherwise no query could ever be called significant
    (the paper uses m = 1000 at alpha = 0.01)."""
    m = max(m, int(np.ceil(1.0 / alpha)))
    df = flight.load(spark, n=n, seed=seed)
    attrs = ("Carrier", "Delayed") + tuple(covariates)
    base = ContingencyEngine(df, attrs)  # the cube: one Spark job
    rng = np.random.default_rng(seed)

    rows = []
    for qid in range(n_queries):
        airports = list(
            rng.choice(flight.AIRPORTS, size=rng.integers(2, 5), replace=False)
        )
        months = list(
            rng.choice(np.arange(1, 13), size=rng.integers(2, 13), replace=False)
        )
        cond = {"Airport": airports, "Month": [int(x) for x in months]}
        sub = base.restrict(cond)
        if sub.n < min_rows:
            continue
        tab = sub.counts(("Carrier", "Delayed"))
        piv = tab.pivot_table(
            index="Carrier", columns="Delayed", values="n", fill_value=0,
            observed=True,
        )
        if len(piv) < 2 or piv.sum(axis=1).min() < 20:
            continue
        naive = (piv.get(1, 0) / piv.sum(axis=1)).to_dict()
        diff_naive = naive["UA"] - naive["AA"]

        tester = IndependenceTester(
            sub, method="mit-sampling", alpha=alpha, m=m, seed=seed + qid
        )
        p_naive = tester.test("Carrier", "Delayed").p_value

        adj = adjusted_means_from_counts(
            sub.counts(attrs), "Carrier", "Delayed", covariates
        )
        if adj is None:
            continue
        diff_rw = adj["UA"] - adj["AA"]
        p_rw = tester.test("Carrier", "Delayed", tuple(covariates)).p_value

        rows.append(
            {
                "query": qid,
                "n_rows": sub.n,
                "diff_naive": diff_naive,
                "p_naive": p_naive,
                "diff_rw": diff_rw,
                "p_rw": p_rw,
            }
        )

    detail = pd.DataFrame(rows)
    sig = detail[detail.p_naive < alpha]
    if len(sig):
        insig = (sig.p_rw >= alpha).mean()
        reversed_ = (
            (sig.p_rw < alpha) & (np.sign(sig.diff_rw) != np.sign(sig.diff_naive))
        ).mean()
        consistent = 1.0 - insig - reversed_
    else:
        insig = reversed_ = consistent = float("nan")
    summary = pd.DataFrame(
        [
            {"metric": "queries_evaluated", "value": len(detail)},
            {"metric": "sql_significant", "value": len(sig)},
            {"metric": "frac_became_insignificant", "value": round(float(insig), 3)},
            {"metric": "frac_trend_reversed", "value": round(float(reversed_), 3)},
            {"metric": "frac_consistent", "value": round(float(consistent), 3)},
        ]
    )
    return SweepResult(detail=detail, summary=summary)
