"""Bias-removing query rewriting (paper Sec. 3.3) as DataFrame algebra.

``group_by_avg``  — the analyst's original query Q (Listing 1).
``rewrite_total`` — Q_rw (Listing 2): the adjustment formula, Eq. (2).
``rewrite_direct``— the mediator formula, Eq. (3) / Eq. (7).

All three take an already-WHERE-filtered DataFrame and return a
DataFrame with one ``avg_<Y>`` column per outcome; they are pure
DataFrame transformations (Catalyst does the planning). Each has a
matching ``*_sql`` generator emitting semantically identical SQL for the
DuckDB oracle, so every test of a rewritten result is checked end-to-end
against an independent engine.

Exact matching (overlap, Assumption 2.1): blocks that do not contain
every treatment level are discarded — ``HAVING count(DISTINCT T) = k``
in Listing 2 — and block probabilities are renormalized over the
*remaining* data, per the paper.

For the direct effect the provided text's Eq. (3) is typographically
incomplete; we implement the mediator formula consistent with Eq. (7):
for each treatment level t,

    val(t) = sum_{z,m} E[Y | t, z, m] * Pr(m | t_ref, z) * Pr(z)

with ``t_ref`` the reference (treated) level supplying the mediator
distribution, and the direct effect read off as val(t1) - val(t0).
"""
from __future__ import annotations

from typing import Sequence

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

__all__ = [
    "avg_col",
    "group_by_avg",
    "group_by_avg_sql",
    "rewrite_total",
    "rewrite_total_sql",
    "rewrite_direct",
    "rewrite_direct_sql",
]


def avg_col(y: str) -> str:
    """Canonical output column name for the adjusted average of ``y``."""
    return f"avg_{y}"


def _cols(xs: Sequence[str]) -> list[str]:
    return list(xs)


# ---------------------------------------------------------------------------
# Original query Q (Listing 1)
# ---------------------------------------------------------------------------


def group_by_avg(
    df: DataFrame,
    treatment: str,
    outcomes: Sequence[str],
    groupby: Sequence[str] = (),
) -> DataFrame:
    """SELECT T, X, avg(Y1) ... FROM df GROUP BY T, X."""
    keys = [treatment, *_cols(groupby)]
    aggs = [F.avg(F.col(y)).alias(avg_col(y)) for y in outcomes]
    return df.groupBy(*keys).agg(*aggs)


def group_by_avg_sql(
    table: str,
    treatment: str,
    outcomes: Sequence[str],
    groupby: Sequence[str] = (),
    where: str | None = None,
) -> str:
    keys = ", ".join([treatment, *_cols(groupby)])
    avgs = ", ".join(f"avg({y}) AS {avg_col(y)}" for y in outcomes)
    w = f" WHERE {where}" if where else ""
    return f"SELECT {keys}, {avgs} FROM {table}{w} GROUP BY {keys}"


# ---------------------------------------------------------------------------
# Total effect: Q_rw, Listing 2 / adjustment formula Eq. (2)
# ---------------------------------------------------------------------------


def rewrite_total(
    df: DataFrame,
    treatment: str,
    outcomes: Sequence[str],
    covariates: Sequence[str],
    groupby: Sequence[str] = (),
) -> DataFrame:
    """Adjusted averages: partition on Z, average per (T, X, Z) block,
    weight by the block's probability among exact-matched blocks (within
    each context X), and sum. With no covariates this degrades to the
    original query (the query is already unbiased)."""
    z = _cols(covariates)
    x = _cols(groupby)
    if not z:
        return group_by_avg(df, treatment, outcomes, groupby)

    n_treat = df.select(treatment).distinct().count()

    blocks = df.groupBy(treatment, *x, *z).agg(
        *[F.avg(F.col(y)).alias(avg_col(y)) for y in outcomes]
    )
    weights = (
        df.groupBy(*x, *z)
        .agg(
            F.count(F.lit(1)).alias("_cnt"),
            F.countDistinct(treatment).alias("_ntreat"),
        )
        .filter(F.col("_ntreat") == n_treat)  # exact matching / overlap
    )
    part = [F.col(c) for c in x] if x else [F.lit(1)]
    weights = weights.withColumn(
        "_w", F.col("_cnt") / F.sum("_cnt").over(Window.partitionBy(*part))
    )
    joined = blocks.join(weights.select(*x, *z, "_w"), on=x + z)
    return joined.groupBy(treatment, *x).agg(
        *[F.sum(F.col(avg_col(y)) * F.col("_w")).alias(avg_col(y)) for y in outcomes]
    )


def rewrite_total_sql(
    table: str,
    treatment: str,
    outcomes: Sequence[str],
    covariates: Sequence[str],
    groupby: Sequence[str] = (),
    where: str | None = None,
    n_treat: int = 2,
) -> str:
    """Listing 2 in SQL (DuckDB dialect), with the post-pruning
    renormalization made explicit via a window function."""
    z = _cols(covariates)
    x = _cols(groupby)
    if not z:
        return group_by_avg_sql(table, treatment, outcomes, groupby, where)
    xz = ", ".join(x + z)
    txz = ", ".join([treatment] + x + z)
    tx = ", ".join([treatment] + x)
    w = f" WHERE {where}" if where else ""
    part = f"PARTITION BY {', '.join(x)}" if x else ""
    avgs = ", ".join(f"avg({y}) AS {avg_col(y)}" for y in outcomes)
    sums = ", ".join(
        f"sum({avg_col(y)} * _w) AS {avg_col(y)}" for y in outcomes
    )
    return f"""
WITH blocks AS (
  SELECT {txz}, {avgs}
  FROM {table}{w}
  GROUP BY {txz}
),
weights AS (
  SELECT {xz}, count(*) AS _cnt
  FROM {table}{w}
  GROUP BY {xz}
  HAVING count(DISTINCT {treatment}) = {n_treat}
),
wnorm AS (
  SELECT {xz}, _cnt * 1.0 / sum(_cnt) OVER ({part}) AS _w FROM weights
)
SELECT {tx}, {sums}
FROM blocks JOIN wnorm USING ({xz})
GROUP BY {tx}
"""


# ---------------------------------------------------------------------------
# Direct effect: mediator formula, Eq. (3)/(7)
# ---------------------------------------------------------------------------


def rewrite_direct(
    df: DataFrame,
    treatment: str,
    outcomes: Sequence[str],
    covariates: Sequence[str],
    mediators: Sequence[str],
    t_ref,
    groupby: Sequence[str] = (),
) -> DataFrame:
    """val(t) = sum_{z,m} E[Y|t,z,m] * Pr(m|t_ref,z) * Pr(z), over
    exact-matched (z, m) blocks, per context X. ``t_ref`` is the
    treatment level whose mediator distribution is held fixed."""
    z = _cols(covariates)
    m = _cols(mediators)
    x = _cols(groupby)
    if not m:
        return rewrite_total(df, treatment, outcomes, covariates, groupby)
    zm = z + m

    n_treat = df.select(treatment).distinct().count()

    cells = (
        df.groupBy(*x, *zm)
        .agg(
            F.count(F.lit(1)).alias("_cnt"),
            F.countDistinct(treatment).alias("_ntreat"),
            F.sum((F.col(treatment) == F.lit(t_ref)).cast("long")).alias("_cref"),
        )
        .filter(F.col("_ntreat") == n_treat)
    )
    part_xz = [F.col(c) for c in (x + z)] if (x + z) else [F.lit(1)]
    part_x = [F.col(c) for c in x] if x else [F.lit(1)]
    cells = (
        cells.withColumn("_cref_z", F.sum("_cref").over(Window.partitionBy(*part_xz)))
        .withColumn("_call_z", F.sum("_cnt").over(Window.partitionBy(*part_xz)))
        .withColumn("_n_all", F.sum("_cnt").over(Window.partitionBy(*part_x)))
        .withColumn(
            "_w",
            (F.col("_cref") / F.col("_cref_z"))  # Pr(m | t_ref, z)
            * (F.col("_call_z") / F.col("_n_all")),  # Pr(z)
        )
    )
    blocks = df.groupBy(treatment, *x, *zm).agg(
        *[F.avg(F.col(y)).alias(avg_col(y)) for y in outcomes]
    )
    joined = blocks.join(cells.select(*x, *zm, "_w"), on=x + zm)
    return joined.groupBy(treatment, *x).agg(
        *[F.sum(F.col(avg_col(y)) * F.col("_w")).alias(avg_col(y)) for y in outcomes]
    )


def rewrite_direct_sql(
    table: str,
    treatment: str,
    outcomes: Sequence[str],
    covariates: Sequence[str],
    mediators: Sequence[str],
    t_ref,
    groupby: Sequence[str] = (),
    where: str | None = None,
    n_treat: int = 2,
) -> str:
    """The mediator formula in SQL (DuckDB dialect), mirroring
    :func:`rewrite_direct` cell for cell."""
    z = _cols(covariates)
    m = _cols(mediators)
    x = _cols(groupby)
    if not m:
        return rewrite_total_sql(
            table, treatment, outcomes, covariates, groupby, where, n_treat
        )
    zm = x + z + m
    zm_s = ", ".join(zm)
    tzm_s = ", ".join([treatment] + zm)
    tx = ", ".join([treatment] + x)
    w = f" WHERE {where}" if where else ""
    part_xz = f"PARTITION BY {', '.join(x + z)}" if (x + z) else ""
    part_x = f"PARTITION BY {', '.join(x)}" if x else ""
    tref = f"'{t_ref}'" if isinstance(t_ref, str) else str(t_ref)
    avgs = ", ".join(f"avg({y}) AS {avg_col(y)}" for y in outcomes)
    sums = ", ".join(f"sum({avg_col(y)} * _w) AS {avg_col(y)}" for y in outcomes)
    return f"""
WITH cells AS (
  SELECT {zm_s}, count(*) AS _cnt,
         sum(CASE WHEN {treatment} = {tref} THEN 1 ELSE 0 END) AS _cref
  FROM {table}{w}
  GROUP BY {zm_s}
  HAVING count(DISTINCT {treatment}) = {n_treat}
),
wcells AS (
  SELECT {zm_s},
         (_cref * 1.0 / sum(_cref) OVER ({part_xz}))
         * (sum(_cnt) OVER ({part_xz}) * 1.0 / sum(_cnt) OVER ({part_x})) AS _w
  FROM cells
),
blocks AS (
  SELECT {tzm_s}, {avgs}
  FROM {table}{w}
  GROUP BY {tzm_s}
)
SELECT {tx}, {sums}
FROM blocks JOIN wcells USING ({zm_s})
GROUP BY {tx}
"""
