"""HypDB facade: detect, explain, and resolve bias for one OLAP query.

``HypDB(df).analyze(treatment, outcomes, ...)`` runs the full paper
pipeline on a group-by-average query (Listing 1):

1. **Detect** — drop logical dependencies, discover covariates
   Z = PA_T and mediators M = PA_Y - {T} with the CD algorithm
   (unless supplied), and test I(T; Z | Gamma) and I(T; Z+M | Gamma)
   (Def. 3.1 / Prop. 3.2).
2. **Explain** — responsibility ranking of Z+M (Eq. 4) and fine-grained
   triples for the top variable (Alg. 3).
3. **Resolve** — compute the original query, the total-effect rewriting
   (Listing 2) and the direct-effect rewriting (Eq. 3), plus
   significance of each answer's difference: I(T;Y) for Q,
   I(Y;T|Z) for the total rewriting, I(Y;T|Z+M) for the direct one
   (Sec. 7.1).

The three phases are timed separately; Table 1 of the paper reports
exactly these times.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from typing import Mapping, Sequence

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.bias import BiasResult, detect_bias
from repro.core.cd import CDResult, discover_parents
from repro.core.contingency import ContingencyEngine
from repro.core.explain import Responsibility, fine_grained, responsibilities
from repro.core.independence import IndependenceTester, TestResult
from repro.core.rewrite import (
    avg_col,
    group_by_avg,
    rewrite_direct,
    rewrite_total,
)

__all__ = ["HypDB", "Report"]


def _where_expr(where: Mapping[str, object]):
    cond = F.lit(True)
    for col, val in where.items():
        vals = list(val) if isinstance(val, (list, tuple, set, frozenset)) else [val]
        cond = cond & F.col(col).isin(vals)
    return cond


def where_to_sql(where: Mapping[str, object] | None) -> str | None:
    """The dict-shaped WHERE clause as SQL text (for the DuckDB oracle)."""
    if not where:
        return None
    parts = []
    for col, val in where.items():
        vals = list(val) if isinstance(val, (list, tuple, set, frozenset)) else [val]
        lits = ", ".join(f"'{v}'" if isinstance(v, str) else str(v) for v in vals)
        parts.append(f"{col} IN ({lits})")
    return " AND ".join(parts)


@dataclass
class Report:
    """Everything HypDB has to say about one query."""

    treatment: str
    outcomes: tuple[str, ...]
    groupby: tuple[str, ...]
    covariates: list[str]
    mediators: list[str]
    cd: CDResult | None
    bias_total: BiasResult | None
    bias_direct: BiasResult | None
    naive: pd.DataFrame
    total: pd.DataFrame
    direct: pd.DataFrame | None
    sig_naive: TestResult
    sig_total: TestResult
    sig_direct: TestResult | None
    responsibilities: list[Responsibility]
    fine: dict[str, pd.DataFrame]
    screened_high_entropy: list[str] = field(default_factory=list)
    timings: dict[str, float] = field(default_factory=dict)

    def answers(self) -> pd.DataFrame:
        """One row per treatment level: naive vs total vs direct answers
        for the first outcome — the layout of the paper's Fig. 3/4."""
        y = avg_col(self.outcomes[0])
        out = self.naive[[self.treatment, y]].rename(columns={y: "sql_answer"})
        out = out.merge(
            self.total[[self.treatment, y]].rename(columns={y: "total_effect"}),
            on=self.treatment,
            how="left",
        )
        if self.direct is not None:
            out = out.merge(
                self.direct[[self.treatment, y]].rename(columns={y: "direct_effect"}),
                on=self.treatment,
                how="left",
            )
        return out.sort_values(self.treatment).reset_index(drop=True)


class HypDB:
    """Bind the HypDB pipeline to one Spark DataFrame.

    ``attrs`` limits the attribute universe (defaults to every column);
    ``method``/``alpha``/``m`` configure the independence tester
    (paper defaults: HyMIT, alpha = 0.01, m = 100 permutations).
    """

    def __init__(
        self,
        df: DataFrame,
        attrs: Sequence[str] | None = None,
        *,
        method: str = "hymit",
        alpha: float = 0.01,
        m: int = 100,
        max_cond: int = 3,
        seed: int = 0,
        detect_high_entropy: bool = False,
        materialize: bool = True,
        cache_entropy: bool = True,
    ) -> None:
        self.df = df
        self.attrs = tuple(attrs if attrs is not None else df.columns)
        self.method = method
        self.alpha = alpha
        self.m = m
        self.max_cond = max_cond
        self.seed = seed
        self.detect_high_entropy = detect_high_entropy
        self.materialize = materialize
        self.cache_entropy = cache_entropy

    def _tester(self, df: DataFrame) -> IndependenceTester:
        engine = ContingencyEngine(
            df,
            self.attrs,
            materialize=self.materialize,
            cache_entropy=self.cache_entropy,
        )
        return IndependenceTester(
            engine, method=self.method, alpha=self.alpha, m=self.m, seed=self.seed
        )

    def analyze(
        self,
        treatment: str,
        outcomes: Sequence[str],
        *,
        groupby: Sequence[str] = (),
        where: Mapping[str, object] | None = None,
        covariates: Sequence[str] | None = None,
        mediators: Sequence[str] | None = None,
        t_ref=None,
        top_k_fine: int = 3,
    ) -> Report:
        outcomes = tuple(outcomes)
        groupby = tuple(groupby)
        dfq = self.df.filter(_where_expr(where)) if where else self.df
        tester = self._tester(dfq)
        engine = tester.engine
        y0 = outcomes[0]

        # -- Phase 1: detection ------------------------------------------------
        t0 = time.perf_counter()
        # ID-like attributes are screened once, up front: they would drag
        # both parent discoveries (treatment AND outcome) through huge
        # sparse contingency tables.
        pool = list(self.attrs)
        he: set[str] = set()
        if self.detect_high_entropy and covariates is None:
            from repro.core.fd import high_entropy_attributes

            he = set(high_entropy_attributes(dfq, pool))
            pool = [a for a in pool if a not in he]
        cd: CDResult | None = None
        if covariates is None:
            cd, med = self._discover(tester, treatment, y0, groupby, outcomes, pool)
            covariates = cd.parents
            if mediators is None:
                mediators = med
        covariates = [c for c in covariates if c != treatment and c not in outcomes]
        mediators = [
            m
            for m in (mediators or [])
            if m != treatment and m not in outcomes and m not in covariates
        ]
        bias_total = (
            detect_bias(tester, treatment, covariates) if covariates else None
        )
        v_direct = list(covariates) + list(mediators)
        bias_direct = (
            detect_bias(tester, treatment, v_direct) if v_direct else None
        )
        t_detect = time.perf_counter() - t0

        # -- Phase 2: explanation ----------------------------------------------
        t0 = time.perf_counter()
        resp = responsibilities(engine, treatment, v_direct) if v_direct else []
        fine: dict[str, pd.DataFrame] = {}
        for r in resp[:2]:
            fine[r.variable] = fine_grained(
                engine, treatment, y0, r.variable, k=top_k_fine
            )
        t_explain = time.perf_counter() - t0

        # -- Phase 3: resolution -----------------------------------------------
        t0 = time.perf_counter()
        naive = group_by_avg(dfq, treatment, outcomes, groupby).toPandas()
        total = rewrite_total(dfq, treatment, outcomes, covariates, groupby).toPandas()
        if t_ref is None:
            t_ref = sorted(naive[treatment].tolist())[-1]
        direct = None
        if mediators:
            direct = rewrite_direct(
                dfq, treatment, outcomes, covariates, mediators, t_ref, groupby
            ).toPandas()
        # Significance of each answer's treatment difference — the paper
        # uses MIT (permutation) for exactly these tests (Sec. 7.1): the
        # difference is zero iff I(T;Y) = 0 for Q, iff I(Y;T|Z) = 0 for
        # the total rewriting, and iff I(Y;T|Z+M) = 0 for the direct one.
        sig_tester = IndependenceTester(
            engine,
            method="mit-sampling",
            alpha=self.alpha,
            m=max(self.m, 100),
            seed=self.seed,
        )
        sig_naive = sig_tester.test(treatment, y0, groupby)
        sig_total = sig_tester.test(treatment, y0, tuple(groupby) + tuple(covariates))
        sig_direct = (
            sig_tester.test(
                treatment, y0, tuple(groupby) + tuple(covariates) + tuple(mediators)
            )
            if mediators
            else None
        )
        t_resolve = time.perf_counter() - t0

        return Report(
            treatment=treatment,
            outcomes=outcomes,
            groupby=groupby,
            covariates=list(covariates),
            mediators=list(mediators),
            cd=cd,
            bias_total=bias_total,
            bias_direct=bias_direct,
            naive=naive,
            total=total,
            direct=direct,
            sig_naive=sig_naive,
            sig_total=sig_total,
            sig_direct=sig_direct,
            responsibilities=resp,
            fine=fine,
            screened_high_entropy=sorted(he),
            timings={
                "detect": t_detect,
                "explain": t_explain,
                "resolve": t_resolve,
            },
        )

    def _discover(self, tester, treatment, outcome, groupby, outcomes, pool):
        """Covariate/mediator discovery over the pre-screened attribute
        ``pool``; grouping attributes are excluded (Sec. 3 assumes all
        query variables other than T and Y are in Z or Z+M)."""
        cov = discover_parents(
            tester,
            treatment,
            [a for a in pool if a not in groupby],
            outcomes=list(outcomes),
            max_cond=self.max_cond,
            detect_high_entropy=False,
        )
        pa_y = discover_parents(
            tester,
            outcome,
            [a for a in pool if a not in groupby],
            outcomes=[],
            max_cond=self.max_cond,
            detect_high_entropy=False,
        )
        med = [
            m
            for m in pa_y.parents
            if m not in (treatment, outcome) and m not in cov.parents
        ]
        return cov, med
