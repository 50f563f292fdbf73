"""Tables 2–6: the per-dataset HypDB reports of the paper's Fig. 1(d),
Fig. 3 and Fig. 4 — SQL answer vs rewritten total/direct answers,
significance, coarse- and fine-grained explanations."""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.hypdb import HypDB, Report
from repro.datasets import adult, berkeley, cancer, flight, staples

__all__ = [
    "DatasetReport",
    "flight_report",
    "adult_report",
    "staples_report",
    "berkeley_report",
    "cancer_report",
    "format_report",
]


@dataclass
class DatasetReport:
    name: str
    n_rows: int
    n_cols: int
    report: Report


def _fmt_p(res) -> str:
    if res is None:
        return "-"
    p = res.p_value
    return "<0.001" if p < 0.001 else f"{p:.3g}"


def format_report(dr: DatasetReport) -> str:
    """Human-readable rendition in the layout of the paper's figures."""
    r = dr.report
    lines = [
        f"== {dr.name} ({dr.n_rows} rows, {dr.n_cols} cols) ==",
        f"treatment={r.treatment} outcome={r.outcomes[0]}",
        f"covariates={r.covariates} mediators={r.mediators}",
    ]
    if r.bias_total:
        lines.append(f"bias (total): {r.bias_total}")
    if r.bias_direct:
        lines.append(f"bias (direct): {r.bias_direct}")
    ans = r.answers()
    diff = ans.drop(columns=[r.treatment]).diff().iloc[-1:]
    lines.append(ans.to_string(index=False))
    lines.append(
        "diff: "
        + "  ".join(f"{c}={abs(v):.3f}" for c, v in diff.iloc[0].items())
    )
    lines.append(
        f"p-values: sql={_fmt_p(r.sig_naive)} total={_fmt_p(r.sig_total)} "
        f"direct={_fmt_p(r.sig_direct)}"
    )
    lines.append("responsibilities: " + ", ".join(f"{x.variable}={x.rho:.2f}" for x in r.responsibilities))
    for var, fine in r.fine.items():
        lines.append(f"top fine-grained explanations for {var}:")
        lines.append(fine.to_string(index=False))
    lines.append(
        "timings (s): "
        + "  ".join(f"{k}={v:.2f}" for k, v in r.timings.items())
    )
    return "\n".join(lines)


def flight_report(
    spark: SparkSession, n: int = 40_000, seed: int = 0, m: int = 100
) -> DatasetReport:
    """Table 2 / paper Fig. 1: the carrier-delay query at the four
    airports, with full covariate discovery (including FD and ID
    screening over the 12-attribute schema)."""
    df = flight.load(spark, n=n, seed=seed)
    hy = HypDB(df, m=m, seed=seed, detect_high_entropy=True)
    rep = hy.analyze(
        flight.TREATMENT,
        [flight.OUTCOME],
        where={"Airport": list(flight.AIRPORTS)},
        t_ref="UA",
    )
    return DatasetReport("FlightData", n, len(df.columns), rep)


def adult_report(
    spark: SparkSession, n: int = 30_000, seed: int = 0, m: int = 100
) -> DatasetReport:
    """Table 3 / paper Fig. 3 (top): effect of gender on income."""
    df = adult.load(spark, n=n, seed=seed)
    hy = HypDB(df, m=m, seed=seed)
    rep = hy.analyze(adult.TREATMENT, [adult.OUTCOME], t_ref="Male")
    return DatasetReport("AdultData", n, len(df.columns), rep)


def staples_report(
    spark: SparkSession, n: int = 100_000, seed: int = 0, m: int = 100
) -> DatasetReport:
    """Table 4 / paper Fig. 3 (bottom): effect of income on price."""
    df = staples.load(spark, n=n, seed=seed)
    hy = HypDB(df, m=m, seed=seed, detect_high_entropy=True)
    rep = hy.analyze(staples.TREATMENT, [staples.OUTCOME], t_ref="low")
    return DatasetReport("StaplesData", n, len(df.columns), rep)


def berkeley_report(spark: SparkSession, m: int = 100, seed: int = 0) -> DatasetReport:
    """Table 5 / paper Fig. 4 (top): gender discrimination in the 1973
    Berkeley admissions. Department is the only other attribute, hence
    the covariate set (the paper reports responsibility 1.0 for it)."""
    df = berkeley.load(spark)
    hy = HypDB(df, m=m, seed=seed)
    rep = hy.analyze(
        berkeley.TREATMENT,
        [berkeley.OUTCOME],
        covariates=berkeley.TRUE_COVARIATES,
        mediators=[],
        t_ref="Male",
    )
    return DatasetReport("BerkeleyData", df.count(), len(df.columns), rep)


def cancer_report(
    spark: SparkSession, n: int = 2_000, seed: int = 0, m: int = 100
) -> DatasetReport:
    """Table 6 / paper Fig. 4 (bottom): effect of lung cancer on car
    accidents on LUCAS, with full discovery against ground truth."""
    df = cancer.load(spark, n=n, seed=seed)
    hy = HypDB(df, m=m, seed=seed)
    rep = hy.analyze(cancer.TREATMENT, [cancer.OUTCOME], t_ref=1)
    return DatasetReport("CancerData", n, len(df.columns), rep)
