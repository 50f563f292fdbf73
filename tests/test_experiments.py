"""Integration tests for the per-table experiment harnesses (small
configurations of the jobs that regenerate Tables 1–10)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.contingency import ContingencyEngine
from repro.core.rewrite import avg_col, rewrite_total
from repro.experiments.false_discovery import (
    adjusted_means_from_counts,
    false_discovery_sweep,
)
from repro.experiments.optimizations import ablation_table, cube_benefit_table
from repro.experiments.quality import quality_experiment
from repro.experiments.reports import berkeley_report, format_report
from repro.experiments.perf import (
    naive_shuffle_test,
    per_test_runtime_table,
    cd_vs_fgs_test_counts,
)


# -- adjusted means from the cube vs the Spark rewriting ---------------------


def test_adjusted_means_match_rewrite_total(flight_df, flight_engine):
    z = ["Airport", "Year"]
    cube = flight_engine.counts(tuple(["Carrier", "Delayed"] + z))
    got = adjusted_means_from_counts(cube, "Carrier", "Delayed", z)
    want = (
        rewrite_total(flight_df, "Carrier", ["Delayed"], z)
        .toPandas()
        .set_index("Carrier")[avg_col("Delayed")]
    )
    assert got["AA"] == pytest.approx(want["AA"], abs=1e-9)
    assert got["UA"] == pytest.approx(want["UA"], abs=1e-9)


def test_adjusted_means_no_matched_blocks():
    counts = pd.DataFrame(
        {"T": [0, 1], "Y": [0, 1], "Z": ["a", "b"], "n": [5, 5]}
    )
    assert adjusted_means_from_counts(counts, "T", "Y", ["Z"]) is None


def test_adjusted_means_single_treatment():
    counts = pd.DataFrame({"T": [0, 0], "Y": [0, 1], "Z": ["a", "a"], "n": [5, 5]})
    assert adjusted_means_from_counts(counts, "T", "Y", ["Z"]) is None


# -- Table 7: false-discovery sweep ------------------------------------------


@pytest.fixture(scope="module")
def sweep(spark):
    # 150k rows: enough per-block power for the conditional MIT test to
    # certify reversals (at 40k every block is too thin and everything
    # degrades to "insignificant after rewriting").
    return false_discovery_sweep(
        spark,
        n=150_000,
        n_queries=30,
        covariates=("Airport", "Month", "DayOfWeek"),
        m=100,
        seed=0,
    )


def test_sweep_detail_columns(sweep):
    assert set(sweep.detail.columns) == {
        "query",
        "n_rows",
        "diff_naive",
        "p_naive",
        "diff_rw",
        "p_rw",
    }
    assert len(sweep.detail) > 10


def test_sweep_summary_metrics(sweep):
    s = sweep.summary.set_index("metric")["value"]
    assert s["queries_evaluated"] == len(sweep.detail)
    fracs = [
        s["frac_became_insignificant"],
        s["frac_trend_reversed"],
        s["frac_consistent"],
    ]
    assert all(0.0 <= f <= 1.0 for f in fracs)
    assert sum(fracs) == pytest.approx(1.0, abs=0.005)  # 3-dp rounding


def test_sweep_finds_significant_queries(sweep):
    s = sweep.summary.set_index("metric")["value"]
    assert s["sql_significant"] > 0


def test_sweep_reversals_exist(sweep):
    # Our generator has genuine Simpson reversals: across 30 random
    # contexts at least one significant query must flip its trend.
    s = sweep.summary.set_index("metric")["value"]
    assert s["frac_trend_reversed"] > 0


# -- Table 8: quality grid ----------------------------------------------------


@pytest.fixture(scope="module")
def quality(spark):
    return quality_experiment(
        spark,
        n_nodes_list=(8,),
        n_rows_list=(4_000,),
        n_dags=1,
        methods=("cd-hymit", "fgs", "hc-bic"),
        m=50,
        seed=1,
    )


def test_quality_grid_shape(quality):
    assert set(quality["method"]) == {"cd-hymit", "fgs", "hc-bic"}
    assert (quality["f1_all"] >= 0).all() and (quality["f1_all"] <= 1).all()


def test_quality_cd_counts_tests(quality):
    cd = quality[quality.method == "cd-hymit"].iloc[0]
    fgs = quality[quality.method == "fgs"].iloc[0]
    assert cd["tests_per_node"] > 0
    assert fgs["tests_per_node"] > 0


def test_quality_cd_recovers_structure(quality):
    cd = quality[quality.method == "cd-hymit"].iloc[0]
    assert cd["f1_all"] > 0.3  # sanity floor; the job reports exact values


# -- Table 9: test counts and runtimes ---------------------------------------


def test_tests_per_node_cd_cheaper_than_full_fgs(spark):
    t = cd_vs_fgs_test_counts(spark, n_nodes_list=(8,), n_rows=3_000, n_dags=1, seed=2)
    row = t.iloc[0]
    # One CD invocation (parents of one node) needs fewer tests than the
    # full-structure FGS run required before FGS can answer the same
    # question — the paper's Fig. 6(a) claim.
    assert row["cd_one_node"] < row["fgs_full_dag"]


def test_runtime_table_shape_and_ordering(spark):
    t = per_test_runtime_table(spark, n_rows=8_000, n_repeats=2, m=50, shuffle_m=2)
    by = {r["method"]: r["ms_per_test"] for _, r in t.iterrows()}
    assert by["chi2"] < by["mit"]  # closed form beats permutation
    assert by["mit-sampling"] <= by["mit"] * 1.1  # sampling no slower
    shuffle_key = next(k for k in by if k.startswith("shuffle"))
    assert by[shuffle_key] > by["mit"]  # the paper's headline speedup


def test_naive_shuffle_test_calibration():
    rng = np.random.default_rng(0)
    n = 2_000
    pdf = pd.DataFrame(
        {
            "X": rng.integers(0, 2, n),
            "Y": rng.integers(0, 2, n),
            "Z": rng.integers(0, 3, n),
        }
    )
    p = naive_shuffle_test(pdf, "X", "Y", ["Z"], m=30, rng=rng)
    assert p > 0.05  # independent data: not rejected


# -- Table 10: optimization ablations ----------------------------------------


def test_ablation_table(spark):
    t = ablation_table(spark, n_nodes=6, n_rows=4_000, m=30, seed=3)
    assert len(t) == 4
    on = t[(t.materialized) & (t.entropy_cache)].iloc[0]
    off = t[(~t.materialized)].iloc[0]
    assert on["cache_hits"] > 0
    assert off["spark_jobs"] > on["spark_jobs"]


def test_cube_benefit_table(spark):
    t = cube_benefit_table(spark, n_nodes=6, n_rows_list=(3_000,), m=30, seed=3)
    cube = t[t.cube].iloc[0]
    raw = t[~t.cube].iloc[0]
    assert cube["spark_jobs"] < raw["spark_jobs"]
    assert cube["seconds"] < raw["seconds"]


# -- Tables 2-6 formatting ----------------------------------------------------


def test_berkeley_report_and_formatting(spark):
    dr = berkeley_report(spark, m=60, seed=0)
    text = format_report(dr)
    assert "BerkeleyData" in text
    assert "Department" in text
    assert "p-values" in text
    ans = dr.report.answers().set_index("Gender")
    assert ans.loc["Male", "sql_answer"] > ans.loc["Female", "sql_answer"]
