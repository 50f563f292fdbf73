"""End-to-end tests of the HypDB facade on the evaluation datasets.

The full-discovery path (CD for both treatment and outcome) runs on
CancerData — the paper's own ground-truth dataset; the other datasets
run with supplied covariates for speed, exercising detection,
explanation, rewriting and significance in one pass.
"""
import pytest

from repro.core.hypdb import HypDB, where_to_sql
from repro.datasets import berkeley, cancer, staples


@pytest.fixture(scope="module")
def cancer_report(cancer_df):
    hy = HypDB(cancer_df, m=100, seed=0)
    return hy.analyze(cancer.TREATMENT, [cancer.OUTCOME])


def test_cancer_discovers_truth(cancer_report):
    assert set(cancer_report.covariates) == set(cancer.TRUE_COVARIATES)
    assert set(cancer_report.mediators) == set(cancer.TRUE_MEDIATORS)


def test_cancer_bias_detected(cancer_report):
    assert cancer_report.bias_total is not None
    assert cancer_report.bias_total.biased
    assert cancer_report.bias_direct.biased


def test_cancer_answers_shape(cancer_report):
    ans = cancer_report.answers().set_index("Lung_Cancer")
    # Paper Fig. 4 bottom: SQL 0.60/0.77; total ~ SQL; direct gap ~ 0.
    sql_gap = ans.loc[1, "sql_answer"] - ans.loc[0, "sql_answer"]
    tot_gap = ans.loc[1, "total_effect"] - ans.loc[0, "total_effect"]
    dir_gap = ans.loc[1, "direct_effect"] - ans.loc[0, "direct_effect"]
    assert 0.1 < sql_gap < 0.25
    assert 0.08 < tot_gap < 0.25
    assert abs(dir_gap) < 0.05


def test_cancer_significance_pattern(cancer_report):
    # Naive and total differences significant; direct difference not.
    assert cancer_report.sig_naive.p_value < 0.01
    assert cancer_report.sig_total.p_value < 0.01
    assert cancer_report.sig_direct.p_value >= 0.01


def test_cancer_fatigue_top_responsibility(cancer_report):
    assert cancer_report.responsibilities[0].variable == "Fatigue"
    assert cancer_report.responsibilities[0].rho > 0.5


def test_cancer_timings_recorded(cancer_report):
    t = cancer_report.timings
    assert set(t) == {"detect", "explain", "resolve"}
    assert all(v >= 0 for v in t.values())


def test_cancer_fine_grained_present(cancer_report):
    assert "Fatigue" in cancer_report.fine
    assert len(cancer_report.fine["Fatigue"]) > 0


# -- Berkeley with supplied covariates ---------------------------------------


@pytest.fixture(scope="module")
def berkeley_report(berkeley_df):
    hy = HypDB(berkeley_df, m=100, seed=0)
    return hy.analyze(
        berkeley.TREATMENT,
        [berkeley.OUTCOME],
        covariates=berkeley.TRUE_COVARIATES,
        mediators=[],
        t_ref="Male",
    )


def test_berkeley_reversal(berkeley_report):
    ans = berkeley_report.answers().set_index("Gender")
    assert ans.loc["Male", "sql_answer"] - ans.loc["Female", "sql_answer"] > 0.1
    assert ans.loc["Female", "total_effect"] >= ans.loc["Male", "total_effect"] - 0.01


def test_berkeley_biased_and_significant(berkeley_report):
    assert berkeley_report.bias_total.biased
    assert berkeley_report.sig_naive.p_value < 0.01


def test_berkeley_department_responsibility(berkeley_report):
    assert berkeley_report.responsibilities[0].variable == "Department"
    assert berkeley_report.responsibilities[0].rho == pytest.approx(1.0)


# -- Staples with supplied covariates/mediators ------------------------------


@pytest.fixture(scope="module")
def staples_report(staples_df):
    hy = HypDB(staples_df, m=100, seed=0)
    return hy.analyze(
        staples.TREATMENT,
        [staples.OUTCOME],
        covariates=staples.TRUE_COVARIATES,
        mediators=staples.TRUE_MEDIATORS,
        t_ref="low",
    )


def test_staples_direct_effect_vanishes(staples_report):
    ans = staples_report.answers().set_index("Income")
    assert abs(ans.loc["low", "direct_effect"] - ans.loc["high", "direct_effect"]) < 0.01
    assert staples_report.sig_direct.p_value >= 0.01


def test_staples_total_effect_significant(staples_report):
    # The income -> distance -> price path is genuine: the naive gap is
    # small but real (paper: <0.01 yet significant on ~1M rows).
    assert staples_report.sig_naive.p_value < 0.05
    ans = staples_report.answers().set_index("Income")
    assert ans.loc["low", "sql_answer"] > ans.loc["high", "sql_answer"]


def test_staples_distance_top_responsibility(staples_report):
    assert staples_report.responsibilities[0].variable == "Distance"


# -- misc --------------------------------------------------------------------


def test_where_clause_filters(flight_df):
    hy = HypDB(flight_df, m=50, seed=0)
    rep = hy.analyze(
        "Carrier",
        ["Delayed"],
        where={"Airport": ["COS", "ROC"]},
        covariates=["Airport", "Year"],
        mediators=["DepTimeBlk"],
        t_ref="UA",
    )
    # Only the two selected airports appear in the analysis.
    assert rep.bias_total.biased
    ans = rep.answers()
    assert len(ans) == 2


def test_where_to_sql():
    assert where_to_sql(None) is None
    assert where_to_sql({"A": ["x", "y"], "B": 3}) == "A IN ('x', 'y') AND B IN (3)"


def test_report_answers_columns(cancer_report):
    ans = cancer_report.answers()
    assert list(ans.columns) == [
        "Lung_Cancer",
        "sql_answer",
        "total_effect",
        "direct_effect",
    ]
