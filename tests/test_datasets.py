"""Tests for the evaluation dataset generators: schemas, determinism,
and the causal phenomenology each table of the paper depends on."""
import numpy as np
import pandas as pd
import pytest

from repro.datasets import adult, berkeley, cancer, flight, staples


# -- FlightData ---------------------------------------------------------------


def test_flight_schema(flight_pdf):
    assert list(flight_pdf.columns) == [
        "Year",
        "Quarter",
        "Month",
        "Day",
        "DayOfWeek",
        "Airport",
        "AirportWAC",
        "Carrier",
        "FlightNum",
        "TailNum",
        "DepTimeBlk",
        "Delayed",
    ]
    assert set(flight_pdf["Carrier"].unique()) == {"AA", "UA"}
    assert set(flight_pdf["Airport"].unique()) == set(flight.AIRPORTS)
    assert set(flight_pdf["Delayed"].unique()) <= {0, 1}


def test_flight_deterministic():
    a = flight.pandas_frame(2000, seed=3)
    b = flight.pandas_frame(2000, seed=3)
    pd.testing.assert_frame_equal(a, b)
    c = flight.pandas_frame(2000, seed=4)
    assert not a.equals(c)


def test_flight_simpson_paradox_present(flight_pdf):
    # Overall: AA has lower delay. Per airport: AA has higher delay.
    overall = flight_pdf.groupby("Carrier")["Delayed"].mean()
    assert overall["AA"] < overall["UA"]
    per_airport = flight_pdf.groupby(["Airport", "Carrier"])["Delayed"].mean().unstack()
    for airport in flight.AIRPORTS:
        assert per_airport.loc[airport, "AA"] > per_airport.loc[airport, "UA"], airport


def test_flight_airport_confounds_carrier(flight_pdf):
    share = flight_pdf.groupby("Airport")["Carrier"].apply(
        lambda s: (s == "AA").mean()
    )
    assert share["COS"] > 0.7
    assert share["ROC"] < 0.3


def test_flight_wac_is_bijection(flight_pdf):
    m = flight_pdf.groupby("Airport")["AirportWAC"].nunique()
    assert (m == 1).all()
    m2 = flight_pdf.groupby("AirportWAC")["Airport"].nunique()
    assert (m2 == 1).all()


def test_flight_quarter_fd_of_month(flight_pdf):
    assert (flight_pdf["Quarter"] == (flight_pdf["Month"] - 1) // 3 + 1).all()


def test_flight_deptimeblk_depends_on_carrier(flight_pdf):
    morning = flight_pdf.groupby("Carrier")["DepTimeBlk"].apply(
        lambda s: (s == "morning").mean()
    )
    assert morning["UA"] > morning["AA"] + 0.1


def test_flight_no_direct_carrier_effect():
    # Within (Airport, Year, Month, DepTimeBlk) cells the delay rates of
    # the two carriers are draws from the same Bernoulli; the *signed*
    # weighted gap (where per-cell noise cancels) must be ~0.
    pdf = flight.pandas_frame(100_000, seed=1)
    cells = pdf.groupby(["Airport", "Year", "Month", "DepTimeBlk", "Carrier"])[
        "Delayed"
    ].agg(["mean", "size"]).reset_index()
    wide = cells.pivot_table(
        index=["Airport", "Year", "Month", "DepTimeBlk"],
        columns="Carrier",
        values="mean",
    ).dropna()
    sizes = cells.groupby(["Airport", "Year", "Month", "DepTimeBlk"])["size"].sum()
    gaps = wide["AA"] - wide["UA"]
    w = sizes.loc[gaps.index]
    assert abs(float((gaps * w).sum() / w.sum())) < 0.02


# -- BerkeleyData -------------------------------------------------------------


def test_berkeley_totals_match_published_table(berkeley_pdf):
    assert len(berkeley_pdf) == 4526
    by_gender = berkeley_pdf.groupby("Gender").size()
    assert by_gender["Male"] == 2691
    assert by_gender["Female"] == 1835


def test_berkeley_admission_rates(berkeley_pdf):
    rates = berkeley_pdf.groupby("Gender")["Accepted"].mean()
    # Paper Fig. 4: Female 0.30, Male 0.46.
    assert rates["Female"] == pytest.approx(0.3035, abs=0.001)
    assert rates["Male"] == pytest.approx(0.4452, abs=0.001)


def test_berkeley_department_cell_counts(berkeley_pdf):
    cell = berkeley_pdf[
        (berkeley_pdf.Department == "A") & (berkeley_pdf.Gender == "Male")
    ]
    assert len(cell) == 825
    assert cell["Accepted"].sum() == 512


def test_berkeley_women_apply_to_competitive_departments(berkeley_pdf):
    # The paper's fine-grained explanation: females applied dispropor-
    # tionately to F (low acceptance), males to A/B (high acceptance).
    share_f = berkeley_pdf.groupby("Gender")["Department"].apply(
        lambda s: s.isin(["E", "F"]).mean()
    )
    assert share_f["Female"] > share_f["Male"] + 0.15
    share_ab = berkeley_pdf.groupby("Gender")["Department"].apply(
        lambda s: s.isin(["A", "B"]).mean()
    )
    assert share_ab["Male"] > share_ab["Female"] + 0.3


# -- StaplesData --------------------------------------------------------------


def test_staples_schema(staples_pdf):
    assert list(staples_pdf.columns) == [
        "Region",
        "Urban",
        "Income",
        "Distance",
        "Price",
        "StoreID",
    ]


def test_staples_marginal_price_gap(staples_pdf):
    rates = staples_pdf.groupby("Income")["Price"].mean()
    # Paper Fig. 3: ~0.06 for low, ~0.05 for high income.
    assert rates["low"] > rates["high"]
    assert rates["low"] == pytest.approx(0.06, abs=0.015)
    assert rates["high"] == pytest.approx(0.05, abs=0.015)


def test_staples_no_direct_income_effect(staples_pdf):
    by = staples_pdf.groupby(["Distance", "Income"])["Price"].mean().unstack()
    for d in ("far", "near"):
        assert abs(by.loc[d, "high"] - by.loc[d, "low"]) < 0.01


def test_staples_income_drives_distance(staples_pdf):
    far = staples_pdf.groupby("Income")["Distance"].apply(lambda s: (s == "far").mean())
    assert far["low"] > far["high"] + 0.2


def test_staples_deterministic():
    a = staples.pandas_frame(1000, seed=1)
    b = staples.pandas_frame(1000, seed=1)
    pd.testing.assert_frame_equal(a, b)


# -- CancerData (LUCAS) -------------------------------------------------------


def test_cancer_schema(cancer_pdf):
    assert list(cancer_pdf.columns) == cancer.NODES
    assert cancer_pdf.isin([0, 1]).all().all()


def test_cancer_default_size_matches_paper():
    assert len(cancer.pandas_frame()) == 2000


def test_cancer_dag_matches_fig7():
    d = cancer.dag()
    assert set(d.edges()) == set(cancer.EDGES)
    assert set(d.parents["Lung_Cancer"]) == {"Smoking", "Genetics"}
    assert set(d.parents["Car_Accident"]) == {"Fatigue", "Attention_Disorder"}


def test_cancer_group_means_near_paper(cancer_pdf):
    # Paper Fig. 4 (bottom): E[CA | LC=0] ~ 0.60, E[CA | LC=1] ~ 0.77.
    means = cancer_pdf.groupby("Lung_Cancer")["Car_Accident"].mean()
    assert means[0] == pytest.approx(0.60, abs=0.08)
    assert means[1] == pytest.approx(0.77, abs=0.08)


def test_cancer_no_direct_lc_effect():
    # Large-sample check: within (Fatigue, Attention_Disorder) cells the
    # LC and non-LC groups have identical accident rates.
    pdf = cancer.pandas_frame(100_000, seed=1)
    by = pdf.groupby(["Fatigue", "Attention_Disorder", "Lung_Cancer"])[
        "Car_Accident"
    ].mean().unstack()
    assert (by[1] - by[0]).abs().max() < 0.02


def test_cancer_born_even_day_isolated(cancer_pdf):
    from repro.core.entropy import mi_from_table

    tab = pd.crosstab(cancer_pdf["Born_an_Even_Day"], cancer_pdf["Lung_Cancer"])
    assert mi_from_table(tab.to_numpy(), miller_madow=False) < 0.002


# -- AdultData ----------------------------------------------------------------


def test_adult_schema(adult_pdf):
    assert set(adult_pdf["Gender"].unique()) == {"Male", "Female"}
    assert set(adult_pdf["Income"].unique()) <= {0, 1}


def test_adult_marginal_income_gap(adult_pdf):
    rates = adult_pdf.groupby("Gender")["Income"].mean()
    # Paper Fig. 3 top: 0.11 female vs 0.30 male.
    assert rates["Male"] - rates["Female"] > 0.12
    assert rates["Female"] == pytest.approx(0.11, abs=0.05)
    assert rates["Male"] == pytest.approx(0.30, abs=0.06)


def test_adult_marriage_mediates_income(adult_pdf):
    # Married males dominate; conditioning on MaritalStatus shrinks the
    # gap a lot (the paper's top explanation).
    marg = adult_pdf.groupby("Gender")["Income"].mean()
    gap = marg["Male"] - marg["Female"]
    by = adult_pdf.groupby(["MaritalStatus", "Gender"])["Income"].mean().unstack()
    w = adult_pdf.groupby("MaritalStatus").size()
    cond_gap = float(((by["Male"] - by["Female"]) * w).sum() / w.sum())
    assert cond_gap < gap * 0.55


def test_adult_married_male_skew(adult_pdf):
    married = adult_pdf.groupby("Gender")["MaritalStatus"].apply(
        lambda s: (s == "Married").mean()
    )
    assert married["Male"] > married["Female"] + 0.2


def test_adult_deterministic():
    a = adult.pandas_frame(1000, seed=2)
    b = adult.pandas_frame(1000, seed=2)
    pd.testing.assert_frame_equal(a, b)


# -- Spark loaders ------------------------------------------------------------


@pytest.mark.parametrize(
    "loader,kwargs",
    [
        (flight.load, {"n": 500}),
        (adult.load, {"n": 500}),
        (staples.load, {"n": 500}),
        (cancer.load, {"n": 500}),
    ],
)
def test_loaders_return_spark_frames(spark, loader, kwargs):
    df = loader(spark, **kwargs)
    assert df.count() == 500


def test_berkeley_loader(spark):
    assert berkeley.load(spark).count() == 4526
