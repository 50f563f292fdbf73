"""Tests for query rewriting (Listing 2 / mediator formula), all checked
against DuckDB via the result-equality oracle: the Spark DataFrame
implementation and the independently-written SQL must agree row for row."""
import numpy as np
import pandas as pd
import pytest

from repro.core.rewrite import (
    avg_col,
    group_by_avg,
    group_by_avg_sql,
    rewrite_direct,
    rewrite_direct_sql,
    rewrite_total,
    rewrite_total_sql,
)
from repro.oracle import assert_equivalent


# -- original query Q vs oracle ---------------------------------------------


def test_group_by_avg_oracle_flight(flight_df, flight_pdf):
    got = group_by_avg(flight_df, "Carrier", ["Delayed"])
    assert_equivalent(
        got,
        group_by_avg_sql("flightdata", "Carrier", ["Delayed"]),
        flightdata=flight_pdf,
    )


def test_group_by_avg_oracle_with_groupby(flight_df, flight_pdf):
    got = group_by_avg(flight_df, "Carrier", ["Delayed"], groupby=["Airport"])
    assert_equivalent(
        got,
        group_by_avg_sql("flightdata", "Carrier", ["Delayed"], groupby=["Airport"]),
        flightdata=flight_pdf,
    )


def test_group_by_avg_oracle_berkeley(berkeley_df, berkeley_pdf):
    got = group_by_avg(berkeley_df, "Gender", ["Accepted"])
    assert_equivalent(
        got,
        group_by_avg_sql("berkeley", "Gender", ["Accepted"]),
        berkeley=berkeley_pdf,
    )


def test_group_by_avg_oracle_lineitem(spark):
    from repro import synth_data

    li = synth_data.lineitem(spark, sf=0.001, seed=0)
    pdf = li.toPandas()
    got = group_by_avg(li, "l_returnflag", ["l_discount", "l_tax"])
    assert_equivalent(
        got,
        group_by_avg_sql("lineitem", "l_returnflag", ["l_discount", "l_tax"]),
        lineitem=pdf,
    )


# -- total-effect rewriting (Listing 2) vs oracle ----------------------------


def test_rewrite_total_oracle_flight(flight_df, flight_pdf):
    got = rewrite_total(flight_df, "Carrier", ["Delayed"], ["Airport", "Year"])
    assert_equivalent(
        got,
        rewrite_total_sql("flightdata", "Carrier", ["Delayed"], ["Airport", "Year"]),
        flightdata=flight_pdf,
    )


def test_rewrite_total_oracle_berkeley(berkeley_df, berkeley_pdf):
    got = rewrite_total(berkeley_df, "Gender", ["Accepted"], ["Department"])
    assert_equivalent(
        got,
        rewrite_total_sql("berkeley", "Gender", ["Accepted"], ["Department"]),
        berkeley=berkeley_pdf,
    )


def test_rewrite_total_oracle_with_groupby(flight_df, flight_pdf):
    got = rewrite_total(
        flight_df, "Carrier", ["Delayed"], ["Year"], groupby=["Airport"]
    )
    assert_equivalent(
        got,
        rewrite_total_sql(
            "flightdata", "Carrier", ["Delayed"], ["Year"], groupby=["Airport"]
        ),
        flightdata=flight_pdf,
    )


def test_rewrite_total_oracle_multi_outcome(staples_df, staples_pdf):
    got = rewrite_total(staples_df, "Income", ["Price", "Urban"], ["Region"])
    assert_equivalent(
        got,
        rewrite_total_sql("staples", "Income", ["Price", "Urban"], ["Region"]),
        staples=staples_pdf,
    )


def test_rewrite_total_no_covariates_degrades_to_naive(flight_df):
    a = (
        rewrite_total(flight_df, "Carrier", ["Delayed"], [])
        .toPandas()
        .sort_values("Carrier")
        .reset_index(drop=True)
    )
    b = (
        group_by_avg(flight_df, "Carrier", ["Delayed"])
        .toPandas()
        .sort_values("Carrier")
        .reset_index(drop=True)
    )
    pd.testing.assert_frame_equal(a, b)


def test_rewrite_total_on_balanced_data_matches_naive(spark):
    # Randomized treatment: adjustment must (nearly) coincide with the
    # naive averages since block weights mirror the overall distribution.
    rng = np.random.default_rng(0)
    n = 20_000
    z = rng.integers(0, 3, n)
    t = rng.integers(0, 2, n)
    y = (rng.random(n) < 0.2 + 0.2 * z / 2 + 0.3 * t).astype(int)
    df = spark.createDataFrame(pd.DataFrame({"T": t, "Z": z, "Y": y}))
    naive = group_by_avg(df, "T", ["Y"]).toPandas().set_index("T")[avg_col("Y")]
    adj = rewrite_total(df, "T", ["Y"], ["Z"]).toPandas().set_index("T")[avg_col("Y")]
    for tval in (0, 1):
        assert adj[tval] == pytest.approx(naive[tval], abs=0.01)


def test_rewrite_total_simpson_reversal(flight_df):
    # The heart of Ex. 1.1: the naive query favors AA, the adjusted one
    # must reverse the trend in favor of UA.
    naive = (
        group_by_avg(flight_df, "Carrier", ["Delayed"])
        .toPandas()
        .set_index("Carrier")[avg_col("Delayed")]
    )
    adj = (
        rewrite_total(flight_df, "Carrier", ["Delayed"], ["Airport", "Year"])
        .toPandas()
        .set_index("Carrier")[avg_col("Delayed")]
    )
    assert naive["AA"] < naive["UA"]  # biased answer: AA looks better
    assert adj["AA"] > adj["UA"]  # causal answer: UA is better


def test_rewrite_total_berkeley_flattens_gap(berkeley_df):
    naive = (
        group_by_avg(berkeley_df, "Gender", ["Accepted"])
        .toPandas()
        .set_index("Gender")[avg_col("Accepted")]
    )
    adj = (
        rewrite_total(berkeley_df, "Gender", ["Accepted"], ["Department"])
        .toPandas()
        .set_index("Gender")[avg_col("Accepted")]
    )
    # Paper Fig. 4: 0.30/0.46 naive; adjusted gap shrinks and reverses.
    assert naive["Male"] - naive["Female"] > 0.1
    assert adj["Female"] >= adj["Male"] - 0.01


def test_exact_matching_prunes_single_treatment_blocks(spark):
    # One Z block contains only T=1 rows: it must be discarded entirely.
    pdf = pd.DataFrame(
        {
            "T": [0, 1, 0, 1, 1, 1],
            "Z": ["a", "a", "b", "b", "c", "c"],
            "Y": [0, 1, 1, 0, 1, 1],
        }
    )
    df = spark.createDataFrame(pdf)
    adj = rewrite_total(df, "T", ["Y"], ["Z"]).toPandas().set_index("T")
    # Blocks a and b each weigh 2/4 after pruning block c.
    assert adj.loc[0, avg_col("Y")] == pytest.approx(0.5)
    assert adj.loc[1, avg_col("Y")] == pytest.approx(0.5)
    assert_equivalent(
        rewrite_total(df, "T", ["Y"], ["Z"]),
        rewrite_total_sql("d", "T", ["Y"], ["Z"]),
        d=pdf,
    )


def test_rewrite_total_where_clause_in_sql(flight_df, flight_pdf):
    sub = flight_df.filter(flight_df.Airport.isin(["COS", "ROC"]))
    got = rewrite_total(sub, "Carrier", ["Delayed"], ["Airport", "Year"])
    assert_equivalent(
        got,
        rewrite_total_sql(
            "flightdata",
            "Carrier",
            ["Delayed"],
            ["Airport", "Year"],
            where="Airport IN ('COS', 'ROC')",
        ),
        flightdata=flight_pdf,
    )


# -- direct-effect rewriting (mediator formula) vs oracle --------------------


def test_rewrite_direct_oracle_flight(flight_df, flight_pdf):
    got = rewrite_direct(
        flight_df, "Carrier", ["Delayed"], ["Airport", "Year"], ["DepTimeBlk"], "UA"
    )
    assert_equivalent(
        got,
        rewrite_direct_sql(
            "flightdata",
            "Carrier",
            ["Delayed"],
            ["Airport", "Year"],
            ["DepTimeBlk"],
            "UA",
        ),
        flightdata=flight_pdf,
    )


def test_rewrite_direct_oracle_staples(staples_df, staples_pdf):
    got = rewrite_direct(
        staples_df, "Income", ["Price"], ["Region", "Urban"], ["Distance"], "low"
    )
    assert_equivalent(
        got,
        rewrite_direct_sql(
            "staples", "Income", ["Price"], ["Region", "Urban"], ["Distance"], "low"
        ),
        staples=staples_pdf,
    )


def test_rewrite_direct_no_mediators_degrades_to_total(flight_df):
    a = (
        rewrite_direct(flight_df, "Carrier", ["Delayed"], ["Airport"], [], "UA")
        .toPandas()
        .sort_values("Carrier")
        .reset_index(drop=True)
    )
    b = (
        rewrite_total(flight_df, "Carrier", ["Delayed"], ["Airport"])
        .toPandas()
        .sort_values("Carrier")
        .reset_index(drop=True)
    )
    pd.testing.assert_frame_equal(a, b)


def test_rewrite_direct_zero_when_no_direct_edge(staples_df):
    # StaplesData has no Income -> Price edge: conditioning on the
    # mediator Distance must erase the difference.
    direct = (
        rewrite_direct(
            staples_df, "Income", ["Price"], ["Region", "Urban"], ["Distance"], "low"
        )
        .toPandas()
        .set_index("Income")[avg_col("Price")]
    )
    assert abs(direct["high"] - direct["low"]) < 0.01


def test_rewrite_direct_flight_near_zero(flight_df):
    # FlightData generator has no direct Carrier -> Delayed edge either.
    direct = (
        rewrite_direct(
            flight_df, "Carrier", ["Delayed"], ["Airport", "Year"], ["DepTimeBlk"], "UA"
        )
        .toPandas()
        .set_index("Carrier")[avg_col("Delayed")]
    )
    assert abs(direct["AA"] - direct["UA"]) < 0.03


def test_rewrite_direct_detects_real_direct_effect(spark):
    # T -> Y directly AND T -> M -> Y: the direct rewriting must keep
    # the direct component (~0.2) and strip the mediated one.
    rng = np.random.default_rng(1)
    n = 30_000
    t = rng.integers(0, 2, n)
    m = (rng.random(n) < np.where(t == 1, 0.8, 0.2)).astype(int)
    y = (rng.random(n) < 0.1 + 0.2 * t + 0.3 * m).astype(int)
    df = spark.createDataFrame(pd.DataFrame({"T": t, "M": m, "Y": y}))
    direct = (
        rewrite_direct(df, "T", ["Y"], [], ["M"], 1)
        .toPandas()
        .set_index("T")[avg_col("Y")]
    )
    assert direct[1] - direct[0] == pytest.approx(0.2, abs=0.03)
    total = (
        rewrite_total(df, "T", ["Y"], []).toPandas().set_index("T")[avg_col("Y")]
    )
    assert total[1] - total[0] == pytest.approx(0.2 + 0.6 * 0.3, abs=0.03)


def test_rewrite_direct_numeric_tref_sql(spark):
    pdf = pd.DataFrame(
        {
            "T": np.tile([0, 1], 500),
            "M": np.repeat([0, 1], 500),
            "Y": np.random.default_rng(0).integers(0, 2, 1000),
        }
    )
    df = spark.createDataFrame(pdf)
    assert_equivalent(
        rewrite_direct(df, "T", ["Y"], [], ["M"], 1),
        rewrite_direct_sql("d", "T", ["Y"], [], ["M"], 1),
        d=pdf,
    )


def test_avg_col_naming():
    assert avg_col("Delayed") == "avg_Delayed"
