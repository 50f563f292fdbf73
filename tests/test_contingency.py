"""Tests for the ContingencyEngine: Spark groupBy contingency tables,
materialization/marginalization, caching, context restriction."""
import numpy as np
import pandas as pd
import pytest

from repro.core.contingency import ContingencyEngine
from repro.core.entropy import entropy_from_counts


def _counts_dict(pdf, cols):
    return pdf.groupby(cols, observed=True).size().to_dict()


def test_materialized_by_default(flight_engine):
    assert flight_engine.materialized
    assert flight_engine.n == len(flight_engine._base["n"]) or flight_engine.n == int(
        flight_engine._base["n"].sum()
    )


def test_n_matches_rows(flight_engine, flight_pdf):
    assert flight_engine.n == len(flight_pdf)


@pytest.mark.parametrize(
    "cols",
    [("Carrier",), ("Airport",), ("Carrier", "Airport"), ("Carrier", "Airport", "Delayed")],
)
def test_counts_match_pandas(flight_engine, flight_pdf, cols):
    got = flight_engine.counts(cols)
    want = _counts_dict(flight_pdf, list(cols))
    got_dict = {
        (tuple(row[c] for c in cols) if len(cols) > 1 else (row[cols[0]],)): row["n"]
        for _, row in got.iterrows()
    }
    want_norm = {
        (k if isinstance(k, tuple) else (k,)): v for k, v in want.items()
    }
    assert got_dict == want_norm


def test_counts_empty_attrs_returns_total(flight_engine, flight_pdf):
    c = flight_engine.counts(())
    assert c["n"].tolist() == [len(flight_pdf)]


def test_counts_unknown_attr_raises(flight_engine):
    with pytest.raises(ValueError):
        flight_engine.counts(("NoSuchColumn",))


def test_marginalization_consistency(flight_engine):
    # Sum of the joint equals every marginal's total.
    joint = flight_engine.counts(("Carrier", "Airport"))
    marg = flight_engine.counts(("Carrier",))
    assert joint["n"].sum() == marg["n"].sum()
    by_carrier = joint.groupby("Carrier")["n"].sum().sort_index()
    want = marg.set_index("Carrier")["n"].sort_index()
    pd.testing.assert_series_equal(by_carrier, want, check_names=False)


def test_entropy_matches_direct_computation(flight_engine, flight_pdf):
    h = flight_engine.entropy(["Airport"])
    counts = flight_pdf["Airport"].value_counts().to_numpy()
    assert h == pytest.approx(entropy_from_counts(counts))


def test_entropy_cache_hits(flight_df):
    eng = ContingencyEngine(flight_df, ["Carrier", "Airport", "Delayed"])
    before = eng.stats.entropy_cache_misses
    eng.entropy(["Carrier", "Airport"])
    eng.entropy(["Airport", "Carrier"])  # frozenset key: same entry
    assert eng.stats.entropy_cache_misses == before + 1
    assert eng.stats.entropy_cache_hits >= 1


def test_entropy_order_invariant(flight_engine):
    assert flight_engine.entropy(["Carrier", "Airport"]) == pytest.approx(
        flight_engine.entropy(["Airport", "Carrier"])
    )


def test_cmi_identity(flight_engine):
    # I(X;Y|Z) = H(XZ) + H(YZ) - H(XYZ) - H(Z).
    e = flight_engine
    want = (
        e.entropy(["Carrier", "Airport"])
        + e.entropy(["Delayed", "Airport"])
        - e.entropy(["Carrier", "Delayed", "Airport"])
        - e.entropy(["Airport"])
    )
    assert e.cmi("Carrier", "Delayed", ["Airport"]) == pytest.approx(want)


def test_cmi_disjointness_enforced(flight_engine):
    with pytest.raises(ValueError):
        flight_engine.cmi("Carrier", "Carrier")
    with pytest.raises(ValueError):
        flight_engine.cmi("Carrier", "Delayed", ["Carrier"])


def test_set_cmi_reduces_to_cmi_for_singleton(flight_engine):
    a = flight_engine.set_cmi("Carrier", ["Airport"])
    b = flight_engine.cmi("Carrier", "Airport")
    assert a == pytest.approx(b)


def test_set_cmi_conditioning_member_of_set(flight_engine):
    # I(T; V | Z) with Z in V equals I(T; V - {Z} | Z).
    a = flight_engine.set_cmi("Carrier", ["Airport", "Year"], ["Airport"])
    b = flight_engine.cmi("Carrier", "Year", ["Airport"])
    assert a == pytest.approx(b)


def test_restrict_matches_pandas_filter(flight_engine, flight_pdf):
    sub = flight_engine.restrict({"Airport": ["COS", "ROC"]})
    want = flight_pdf[flight_pdf["Airport"].isin(["COS", "ROC"])]
    assert sub.n == len(want)
    got = sub.counts(("Carrier",)).set_index("Carrier")["n"].sort_index()
    expect = want["Carrier"].value_counts().sort_index()
    pd.testing.assert_series_equal(got, expect, check_names=False)


def test_restrict_scalar_condition(flight_engine, flight_pdf):
    sub = flight_engine.restrict({"Carrier": "AA"})
    assert sub.n == (flight_pdf["Carrier"] == "AA").sum()


def test_restrict_shares_stats(flight_engine):
    sub = flight_engine.restrict({"Carrier": "AA"})
    before = flight_engine.stats.local_marginalizations
    sub.counts(("Airport", "Delayed"))
    assert flight_engine.stats.local_marginalizations > before


def test_grouped_tables_margins(flight_engine, flight_pdf):
    tables = flight_engine.grouped_tables("Carrier", "Delayed", ["Airport"])
    assert len(tables) == flight_pdf["Airport"].nunique()
    total = sum(int(t.sum()) for _, t in tables)
    assert total == len(flight_pdf)
    for key, t in tables:
        want = flight_pdf[flight_pdf["Airport"] == key[0]]
        assert int(t.sum()) == len(want)


def test_grouped_tables_no_condition(flight_engine, flight_pdf):
    [(key, t)] = flight_engine.grouped_tables("Carrier", "Delayed")
    assert key == ()
    assert t.shape == (2, 2)
    assert int(t.sum()) == len(flight_pdf)


def test_grouped_tables_multi_y(flight_engine, flight_pdf):
    [(key, t)] = flight_engine.grouped_tables("Carrier", ["Airport", "Delayed"])
    assert t.shape[0] == 2  # carriers
    observed_joint = (
        flight_pdf.groupby(["Airport", "Delayed"]).size().shape[0]
    )
    assert t.shape[1] == observed_joint
    assert int(t.sum()) == len(flight_pdf)


def test_non_materialized_fallback_equivalence(spark, cancer_pdf):
    df = spark.createDataFrame(cancer_pdf)
    mat = ContingencyEngine(df)
    raw = ContingencyEngine(df, materialize=False)
    assert not raw.materialized
    a = mat.counts(("Smoking", "Lung_Cancer")).sort_values(
        ["Smoking", "Lung_Cancer"]
    ).reset_index(drop=True)
    b = raw.counts(("Smoking", "Lung_Cancer")).sort_values(
        ["Smoking", "Lung_Cancer"]
    ).reset_index(drop=True)
    pd.testing.assert_frame_equal(a, b, check_dtype=False)
    assert raw.entropy(["Smoking"]) == pytest.approx(mat.entropy(["Smoking"]))


def test_max_cells_forces_fallback(spark, cancer_pdf):
    df = spark.createDataFrame(cancer_pdf)
    eng = ContingencyEngine(df, max_cells=10)  # joint way above 10 groups
    assert not eng.materialized
    assert eng.n == len(cancer_pdf)
    c = eng.counts(("Smoking",))
    assert c["n"].sum() == len(cancer_pdf)


def test_spark_job_counter_counts_materialization(spark, cancer_pdf):
    df = spark.createDataFrame(cancer_pdf)
    eng = ContingencyEngine(df)
    jobs_after_init = eng.stats.spark_jobs
    eng.counts(("Smoking",))
    eng.counts(("Genetics",))
    # All served locally: no further Spark jobs.
    assert eng.stats.spark_jobs == jobs_after_init


def test_counts_cache_returns_same_object(flight_engine):
    a = flight_engine.counts(("Carrier",))
    b = flight_engine.counts(("Carrier",))
    assert a is b


def test_engine_on_tpch_lineitem(spark):
    # The engine is schema-agnostic: drive it over the provided TPC-H-lite
    # generator as well.
    from repro import synth_data

    li = synth_data.lineitem(spark, sf=0.001, seed=0)
    eng = ContingencyEngine(li, ["l_returnflag", "l_linestatus"])
    c = eng.counts(("l_returnflag", "l_linestatus"))
    pdf = li.toPandas()
    assert c["n"].sum() == len(pdf)
    h = eng.entropy(["l_returnflag"])
    assert h == pytest.approx(
        entropy_from_counts(pdf["l_returnflag"].value_counts().to_numpy())
    )
