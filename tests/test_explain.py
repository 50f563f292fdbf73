"""Tests for bias explanations: responsibility (Eq. 4), contribution
(Eq. 5) and the fine-grained FGE/Borda procedure (Alg. 3)."""
import numpy as np
import pytest

from repro.core.contingency import ContingencyEngine
from repro.core.explain import fine_grained, pair_contributions, responsibilities
from repro.core.entropy import mi_from_table


def test_responsibilities_sum_to_one(flight_engine):
    resp = responsibilities(flight_engine, "Carrier", ["Airport", "Year", "Month"])
    assert sum(r.rho for r in resp) == pytest.approx(1.0)
    assert all(0.0 <= r.rho <= 1.0 for r in resp)


def test_responsibilities_sorted_descending(flight_engine):
    resp = responsibilities(flight_engine, "Carrier", ["Airport", "Year", "Month"])
    rhos = [r.rho for r in resp]
    assert rhos == sorted(rhos, reverse=True)


def test_airport_is_top_responsibility(flight_engine):
    # Paper Fig. 1(d): Airport carries the highest responsibility for the
    # FlightData bias, then Year; Month is pure noise w.r.t. Carrier.
    resp = responsibilities(flight_engine, "Carrier", ["Airport", "Year", "Month"])
    assert resp[0].variable == "Airport"
    assert resp[0].rho > 0.5
    by_var = {r.variable: r.rho for r in resp}
    assert by_var["Year"] > by_var["Month"]


def test_responsibility_drop_matches_definition(flight_engine):
    V = ("Airport", "Year")
    resp = responsibilities(flight_engine, "Carrier", V)
    by_var = {r.variable: r for r in resp}
    full = flight_engine.set_cmi("Carrier", V)
    drop_airport = full - flight_engine.set_cmi("Carrier", V, ["Airport"])
    assert by_var["Airport"].drop == pytest.approx(max(0.0, drop_airport))


def test_pair_contributions_sum_to_mi(flight_engine):
    c = pair_contributions(flight_engine, "Carrier", "Airport")
    tab = flight_engine.grouped_tables("Carrier", "Airport")[0][1]
    assert c["kappa"].sum() == pytest.approx(
        mi_from_table(tab, miller_madow=False), abs=1e-9
    )


def test_pair_contributions_signs(flight_engine):
    c = pair_contributions(flight_engine, "Carrier", "Airport").set_index(
        ["Carrier", "Airport"]
    )
    # AA over-represented at COS, UA over-represented at ROC.
    assert c.loc[("AA", "COS"), "kappa"] > 0
    assert c.loc[("UA", "ROC"), "kappa"] > 0
    assert c.loc[("UA", "COS"), "kappa"] < 0
    assert c.loc[("AA", "ROC"), "kappa"] < 0


def test_fine_grained_top_triple_matches_paper(flight_engine):
    # Paper Fig. 1(d): the top explanation for the Airport covariate is
    # (Airport=ROC, Carrier=UA, Delayed=1).
    top = fine_grained(flight_engine, "Carrier", "Delayed", "Airport", k=3)
    first = top.iloc[0]
    assert first["Carrier"] == "UA"
    assert first["Airport"] == "ROC"
    assert first["Delayed"] == 1


def test_fine_grained_k_limits_rows(flight_engine):
    assert len(fine_grained(flight_engine, "Carrier", "Delayed", "Airport", k=2)) == 2
    assert len(fine_grained(flight_engine, "Carrier", "Delayed", "Airport", k=5)) == 5


def test_fine_grained_borda_is_rank_sum(flight_engine):
    df = fine_grained(flight_engine, "Carrier", "Delayed", "Airport", k=16)
    # Borda scores are sums of two >=1 ranks and sorted ascending.
    assert (df["borda"] >= 2).all()
    assert df["borda"].is_monotonic_increasing


def test_fine_grained_cancer_fatigue(cancer_engine):
    # Paper Fig. 4 (bottom): top triples for the Fatigue mediator connect
    # lung cancer, fatigue and car accidents with matching polarity.
    top = fine_grained(
        cancer_engine, "Lung_Cancer", "Car_Accident", "Fatigue", k=2
    ).iloc[0]
    assert top["Lung_Cancer"] == top["Fatigue"] == top["Car_Accident"]


def test_responsibility_cancer_fatigue_dominates(cancer_engine):
    # Paper: Fatigue 0.91, Attention_Disorder 0.09.
    resp = responsibilities(
        cancer_engine, "Lung_Cancer", ["Fatigue", "Attention_Disorder"]
    )
    assert resp[0].variable == "Fatigue"
    assert resp[0].rho > 0.7


def test_responsibilities_zero_bias(spark):
    import pandas as pd

    rng = np.random.default_rng(0)
    pdf = pd.DataFrame(
        {"T": rng.integers(0, 2, 4000), "Z": rng.integers(0, 3, 4000)}
    )
    eng = ContingencyEngine(spark.createDataFrame(pdf))
    resp = responsibilities(eng, "T", ["Z"])
    # A single variable gets all of whatever (tiny) drop exists.
    assert len(resp) == 1
    assert resp[0].rho in (0.0, 1.0)
