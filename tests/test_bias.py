"""Tests for biased-query detection (Def. 3.1)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.bias import detect_bias
from repro.core.contingency import ContingencyEngine
from repro.core.independence import IndependenceTester


def _tester(engine, **kw):
    return IndependenceTester(engine, method="hymit", m=100, seed=0, **kw)


def test_flight_query_is_biased(flight_engine):
    res = detect_bias(_tester(flight_engine), "Carrier", ["Airport", "Year"])
    assert res.biased
    assert res.p_value < 0.001
    assert res.statistic > 0.1  # paper reports I ~ 0.25 on real FlightData


def test_flight_bias_statistic_close_to_paper(flight_engine):
    # Paper Sec. 3.1: I(Carrier; Airport | Gamma) = 0.25. Our synthetic
    # confounding is calibrated to the same order of magnitude.
    res = detect_bias(_tester(flight_engine), "Carrier", ["Airport"])
    assert 0.1 < res.statistic < 0.5


def test_berkeley_query_is_biased(spark, berkeley_df):
    engine = ContingencyEngine(berkeley_df)
    res = detect_bias(_tester(engine), "Gender", ["Department"])
    assert res.biased
    assert res.p_value < 0.001


def test_randomized_data_is_unbiased(spark):
    # Random treatment assignment: balanced by construction.
    rng = np.random.default_rng(0)
    n = 8000
    z = rng.integers(0, 4, n)
    t = rng.integers(0, 2, n)  # independent of z: an A/B test
    y = (rng.random(n) < 0.2 + 0.1 * z + 0.15 * t).astype(int)
    engine = ContingencyEngine(
        spark.createDataFrame(pd.DataFrame({"T": t, "Z": z, "Y": y}))
    )
    res = detect_bias(_tester(engine), "T", ["Z"])
    assert not res.biased


def test_bias_in_context_restriction(flight_engine):
    # The same test run on a single-airport context: Airport is constant
    # there, so bias w.r.t. Airport alone must vanish.
    sub = flight_engine.restrict({"Airport": "ROC"})
    res = detect_bias(_tester(sub), "Carrier", ["Airport"])
    assert not res.biased
    # But Year still differs across carriers in-context.
    res_year = detect_bias(_tester(sub), "Carrier", ["Year"])
    assert res_year.biased


def test_set_valued_v_uses_joint(flight_engine):
    tester = _tester(flight_engine)
    joint = detect_bias(tester, "Carrier", ["Airport", "Year"])
    single = detect_bias(tester, "Carrier", ["Year"])
    # Joint V captures at least as much dependence as the single attr.
    assert joint.statistic >= single.statistic - 1e-9


def test_treatment_excluded_from_variables(flight_engine):
    res = detect_bias(_tester(flight_engine), "Carrier", ["Carrier", "Airport"])
    assert res.variables == ("Airport",)


def test_no_variables_raises(flight_engine):
    with pytest.raises(ValueError):
        detect_bias(_tester(flight_engine), "Carrier", ["Carrier"])


def test_alpha_override(spark):
    # Randomized (unbiased) data: default alpha says unbiased, while an
    # absurd alpha > 1 flags everything — the override is respected.
    rng = np.random.default_rng(1)
    pdf = pd.DataFrame(
        {"T": rng.integers(0, 2, 6000), "Z": rng.integers(0, 3, 6000)}
    )
    engine = ContingencyEngine(spark.createDataFrame(pdf))
    tester = _tester(engine)
    assert not detect_bias(tester, "T", ["Z"]).biased
    assert detect_bias(tester, "T", ["Z"], alpha=1.1).biased


def test_str_formatting(flight_engine):
    res = detect_bias(_tester(flight_engine), "Carrier", ["Airport"])
    s = str(res)
    assert "BIASED" in s and "Carrier" in s and "Airport" in s
