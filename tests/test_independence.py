"""Tests for the independence tests: chi2 (G-test), MIT, MIT with group
sampling, HyMIT — calibration, power, agreement and dispatch."""
import numpy as np
import pandas as pd
import pytest

from repro.core.contingency import ContingencyEngine
from repro.core.independence import IndependenceTester


@pytest.fixture(scope="module")
def ind_engine(spark):
    # X, Y independent; W dependent on X; Z a 4-group conditioning var
    # with X ~ Y | Z (independent within groups).
    rng = np.random.default_rng(42)
    n = 6000
    z = rng.integers(0, 4, n)
    x = (rng.random(n) < 0.3 + 0.1 * z).astype(int)
    y = (rng.random(n) < 0.6 - 0.08 * z).astype(int)  # dep. on z, not x
    w = (rng.random(n) < np.where(x == 1, 0.7, 0.3)).astype(int)
    pdf = pd.DataFrame({"X": x, "Y": y, "W": w, "Z": z})
    return ContingencyEngine(spark.createDataFrame(pdf))


@pytest.mark.parametrize("method", ["chi2", "mit", "mit-sampling", "hymit"])
def test_independent_pair_not_rejected(ind_engine, method):
    t = IndependenceTester(ind_engine, method=method, m=200, seed=0)
    res = t.test("X", "Y", ["Z"])
    assert res.p_value >= 0.01, res


@pytest.mark.parametrize("method", ["chi2", "mit", "mit-sampling", "hymit"])
def test_dependent_pair_rejected(ind_engine, method):
    t = IndependenceTester(ind_engine, method=method, m=200, seed=0)
    res = t.test("X", "W")
    assert res.p_value < 0.01, res


def test_marginal_xy_dependent_via_confounder_z(ind_engine):
    # X and Y both depend on Z, hence marginally dependent but
    # conditionally independent — the test must tell them apart.
    t = IndependenceTester(ind_engine, method="chi2", seed=0)
    assert t.test("X", "Y").p_value < 0.01
    assert t.test("X", "Y", ["Z"]).p_value > 0.01


def test_statistic_is_cmi_estimate(ind_engine):
    t = IndependenceTester(ind_engine, method="chi2", seed=0)
    res = t.test("X", "W")
    # chi2 path uses the plug-in statistic; compare via grouped tables.
    from repro.core.entropy import mi_from_table

    [( _, tab)] = ind_engine.grouped_tables("X", "W")
    assert res.statistic == pytest.approx(mi_from_table(tab, miller_madow=False))


def test_chi2_df_formula(ind_engine):
    t = IndependenceTester(ind_engine, method="chi2", seed=0)
    res = t.test("X", "Y", ["Z"])
    assert res.df == (2 - 1) * (2 - 1) * 4


def test_mit_reports_ci_and_m(ind_engine):
    t = IndependenceTester(ind_engine, method="mit", m=100, seed=0)
    res = t.test("X", "Y", ["Z"])
    assert res.m == 100
    lo, hi = res.ci
    assert 0.0 <= lo <= res.p_value or res.p_value == pytest.approx(1 / 101)
    assert lo <= hi <= 1.0


def test_mit_p_value_never_exactly_zero(ind_engine):
    t = IndependenceTester(ind_engine, method="mit", m=100, seed=0)
    res = t.test("X", "W")
    assert res.p_value == pytest.approx(1 / 101)


def test_mit_deterministic_given_seed(ind_engine):
    a = IndependenceTester(ind_engine, method="mit", m=100, seed=5).test("X", "Y")
    b = IndependenceTester(ind_engine, method="mit", m=100, seed=5).test("X", "Y")
    assert a.p_value == b.p_value


def test_hymit_dispatches_chi2_when_df_small(ind_engine):
    t = IndependenceTester(ind_engine, method="hymit", seed=0)
    res = t.test("X", "Y", ["Z"])  # df=4 << n/5
    assert res.method == "chi2"


def test_hymit_dispatches_permutation_when_df_large(spark):
    # 3 categorical attrs with many levels -> df > n/5.
    rng = np.random.default_rng(1)
    n = 400
    pdf = pd.DataFrame(
        {
            "A": rng.integers(0, 10, n),
            "B": rng.integers(0, 10, n),
            "C": rng.integers(0, 12, n),
        }
    )
    eng = ContingencyEngine(spark.createDataFrame(pdf))
    t = IndependenceTester(eng, method="hymit", m=50, seed=0)
    res = t.test("A", "B", ["C"])
    assert res.method == "mit-sampling"
    assert res.p_value >= 0.01  # data is independent


def test_chi2_calibration_false_positive_rate():
    # Generate many independent 2x2 datasets; p-values should be roughly
    # uniform => rejection rate at alpha=0.05 should be near 0.05.
    rng = np.random.default_rng(7)
    from repro.core.entropy import mi_from_table
    from repro.core.stats import chi2_sf

    rejections = 0
    reps = 400
    for _ in range(reps):
        x = rng.integers(0, 2, 500)
        y = rng.integers(0, 2, 500)
        tab = pd.crosstab(x, y).to_numpy()
        g = 2 * 500 * mi_from_table(tab, miller_madow=False)
        if chi2_sf(g, 1) < 0.05:
            rejections += 1
    assert rejections / reps < 0.10


def test_mit_agrees_with_chi2_on_moderate_data(ind_engine):
    chi = IndependenceTester(ind_engine, method="chi2", seed=0)
    mit = IndependenceTester(ind_engine, method="mit", m=400, seed=0)
    for pair in [("X", "Y"), ("X", "W"), ("Y", "W")]:
        p_chi = chi.test(*pair).p_value
        p_mit = mit.test(*pair).p_value
        assert (p_chi < 0.01) == (p_mit < 0.01), (pair, p_chi, p_mit)


def test_degenerate_single_value_attr(spark):
    pdf = pd.DataFrame({"A": [1] * 50, "B": list(range(2)) * 25})
    eng = ContingencyEngine(spark.createDataFrame(pdf))
    for method in ("chi2", "mit", "hymit"):
        res = IndependenceTester(eng, method=method, m=50, seed=0).test("A", "B")
        assert res.p_value == 1.0


def test_result_cache(ind_engine):
    t = IndependenceTester(ind_engine, method="chi2", seed=0)
    r1 = t.test("X", "Y", ["Z"])
    n = t.n_tests
    r2 = t.test("Y", "X", ["Z"])  # symmetric => cache hit
    assert t.n_tests == n
    assert t.cache_hits == 1
    assert r1.p_value == r2.p_value


def test_cache_disabled(ind_engine):
    t = IndependenceTester(ind_engine, method="chi2", seed=0, cache_results=False)
    t.test("X", "Y")
    t.test("X", "Y")
    assert t.n_tests == 2
    assert t.cache_hits == 0


def test_unknown_method_rejected(ind_engine):
    with pytest.raises(ValueError):
        IndependenceTester(ind_engine, method="bogus")


def test_independent_helper_uses_alpha(ind_engine):
    t = IndependenceTester(ind_engine, method="chi2", alpha=0.01, seed=0)
    assert t.independent("X", "Y", ["Z"])
    assert not t.independent("X", "W")


def test_set_valued_y(ind_engine):
    t = IndependenceTester(ind_engine, method="chi2", seed=0)
    res = t.test("X", ["Y", "W"])
    # X depends on W, hence on the joint (Y, W).
    assert res.p_value < 0.01
    assert res.y == ("Y", "W")


def test_mit_sampling_matches_full_mit_decision(ind_engine):
    full = IndependenceTester(ind_engine, method="mit", m=200, seed=3)
    samp = IndependenceTester(ind_engine, method="mit-sampling", m=200, seed=3)
    for pair, z in [(("X", "W"), ()), (("X", "Y"), ("Z",))]:
        p_full = full.test(*pair, z).p_value
        p_samp = samp.test(*pair, z).p_value
        assert (p_full < 0.01) == (p_samp < 0.01)


def test_test_counter_increments(ind_engine):
    t = IndependenceTester(ind_engine, method="chi2", seed=0)
    before = ind_engine.stats.independence_tests
    t.test("X", "Y")
    t.test("X", "W")
    assert t.n_tests == 2
    assert ind_engine.stats.independence_tests == before + 2
