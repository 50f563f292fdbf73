"""Tests for logical-dependency dropping: FDs w.r.t. the treatment,
mutual (two-way) FDs, and high-entropy (ID-like) attribute screening."""
import numpy as np
import pandas as pd
import pytest

from repro.core.contingency import ContingencyEngine
from repro.core.fd import (
    drop_logical_dependencies,
    fd_attributes,
    high_entropy_attributes,
    is_high_entropy_series,
    mutually_fd_pairs,
)


@pytest.fixture(scope="module")
def fd_engine(spark):
    rng = np.random.default_rng(0)
    n = 5000
    t = rng.integers(0, 3, n)
    code = t * 7 + 1  # bijective recode of T
    coarse = (t > 0).astype(int)  # one-way FD: T => coarse
    other = rng.integers(0, 4, n)
    pdf = pd.DataFrame({"T": t, "TCode": code, "Coarse": coarse, "Other": other})
    return ContingencyEngine(spark.createDataFrame(pdf))


def test_fd_attributes_detects_determiner(fd_engine):
    got = fd_attributes(fd_engine, "T", ["TCode", "Coarse", "Other"])
    assert got == ["TCode"]  # Coarse does not determine T; Other unrelated


def test_fd_attributes_excludes_treatment_itself(fd_engine):
    got = fd_attributes(fd_engine, "T", ["T", "TCode"])
    assert got == ["TCode"]


def test_mutual_fd_drops_later_of_pair(fd_engine):
    got = mutually_fd_pairs(fd_engine, ["T", "TCode", "Coarse", "Other"])
    assert got == ["TCode"]  # T kept (earlier), Coarse one-way only


def test_mutual_fd_order_dependence(fd_engine):
    got = mutually_fd_pairs(fd_engine, ["TCode", "T", "Coarse", "Other"])
    assert got == ["T"]  # now TCode is the keeper


def test_flight_airportwac_is_mutual_fd(flight_engine):
    got = mutually_fd_pairs(
        flight_engine, ["Airport", "AirportWAC", "Carrier", "Delayed"]
    )
    assert got == ["AirportWAC"]


def test_flight_quarter_is_not_dropped(flight_engine):
    # Month => Quarter is one-way; it must NOT be treated as a recode.
    got = mutually_fd_pairs(flight_engine, ["Month", "Quarter"])
    assert got == []


def test_drop_logical_dependencies_full(flight_engine):
    dropped = drop_logical_dependencies(
        flight_engine,
        "Carrier",
        list(flight_engine.attrs),
        detect_high_entropy=True,
    )
    assert "AirportWAC" in dropped.all
    assert "FlightNum" in dropped.high_entropy
    assert "TailNum" in dropped.high_entropy
    assert "Airport" not in dropped.all
    assert "Year" not in dropped.all


def test_high_entropy_spark_heuristic(flight_df):
    got = set(
        high_entropy_attributes(
            flight_df, ["FlightNum", "TailNum", "Airport", "Month", "Day"]
        )
    )
    assert {"FlightNum", "TailNum"} <= got
    assert "Airport" not in got
    assert "Month" not in got
    assert "Day" not in got


def test_is_high_entropy_series_id_like(rng):
    ids = np.arange(50_000)
    assert is_high_entropy_series(ids)


def test_is_high_entropy_series_categorical(rng):
    cats = rng.integers(0, 12, 50_000)
    assert not is_high_entropy_series(cats)


def test_is_high_entropy_series_constant():
    const = np.zeros(10_000, dtype=int)
    assert not is_high_entropy_series(const)


def test_is_high_entropy_series_moderate_cardinality(rng):
    # 50 levels stabilizes quickly — should not be flagged.
    vals = rng.integers(0, 50, 50_000)
    assert not is_high_entropy_series(vals)
