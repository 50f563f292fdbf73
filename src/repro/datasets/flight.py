"""Synthetic FlightData (paper Ex. 1.1, Fig. 1, Sec. 7.2/7.3).

The paper uses the BTS on-time performance data restricted to carriers
AA/UA and airports COS, MFE, MTJ, ROC. We synthesize a dataset with the
same phenomenology from an explicit generator DAG:

    Airport ─┬─> Carrier ──> DepTimeBlk ──> Delayed
    Year  ───┘      │                          ^ ^ ^
      └─────────────┴──────(no direct edge)────┘ │ │
    Airport ─────────────────────────────────────┘ │
    Month ─────────────────────────────────────────┘

* ``Airport`` and ``Year`` confound Carrier and Delayed: AA concentrates
  on low-delay airports (COS, MFE), UA on high-delay ROC — this bakes in
  the Simpson reversal of Fig. 1 (AA better overall, worse per airport).
* ``DepTimeBlk`` mediates a genuine carrier effect (UA flies more
  low-delay morning departures), so the *total* effect favors UA while
  the *direct* Carrier->Delayed effect is exactly zero by construction.
* ``AirportWAC`` is a 1-1 code for Airport (the FD the paper's Sec. 4
  pre-filter must catch) and ``FlightNum``/``TailNum`` are ID-like
  high-entropy attributes.
* ``Day``, ``DayOfWeek`` are pure noise; ``Quarter`` is an FD of Month.

Ground truth for assertions: PA(Carrier) = {Airport, Year},
PA(Delayed) = {Airport, Year, Month, DepTimeBlk}, mediator of
Carrier->Delayed = {DepTimeBlk}.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

AIRPORTS = ["COS", "MFE", "MTJ", "ROC"]
CARRIERS = ["AA", "UA"]
YEARS = [2012, 2013, 2014, 2015]
DEPTIME_BLOCKS = ["morning", "midday", "evening", "night"]

TREATMENT = "Carrier"
OUTCOME = "Delayed"
TRUE_COVARIATES = ["Airport", "Year"]
TRUE_MEDIATORS = ["DepTimeBlk"]

# P(Carrier=AA | Airport) base rates — AA owns the low-delay airports.
_AA_SHARE = {"COS": 0.85, "MFE": 0.80, "MTJ": 0.50, "ROC": 0.15}
# Base delay probability per airport — ROC is the delay-heavy airport.
_DELAY_BASE = {"COS": 0.15, "MFE": 0.18, "MTJ": 0.28, "ROC": 0.45}
# Departure-time-block mix per carrier — UA flies more mornings.
_BLOCK_MIX = {
    "AA": [0.20, 0.30, 0.35, 0.15],
    "UA": [0.45, 0.30, 0.15, 0.10],
}
# Additive delay effect of the departure block (the mediated effect).
_BLOCK_EFFECT = {"morning": -0.08, "midday": 0.0, "evening": 0.06, "night": 0.02}
# Airport visit frequency (so the overall mix is realistic, ROC largest).
_AIRPORT_MIX = [0.25, 0.25, 0.15, 0.35]
_WAC = {"COS": 82, "MFE": 74, "MTJ": 81, "ROC": 22}


def pandas_frame(n: int = 40_000, seed: int = 0) -> pd.DataFrame:
    """Row-level synthetic FlightData as pandas (deterministic in seed)."""
    g = np.random.default_rng(seed)
    airport = g.choice(AIRPORTS, size=n, p=_AIRPORT_MIX)
    year = g.choice(YEARS, size=n)
    month = g.integers(1, 13, size=n)
    day = g.integers(1, 29, size=n)
    dow = g.integers(1, 8, size=n)

    # Carrier <- Airport, Year  (AA gains share ~5pp per year).
    p_aa = np.array([_AA_SHARE[a] for a in airport])
    p_aa = np.clip(p_aa + 0.05 * (year - 2013.5), 0.02, 0.98)
    carrier = np.where(g.random(n) < p_aa, "AA", "UA")

    # DepTimeBlk <- Carrier  (the mediator).
    block = np.empty(n, dtype=object)
    for c in CARRIERS:
        mask = carrier == c
        block[mask] = g.choice(DEPTIME_BLOCKS, size=int(mask.sum()), p=_BLOCK_MIX[c])

    # Delayed <- Airport, Year, Month, DepTimeBlk — NO direct Carrier edge.
    p_delay = np.array([_DELAY_BASE[a] for a in airport])
    p_delay = p_delay + 0.02 * (year - 2013.5)
    p_delay = p_delay + np.where(np.isin(month, [12, 1, 2]), 0.05, 0.0)
    p_delay = p_delay + np.array([_BLOCK_EFFECT[b] for b in block])
    delayed = (g.random(n) < np.clip(p_delay, 0.01, 0.99)).astype(np.int64)

    return pd.DataFrame(
        {
            "Year": year.astype(np.int64),
            "Quarter": ((month - 1) // 3 + 1).astype(np.int64),
            "Month": month.astype(np.int64),
            "Day": day.astype(np.int64),
            "DayOfWeek": dow.astype(np.int64),
            "Airport": airport,
            "AirportWAC": np.array([_WAC[a] for a in airport], dtype=np.int64),
            "Carrier": carrier,
            "FlightNum": g.integers(1, 4000, size=n),
            "TailNum": np.array([f"N{i:05d}" for i in g.integers(0, 3000, size=n)]),
            "DepTimeBlk": block.astype(str),
            "Delayed": delayed,
        }
    )


def load(spark: SparkSession, n: int = 40_000, seed: int = 0) -> DataFrame:
    """Synthetic FlightData as a Spark DataFrame."""
    return spark.createDataFrame(pandas_frame(n=n, seed=seed))
