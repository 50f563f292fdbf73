"""Synthetic StaplesData (paper Fig. 3 bottom, Sec. 7.3).

The WSJ investigation found Staples' online pricing charged higher
prices to users far from competitors' stores; low-income users tend to
live far from those stores, producing an income-price association with
*no direct* income effect. Generator DAG:

    Region ──> Income ──> Distance ──> Price
       │                      ^
       └──────────────────────┘           Urban ──> Income

* ``Price`` depends ONLY on ``Distance`` — the direct Income effect is
  exactly zero by construction (the paper's headline finding).
* ``Region`` and ``Urban`` are two non-adjacent parents of Income, so
  the CD algorithm can identify PA(Income) (paper's identifiability
  assumption); Region also shifts Distance (a genuine confounder).
* ``StoreID`` is an ID-like high-entropy column (6 columns total, as in
  the paper's schema).

Calibrated to the paper's magnitudes: E[Price|low] ~ 0.06,
E[Price|high] ~ 0.05.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

TREATMENT = "Income"
OUTCOME = "Price"
TRUE_COVARIATES = ["Region", "Urban"]
TRUE_MEDIATORS = ["Distance"]

_REGIONS = ["NE", "S", "MW", "W"]
# P(Income = high) by (region, urban).
_P_HIGH_INCOME = {"NE": 0.48, "S": 0.30, "MW": 0.36, "W": 0.45}
# P(Distance = far | income, region): low income and southern/midwest
# regions sit farther from competitor stores.
_P_FAR_REGION = {"NE": -0.08, "S": 0.10, "MW": 0.05, "W": -0.05}
_P_HIGH_PRICE = {"far": 0.08, "near": 0.03}


def pandas_frame(n: int = 100_000, seed: int = 0) -> pd.DataFrame:
    g = np.random.default_rng(seed)
    region = g.choice(_REGIONS, size=n, p=[0.25, 0.3, 0.25, 0.2])
    urban = (g.random(n) < 0.6).astype(np.int64)

    p_high = np.array([_P_HIGH_INCOME[r] for r in region]) + 0.24 * urban
    income = np.where(g.random(n) < np.clip(p_high, 0.02, 0.95), "high", "low")

    p_far = (
        0.30
        + np.where(income == "low", 0.30, 0.0)
        + np.array([_P_FAR_REGION[r] for r in region])
    )
    distance = np.where(g.random(n) < np.clip(p_far, 0.02, 0.95), "far", "near")

    p_price = np.array([_P_HIGH_PRICE[d] for d in distance])
    price = (g.random(n) < p_price).astype(np.int64)

    return pd.DataFrame(
        {
            "Region": region,
            "Urban": urban,
            "Income": income,
            "Distance": distance,
            "Price": price,
            "StoreID": g.integers(1, max(2, n // 5), size=n),
        }
    )


def load(spark: SparkSession, n: int = 100_000, seed: int = 0) -> DataFrame:
    return spark.createDataFrame(pandas_frame(n=n, seed=seed))
