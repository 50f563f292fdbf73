"""Synthetic AdultData (paper Fig. 3 top, Sec. 7.3).

The UCI adult census table, rebuilt as a generator whose structure
reproduces the paper's findings about the gender/income query:

* a large marginal income gap between Male and Female,
* mostly *mediated* by MaritalStatus (the paper's surprising top
  explanation — the census income field is household-coupled, so
  "married" carries most of the association) and then Education,
* a small residual direct Gender->Income effect.

Generator DAG: Gender -> MaritalStatus, Education, HoursPerWeek;
Age -> MaritalStatus, Income; MaritalStatus -> CapitalGain, Income;
Education -> Occupation, Income; HoursPerWeek -> Income;
CapitalGain -> Income; Gender -> Income (small).

Gender is a root: its parents are not identifiable, so CD's fallback
Z = MB(Gender) - {Income} applies (paper Sec. 4) — exactly the
"mediators and covariates" mix the paper reports for this dataset.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

TREATMENT = "Gender"
OUTCOME = "Income"

_EDU = ["HS", "SomeCollege", "Bachelors", "Masters"]
_AGE = ["young", "mid", "senior"]
_OCC = ["service", "blue-collar", "white-collar", "professional"]


def pandas_frame(n: int = 30_000, seed: int = 0) -> pd.DataFrame:
    g = np.random.default_rng(seed)
    male = g.random(n) < 0.67
    gender = np.where(male, "Male", "Female")
    age = g.choice(_AGE, size=n, p=[0.3, 0.45, 0.25])

    # MaritalStatus <- Gender, Age. Married males dominate the data (the
    # recording artifact the paper's fine-grained explanation surfaces).
    p_married = np.where(male, 0.62, 0.18) + np.select(
        [age == "young", age == "senior"], [-0.12, 0.10], 0.0
    )
    married = g.random(n) < np.clip(p_married, 0.02, 0.95)
    single = ~married & (g.random(n) < 0.7)
    marital = np.select([married, single], ["Married", "Single"], "Divorced")

    # Education <- Gender (males skew to higher degrees in this sample).
    edu_m = np.array([0.32, 0.28, 0.27, 0.13])
    edu_f = np.array([0.40, 0.32, 0.21, 0.07])
    education = np.empty(n, dtype=object)
    education[male] = g.choice(_EDU, size=int(male.sum()), p=edu_m)
    education[~male] = g.choice(_EDU, size=int((~male).sum()), p=edu_f)

    # Occupation <- Education.
    occ_p = {
        "HS": [0.35, 0.40, 0.20, 0.05],
        "SomeCollege": [0.25, 0.30, 0.33, 0.12],
        "Bachelors": [0.10, 0.12, 0.45, 0.33],
        "Masters": [0.05, 0.05, 0.35, 0.55],
    }
    occupation = np.empty(n, dtype=object)
    for e in _EDU:
        mask = education == e
        occupation[mask] = g.choice(_OCC, size=int(mask.sum()), p=occ_p[e])

    # HoursPerWeek <- Gender, MaritalStatus.
    p_full = np.where(male, 0.8, 0.6) + np.where(married, 0.05, -0.05)
    hours = np.where(g.random(n) < np.clip(p_full, 0.05, 0.95), "full", "part")

    # CapitalGain <- MaritalStatus.
    capgain = (g.random(n) < np.where(married, 0.15, 0.05)).astype(np.int64)

    # Income <- MaritalStatus (strong), Education, CapitalGain, Hours,
    # Age, Gender (small direct effect ~2pp). Calibrated so the marginal
    # rates land near the paper's 0.11 (Female) / 0.30 (Male).
    edu_eff = pd.Series(education).map(
        {"HS": 0.0, "SomeCollege": 0.03, "Bachelors": 0.13, "Masters": 0.22}
    ).to_numpy()
    p_inc = (
        0.01
        + 0.24 * married
        + edu_eff
        + 0.18 * capgain
        + 0.04 * (hours == "full")
        + np.select([age == "young", age == "senior"], [-0.03, 0.04], 0.0)
        + 0.02 * male
    )
    income = (g.random(n) < np.clip(p_inc, 0.005, 0.97)).astype(np.int64)

    return pd.DataFrame(
        {
            "Gender": gender,
            "Age": age,
            "MaritalStatus": marital,
            "Education": education.astype(str),
            "Occupation": occupation.astype(str),
            "HoursPerWeek": hours.astype(str),
            "CapitalGain": capgain,
            "Income": income,
        }
    )


def load(spark: SparkSession, n: int = 30_000, seed: int = 0) -> DataFrame:
    return spark.createDataFrame(pandas_frame(n=n, seed=seed))
