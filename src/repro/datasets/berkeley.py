"""BerkeleyData (paper Fig. 4 top): the 1973 UC Berkeley graduate
admissions data of Bickel, Hammel & O'Connell (1975).

Unlike the other datasets, this one needs no simulation: the published
department x gender x admission contingency table (the `UCBAdmissions`
table, 4,526 applicants over the six largest departments) IS the
dataset; we expand it to row level. The paper reports 4,428 rows — a
~2% difference from the canonical table, presumably a filtered copy;
the aggregate behaviour (male 44.5% vs female 30.4% admitted overall,
trend flattened/reversed per department) is a property of the table
itself.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

TREATMENT = "Gender"
OUTCOME = "Accepted"
TRUE_COVARIATES = ["Department"]

# (department, gender, admitted, rejected) — Bickel et al. 1975.
_TABLE = [
    ("A", "Male", 512, 313),
    ("A", "Female", 89, 19),
    ("B", "Male", 353, 207),
    ("B", "Female", 17, 8),
    ("C", "Male", 120, 205),
    ("C", "Female", 202, 391),
    ("D", "Male", 138, 279),
    ("D", "Female", 131, 244),
    ("E", "Male", 53, 138),
    ("E", "Female", 94, 299),
    ("F", "Male", 22, 351),
    ("F", "Female", 24, 317),
]


def pandas_frame(shuffle_seed: int | None = 0) -> pd.DataFrame:
    """Row-level expansion of the published table (4,526 rows)."""
    rows = []
    for dept, gender, adm, rej in _TABLE:
        rows.append(
            pd.DataFrame(
                {
                    "Gender": gender,
                    "Department": dept,
                    "Accepted": np.concatenate(
                        [np.ones(adm, dtype=np.int64), np.zeros(rej, dtype=np.int64)]
                    ),
                }
            )
        )
    out = pd.concat(rows, ignore_index=True)
    if shuffle_seed is not None:
        out = out.sample(frac=1.0, random_state=shuffle_seed).reset_index(drop=True)
    return out


def load(spark: SparkSession) -> DataFrame:
    return spark.createDataFrame(pandas_frame())
