"""CancerData (paper Fig. 4 bottom, Ex. 10.1): Guyon's LUCAS "lung
cancer simple model" — a 12-attribute binary dataset generated from the
causal DAG of the paper's Fig. 7.

Edges (exactly Fig. 7):
    Anxiety -> Smoking <- Peer_Pressure
    Smoking -> Yellow_Fingers
    Smoking -> Lung_Cancer <- Genetics
    Genetics -> Attention_Disorder
    Allergy -> Coughing <- Lung_Cancer
    Lung_Cancer -> Fatigue <- Coughing
    Fatigue -> Car_Accident <- Attention_Disorder
    Born_an_Even_Day (isolated)

There is NO Lung_Cancer -> Car_Accident edge, so the ground-truth
direct effect of lung cancer on car accidents is zero while the total
effect (via Fatigue) is positive — the paper's Fig. 4 (bottom) check.
CPTs are calibrated to land near the paper's reported averages
(E[CA|LC=0] ~ 0.6, E[CA|LC=1] ~ 0.77). Default n = 2,000 rows, as in
Table 1.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.dags.dag import DAG

TREATMENT = "Lung_Cancer"
OUTCOME = "Car_Accident"
TRUE_COVARIATES = ["Smoking", "Genetics"]
TRUE_MEDIATORS = ["Fatigue", "Attention_Disorder"]

NODES = [
    "Anxiety",
    "Peer_Pressure",
    "Genetics",
    "Allergy",
    "Born_an_Even_Day",
    "Smoking",
    "Yellow_Fingers",
    "Lung_Cancer",
    "Attention_Disorder",
    "Coughing",
    "Fatigue",
    "Car_Accident",
]

EDGES = [
    ("Anxiety", "Smoking"),
    ("Peer_Pressure", "Smoking"),
    ("Smoking", "Yellow_Fingers"),
    ("Smoking", "Lung_Cancer"),
    ("Genetics", "Lung_Cancer"),
    ("Genetics", "Attention_Disorder"),
    ("Allergy", "Coughing"),
    ("Lung_Cancer", "Coughing"),
    ("Lung_Cancer", "Fatigue"),
    ("Coughing", "Fatigue"),
    ("Fatigue", "Car_Accident"),
    ("Attention_Disorder", "Car_Accident"),
]


def dag() -> DAG:
    """The ground-truth LUCAS DAG (paper Fig. 7)."""
    return DAG.from_edges(NODES, EDGES)


def pandas_frame(n: int = 2_000, seed: int = 0) -> pd.DataFrame:
    g = np.random.default_rng(seed)

    anxiety = (g.random(n) < 0.64).astype(np.int64)
    peer = (g.random(n) < 0.33).astype(np.int64)
    genetics = (g.random(n) < 0.15).astype(np.int64)
    allergy = (g.random(n) < 0.33).astype(np.int64)
    born_even = (g.random(n) < 0.5).astype(np.int64)

    p_smoke = np.select(
        [
            (anxiety == 1) & (peer == 1),
            (anxiety == 1) & (peer == 0),
            (anxiety == 0) & (peer == 1),
        ],
        [0.91, 0.86, 0.74],
        0.43,
    )
    smoking = (g.random(n) < p_smoke).astype(np.int64)

    yellow = (g.random(n) < np.where(smoking == 1, 0.91, 0.23)).astype(np.int64)

    p_lc = np.select(
        [
            (smoking == 1) & (genetics == 1),
            (smoking == 1) & (genetics == 0),
            (smoking == 0) & (genetics == 1),
        ],
        [0.99, 0.55, 0.83],
        0.20,
    )
    lung_cancer = (g.random(n) < p_lc).astype(np.int64)

    attention = (g.random(n) < np.where(genetics == 1, 0.68, 0.28)).astype(np.int64)

    p_cough = np.select(
        [
            (allergy == 1) & (lung_cancer == 1),
            (allergy == 1) & (lung_cancer == 0),
            (allergy == 0) & (lung_cancer == 1),
        ],
        [0.93, 0.64, 0.85],
        0.13,
    )
    coughing = (g.random(n) < p_cough).astype(np.int64)

    p_fatigue = np.select(
        [
            (lung_cancer == 1) & (coughing == 1),
            (lung_cancer == 1) & (coughing == 0),
            (lung_cancer == 0) & (coughing == 1),
        ],
        [0.89, 0.72, 0.56],
        0.35,
    )
    fatigue = (g.random(n) < p_fatigue).astype(np.int64)

    p_ca = np.select(
        [
            (attention == 1) & (fatigue == 1),
            (attention == 1) & (fatigue == 0),
            (attention == 0) & (fatigue == 1),
        ],
        [0.99, 0.97, 0.78],
        0.31,
    )
    car_accident = (g.random(n) < p_ca).astype(np.int64)

    return pd.DataFrame(
        {
            "Anxiety": anxiety,
            "Peer_Pressure": peer,
            "Genetics": genetics,
            "Allergy": allergy,
            "Born_an_Even_Day": born_even,
            "Smoking": smoking,
            "Yellow_Fingers": yellow,
            "Lung_Cancer": lung_cancer,
            "Attention_Disorder": attention,
            "Coughing": coughing,
            "Fatigue": fatigue,
            "Car_Accident": car_accident,
        }
    )


def load(spark: SparkSession, n: int = 2_000, seed: int = 0) -> DataFrame:
    return spark.createDataFrame(pandas_frame(n=n, seed=seed))
