"""Explanations for a biased query (paper Sec. 3.2).

* **Coarse-grained**: rank each variable Z in V by its *degree of
  responsibility* (Eq. 4)

      rho_Z = [I(T;V|G) - I(T;V|Z,G)] / sum_{V' in V} [I(T;V|G) - I(T;V|V',G)]

  — the normalized drop in the bias statistic obtained by conditioning
  on Z alone. Each numerator is >= 0 by submodularity when Z in V.

* **Fine-grained** (Alg. 3, FGE): for one covariate Z, rank the ground
  triples (t, y, z) by how much the pairs (t, z) and (y, z) contribute
  to I(T;Z) and I(Y;Z) respectively (kappa, Eq. 5), aggregating the two
  rankings with Borda's method.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Sequence

import numpy as np
import pandas as pd

from repro.core.contingency import ContingencyEngine

__all__ = ["Responsibility", "responsibilities", "pair_contributions", "fine_grained"]


@dataclass(frozen=True)
class Responsibility:
    variable: str
    drop: float  # I(T;V) - I(T;V|Z)  (>= 0 up to estimator noise)
    rho: float  # normalized responsibility, Eq. 4


def responsibilities(
    engine: ContingencyEngine,
    treatment: str,
    variables: Sequence[str],
) -> list[Responsibility]:
    """Coarse-grained explanation: variables ranked by responsibility.

    The engine must already be restricted to the query context Gamma.
    Estimator noise can make a drop marginally negative; it is clamped
    at 0 before normalizing so rho stays in [0, 1].
    """
    variables = tuple(variables)
    drops = []
    for z in variables:
        full = engine.set_cmi(treatment, variables)
        cond = engine.set_cmi(treatment, variables, [z])
        drops.append(max(0.0, full - cond))
    total = sum(drops)
    out = [
        Responsibility(v, d, (d / total) if total > 0 else 0.0)
        for v, d in zip(variables, drops)
    ]
    return sorted(out, key=lambda r: -r.rho)


def pair_contributions(engine: ContingencyEngine, x: str, y: str) -> pd.DataFrame:
    """kappa_(x,y) (Eq. 5) for every observed pair: columns [x, y, 'kappa'].
    The kappa column sums to the plug-in I(X;Y)."""
    c = engine.counts((x, y)).copy()
    n = c["n"].sum()
    c["p"] = c["n"] / n
    px = c.groupby(x, observed=True)["p"].transform("sum")
    py = c.groupby(y, observed=True)["p"].transform("sum")
    c["kappa"] = c["p"] * np.log(c["p"] / (px * py))
    return c[[x, y, "kappa"]]


def fine_grained(
    engine: ContingencyEngine,
    treatment: str,
    outcome: str,
    covariate: str,
    k: int = 5,
) -> pd.DataFrame:
    """Fine-grained explanation (Alg. 3): top-k triples
    (treatment value, outcome value, covariate value) by Borda-aggregated
    contribution to I(T;Z) and I(Y;Z).

    Returns columns [treatment, outcome, covariate, kappa_tz, kappa_yz,
    borda] sorted best-first (smaller borda = higher aggregate rank).
    """
    triples = engine.counts((treatment, outcome, covariate))[
        [treatment, outcome, covariate]
    ].copy()
    k_tz = pair_contributions(engine, treatment, covariate).rename(
        columns={"kappa": "kappa_tz"}
    )
    k_yz = pair_contributions(engine, outcome, covariate).rename(
        columns={"kappa": "kappa_yz"}
    )
    df = triples.merge(k_tz, on=[treatment, covariate]).merge(
        k_yz, on=[outcome, covariate]
    )
    # Borda: rank both contribution lists descending, sum the ranks.
    df["rank_tz"] = df["kappa_tz"].rank(ascending=False, method="min")
    df["rank_yz"] = df["kappa_yz"].rank(ascending=False, method="min")
    df["borda"] = df["rank_tz"] + df["rank_yz"]
    df = df.sort_values(["borda", "kappa_tz"], ascending=[True, False]).reset_index(
        drop=True
    )
    return df[[treatment, outcome, covariate, "kappa_tz", "kappa_yz", "borda"]].head(k)
