"""Biased-query detection (paper Sec. 3.1).

A group-by query over treatment T is *balanced* w.r.t. a variable set V
in a context Gamma iff (T indep V | Gamma) — equivalently
I(T; V | Gamma) = 0 (Def. 3.1). The query is then an unbiased estimator
of the total effect (V = covariates Z) or the direct effect
(V = Z + mediators M) by Prop. 3.2. Detection therefore reduces to one
conditional-independence test of T against the *joint* of V over the
context's sub-population.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Sequence

from repro.core.independence import IndependenceTester, TestResult

__all__ = ["BiasResult", "detect_bias"]


@dataclass(frozen=True)
class BiasResult:
    """Outcome of the bias test for one query context."""

    treatment: str
    variables: tuple[str, ...]
    statistic: float  # I_hat(T; V | Gamma), nats
    p_value: float
    biased: bool
    test: TestResult

    def __str__(self) -> str:  # compact report line
        verdict = "BIASED" if self.biased else "unbiased"
        return (
            f"{verdict}: I({self.treatment}; {{{', '.join(self.variables)}}}) "
            f"= {self.statistic:.4f} (p={self.p_value:.4g}, {self.test.method})"
        )


def detect_bias(
    tester: IndependenceTester,
    treatment: str,
    variables: Sequence[str],
    *,
    alpha: float | None = None,
) -> BiasResult:
    """Test whether the query is balanced w.r.t. ``variables`` in the
    context the tester's engine is restricted to. The query is biased
    when the null I(T; V | Gamma) = 0 is rejected at level ``alpha``
    (defaults to the tester's own level, 0.01 in the paper)."""
    variables = tuple(v for v in variables if v != treatment)
    if not variables:
        raise ValueError("need at least one covariate/mediator to test against")
    a = tester.alpha if alpha is None else alpha
    res = tester.test(treatment, variables)
    return BiasResult(
        treatment=treatment,
        variables=variables,
        statistic=res.statistic,
        p_value=res.p_value,
        biased=res.p_value < a,
        test=res,
    )
