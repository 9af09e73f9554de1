"""Simple random sampling of triples (Sec 5.1).

The sampler is a DataFrame->DataFrame transformation: draw exactly n
triples without replacement, uniformly over the KG. Implemented as
rand-key + global top-n, which Catalyst executes as TakeOrderedAndProject
(per-partition top-n then merge) — no full shuffle sort.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.stats import Estimate


def srs_sample(kg: DataFrame, n: int, *, seed: int) -> DataFrame:
    """Uniform without-replacement sample of ``n`` triples from ``kg``."""
    if n < 1:
        raise ValueError(f"n must be >= 1, got {n}")
    return (
        kg.withColumn("_r", F.rand(seed))
        .orderBy("_r")
        .limit(n)
        .drop("_r")
    )


def estimate_srs(labels: np.ndarray, *, alpha: float) -> Estimate:
    """Sample-mean estimator mu_hat_s (Eq 5) with Normal-approximation CI.

    Var_hat[mu_hat] = mu_hat (1 - mu_hat) / n, per Sec 5.1.
    """
    y = np.asarray(labels, dtype=np.float64)
    n = y.size
    if n == 0:
        return Estimate(mu_hat=0.0, var_hat=float("inf"), n_units=0, alpha=alpha)
    mu = float(y.mean())
    return Estimate(mu_hat=mu, var_hat=mu * (1.0 - mu) / n, n_units=n, alpha=alpha)


def srs_expected_entities(sizes: np.ndarray, n_s: int) -> float:
    """E[number of distinct entities in an SRS sample of n_s triples]:
    sum_i (1 - (1 - M_i/M)^{n_s}) — the identification-cost term in Eq 6."""
    m = np.asarray(sizes, dtype=np.float64)
    total = m.sum()
    return float(np.sum(1.0 - (1.0 - m / total) ** n_s))


def srs_required_n(mu: float, *, alpha: float, eps: float) -> int:
    """Closed-form sample size n_s = mu(1-mu) z^2 / eps^2 (Sec 5.1)."""
    from repro.core.stats import z_value

    if not 0.0 < eps < 1.0:
        raise ValueError(f"eps must be in (0, 1), got {eps}")
    z = z_value(alpha)
    return int(np.ceil(mu * (1.0 - mu) * z * z / (eps * eps)))
