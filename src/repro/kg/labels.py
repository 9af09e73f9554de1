"""Synthetic triple-correctness label models (Sec 7.1.2).

Two generators from the paper:

- **REM** (Random Error Model): every triple is correct with fixed
  probability ``1 - r_err``.
- **BMM** (Binomial Mixture Model): the number of correct triples in
  cluster i is Binomial(M_i, p_i) with the sigmoid-like size-accuracy
  link of Eq 15:

      p_i = 0.5 + eps                      if M_i < k
      p_i = 1 / (1 + exp(-c (M_i - k))) + eps   otherwise

  where eps ~ N(0, sigma). Defaults follow the paper: k=3, c=0.01,
  sigma=0.1.

Both operate at the cluster level: given the cluster-size vector they
return per-cluster correctness probabilities ``p`` (clipped to [0, 1]);
``draw_cluster_taus`` then materialises tau_i ~ Binomial(M_i, p_i).
``calibrate`` shifts the probabilities so the triple-weighted mean hits
a target overall accuracy — used to pin synthetic KGs to the gold
accuracies of Table 3 (91% NELL, 99% YAGO, 90% MOVIE).
"""
from __future__ import annotations

import numpy as np


def rem_probs(sizes: np.ndarray, *, r_err: float) -> np.ndarray:
    """REM: constant correctness probability 1 - r_err for every cluster."""
    if not 0.0 <= r_err <= 1.0:
        raise ValueError(f"r_err must be in [0, 1], got {r_err}")
    return np.full(np.asarray(sizes).shape, 1.0 - r_err, dtype=np.float64)


def bmm_probs(
    sizes: np.ndarray,
    *,
    c: float = 0.01,
    sigma: float = 0.1,
    k: int = 3,
    rng: np.random.Generator,
) -> np.ndarray:
    """BMM per-cluster correctness probabilities p_i per Eq 15, clipped to [0,1]."""
    m = np.asarray(sizes, dtype=np.float64)
    if c < 0:
        raise ValueError(f"c must be >= 0, got {c}")
    eps = rng.normal(0.0, sigma, size=m.shape)
    base = np.where(m < k, 0.5, 1.0 / (1.0 + np.exp(-c * (m - k))))
    return np.clip(base + eps, 0.0, 1.0)


def calibrate(sizes: np.ndarray, probs: np.ndarray, target: float) -> np.ndarray:
    """Shift per-cluster probabilities so sum(M_i p_i)/M == target.

    The clipped-shift map ``s -> sum(M_i clip(p_i + s, 0, 1)) / M`` is
    monotone in s, so a bisection on s in [-1, 1] converges; this keeps
    the *shape* of the size-accuracy correlation while pinning the
    overall gold accuracy (Fig 3 + Table 3 jointly).
    """
    m = np.asarray(sizes, dtype=np.float64)
    p = np.asarray(probs, dtype=np.float64)
    if not 0.0 <= target <= 1.0:
        raise ValueError(f"target accuracy must be in [0, 1], got {target}")
    total = m.sum()

    def acc(shift: float) -> float:
        return float(np.dot(m, np.clip(p + shift, 0.0, 1.0)) / total)

    lo, hi = -1.0, 1.0
    for _ in range(60):
        mid = (lo + hi) / 2.0
        if acc(mid) < target:
            lo = mid
        else:
            hi = mid
    return np.clip(p + (lo + hi) / 2.0, 0.0, 1.0)


def draw_cluster_taus(
    sizes: np.ndarray, probs: np.ndarray, *, rng: np.random.Generator
) -> np.ndarray:
    """tau_i ~ Binomial(M_i, p_i): number of correct triples per cluster."""
    m = np.asarray(sizes, dtype=np.int64)
    p = np.asarray(probs, dtype=np.float64)
    return rng.binomial(m, p)
