"""Evolving-KG Baseline (Sec 7.1.4): static TWCS from scratch per snapshot.

Discards all previous annotations and re-runs the Fig 2 static loop on
the full evolved KG after every update batch — the reference point both
incremental methods are measured against in Figures 8-9.
"""
from __future__ import annotations

import numpy as np

from repro.core.cluster_stats import Population
from repro.core.framework import EvalConfig
from repro.sim.mc import TrialResult, twcs_trial


def concat_populations(pops: list[Population]) -> Population:
    """The evolved KG G + Delta^1 + ... as one cluster population."""
    if not pops:
        raise ValueError("need at least one population")
    return Population(
        subjects=np.concatenate([p.subjects for p in pops]),
        sizes=np.concatenate([p.sizes for p in pops]),
        taus=np.concatenate([p.taus for p in pops]),
    )


def baseline_snapshot_eval(
    pops: list[Population], m: int, rng: np.random.Generator, cfg: EvalConfig = EvalConfig()
) -> TrialResult:
    """One from-scratch static TWCS evaluation of the current snapshot."""
    return twcs_trial(concat_populations(pops), m, rng, cfg)
