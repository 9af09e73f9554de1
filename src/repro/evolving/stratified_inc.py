"""Stratified Incremental Evaluation — SS (Sec 6.2, Algorithm 2).

Each update batch Delta^i becomes its own stratum. The estimate for the
evolved KG combines per-stratum TWCS estimates with triple-count weights
W_h = |stratum_h| / |G + Delta| (Eq 13); all annotations from earlier
strata are *fully reused* (only their weights change), which is why SS
beats RS on cost — and why a bad early estimate lingers (Sec 7.3.2's
fault-tolerance trade-off, which tests reproduce).

Per Algorithm 2, after an update only the newest stratum is sampled:
draw TWCS batches on Delta until the *combined* MoE is back under eps.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.core.cluster_stats import Population
from repro.core.cost import CostLedger
from repro.core.framework import EvalConfig
from repro.core.cluster_sampling import estimate_cluster_means
from repro.core.stats import Estimate, combine_stratified
from repro.sim.mc import _pps_draws


@dataclass
class _Stratum:
    pop: Population
    means: list[float] = field(default_factory=list)  # per-draw TWCS means

    @property
    def n_triples(self) -> int:
        return self.pop.n_triples

    @property
    def mu_hat(self) -> float:
        return float(np.mean(self.means)) if self.means else 0.0

    @property
    def var_hat(self) -> float:
        return estimate_cluster_means(np.asarray(self.means), alpha=0.05).var_hat


@dataclass
class StratifiedIncrementalEvaluator:
    """SS over a sequence of update batches (Algorithm 2)."""

    m: int
    cfg: EvalConfig = field(default_factory=EvalConfig)
    # Incremental batches on Delta are finer than the static loop's: each
    # new stratum usually needs only a handful of draws to pull the
    # combined MoE back under eps, so coarse batches would overshoot and
    # erase SS's cost advantage (the whole point of Algorithm 2).
    update_batch_clusters: int = 5
    strata: list[_Stratum] = field(default_factory=list)
    ledger: CostLedger = field(default_factory=CostLedger)

    def _draw_batch(self, st: _Stratum, k: int, rng: np.random.Generator) -> None:
        ci = _pps_draws(st.pop, k, rng)
        sizes, taus = st.pop.sizes[ci], st.pop.taus[ci]
        s = np.minimum(sizes, self.m)
        good = rng.hypergeometric(taus, sizes - taus, s)
        st.means.extend((good / s).tolist())
        for si in s:
            self.ledger.charge_task(int(si))

    def estimate(self) -> Estimate:
        w = np.array([st.n_triples for st in self.strata], dtype=np.float64)
        w /= w.sum()
        mu = np.array([st.mu_hat for st in self.strata])
        var = np.array([st.var_hat for st in self.strata])
        return combine_stratified(w, mu, var, self.cfg.alpha)

    def _total_draws(self) -> int:
        return sum(len(st.means) for st in self.strata)

    def _sample_until_converged(
        self, st: _Stratum, rng: np.random.Generator, batch: int
    ) -> None:
        """Algorithm 2's while-loop: batches on the given stratum only."""
        min_stratum_draws = 2  # variance of a stratum needs >= 2 draws
        while True:
            if len(st.means) < min_stratum_draws:
                self._draw_batch(st, min_stratum_draws - len(st.means), rng)
            est = self.estimate()
            if (
                self._total_draws() >= self.cfg.min_draws and est.moe <= self.cfg.eps
            ) or self._total_draws() >= self.cfg.max_units:
                return
            self._draw_batch(st, batch, rng)

    def initialise(self, pop: Population, rng: np.random.Generator) -> Estimate:
        """Static TWCS evaluation of the base KG G (stratum 0)."""
        st = _Stratum(pop)
        self.strata.append(st)
        self._sample_until_converged(st, rng, self.cfg.batch_clusters)
        return self.estimate()

    def apply_update(self, delta: Population, rng: np.random.Generator) -> Estimate:
        """Algorithm 2: Delta is a fresh stratum; only it gets sampled."""
        if not self.strata:
            raise RuntimeError("initialise() must run before apply_update()")
        st = _Stratum(delta)
        self.strata.append(st)
        self._sample_until_converged(st, rng, self.update_batch_clusters)
        return self.estimate()

    @property
    def hours(self) -> float:
        return self.ledger.hours
