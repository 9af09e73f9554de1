"""Tests for RS — weighted reservoir incremental evaluation (Sec 6.1)."""
import numpy as np
import pytest

from repro.core.cluster_stats import Population, cluster_stats_df
from repro.core.framework import EvalConfig
from repro.evolving.reservoir import (
    ReservoirEvaluator,
    merge_reservoir,
    top_reservoir,
    with_reservoir_keys,
)
from repro.kg.generator import movie_like, nell_like
from repro.kg.updates import update_batch


@pytest.fixture(scope="module")
def base_pop():
    return Population.from_synthetic(movie_like(sf=0.02, seed=21))


@pytest.fixture(scope="module")
def delta_pop():
    return Population.from_synthetic(
        update_batch(n_triples=5000, accuracy=0.9, seed=9, subject_offset=10_000_000)
    )


class TestSparkReservoir:
    def test_keys_in_unit_interval(self, spark):
        cl = cluster_stats_df(nell_like().to_spark(spark))
        keys = with_reservoir_keys(cl, seed=1).toPandas()["res_key"]
        assert ((keys >= 0) & (keys <= 1)).all()

    def test_top_reservoir_size_and_ordering(self, spark):
        cl = with_reservoir_keys(cluster_stats_df(nell_like().to_spark(spark)), seed=2)
        top = top_reservoir(cl, 25).toPandas()
        assert len(top) == 25
        rest_max = (
            cl.toPandas().nlargest(26, "res_key")["res_key"].iloc[25]
        )
        assert top["res_key"].min() >= rest_max

    def test_merge_equals_full_recompute(self, spark):
        """top-n is associative: incremental merge == one-shot top-n."""
        base = with_reservoir_keys(
            cluster_stats_df(nell_like().to_spark(spark)), seed=3
        ).cache()
        delta_kg = update_batch(
            n_triples=400, accuracy=0.8, seed=4, subject_offset=1_000_000
        )
        delta = cluster_stats_df(delta_kg.to_spark(spark))
        inc = merge_reservoir(top_reservoir(base, 20), delta, 20, seed=5).toPandas()
        full = top_reservoir(
            base.unionByName(with_reservoir_keys(delta, seed=5)), 20
        ).toPandas()
        assert set(inc["subject"]) == set(full["subject"])

    def test_weighted_inclusion_favours_large_clusters(self, spark):
        """P(cluster in reservoir) increases with M_i under A-Res keys."""
        cl = cluster_stats_df(movie_like(sf=0.005, seed=33).to_spark(spark)).toPandas()
        rng = np.random.default_rng(0)
        n = 50
        hits = np.zeros(len(cl))
        sizes = cl["size"].to_numpy()
        for _ in range(300):
            keys = rng.random(len(cl)) ** (1.0 / sizes)
            top = np.argpartition(-keys, n)[:n]
            hits[top] += 1
        big = sizes >= np.percentile(sizes, 90)
        small = sizes <= np.percentile(sizes, 50)
        assert hits[big].mean() > 3 * hits[small].mean()


class TestReservoirEvaluator:
    def test_initialise_converges(self, base_pop):
        ev = ReservoirEvaluator(m=5)
        est = ev.initialise(base_pop, np.random.default_rng(1))
        assert est.moe <= ev.cfg.eps
        assert abs(est.mu_hat - base_pop.mu) < 0.1
        assert ev.hours > 0

    def test_update_keeps_reservoir_size_and_converges(self, base_pop, delta_pop):
        ev = ReservoirEvaluator(m=5)
        rng = np.random.default_rng(2)
        ev.initialise(base_pop, rng)
        size0 = len(ev.members)
        est = ev.apply_update(delta_pop, rng)
        assert len(ev.members) >= size0  # merge keeps size; top-up may grow
        assert est.moe <= ev.cfg.eps

    def test_update_before_initialise_rejected(self, delta_pop):
        ev = ReservoirEvaluator(m=5)
        with pytest.raises(RuntimeError):
            ev.apply_update(delta_pop, np.random.default_rng(3))

    def test_incremental_cost_below_fresh_evaluation(self, base_pop, delta_pop):
        """RS's point: updating costs far less than re-evaluating."""
        rng = np.random.default_rng(4)
        ev = ReservoirEvaluator(m=5)
        ev.initialise(base_pop, rng)
        h0 = ev.hours
        ev.apply_update(delta_pop, rng)
        assert ev.hours - h0 < 0.5 * h0

    def test_proposition3_insertion_bound(self, base_pop):
        """E[#insertions] = O(|R| log(N_j / N_i)) (Eq 14): check the
        average over repeats stays within a constant factor."""
        n_ins = []
        for t in range(20):
            rng = np.random.default_rng(100 + t)
            ev = ReservoirEvaluator(m=5)
            ev.initialise(base_pop, rng)
            r_size = len(ev.members)
            delta = Population.from_synthetic(
                update_batch(
                    n_triples=base_pop.n_triples // 2,
                    accuracy=0.9,
                    seed=200 + t,
                    subject_offset=20_000_000,
                    )
            )
            ev.apply_update(delta, rng)
            nj = base_pop.n_clusters + delta.n_clusters
            bound = r_size * np.log(nj / base_pop.n_clusters)
            n_ins.append(ev.n_insertions / max(bound, 1e-9))
        assert np.mean(n_ins) < 3.0

    def test_estimates_unbiased_over_trials(self, base_pop, delta_pop):
        ests = []
        for t in range(40):
            rng = np.random.default_rng(300 + t)
            ev = ReservoirEvaluator(m=5)
            ev.initialise(base_pop, rng)
            ests.append(ev.apply_update(delta_pop, rng).mu_hat)
        truth = (base_pop.mu * base_pop.n_triples + delta_pop.mu * delta_pop.n_triples) / (
            base_pop.n_triples + delta_pop.n_triples
        )
        assert np.mean(ests) == pytest.approx(truth, abs=0.03)
