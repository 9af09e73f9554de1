"""Tests for the SRS sampler/estimator (Sec 5.1)."""
import numpy as np
import pytest

from repro.core.srs import (
    estimate_srs,
    srs_expected_entities,
    srs_required_n,
    srs_sample,
)
from repro.kg.generator import nell_like


@pytest.fixture(scope="module")
def nell_df(spark):
    return nell_like().to_spark(spark).cache()


class TestSrsSampler:
    def test_exact_sample_size(self, nell_df):
        assert srs_sample(nell_df, 50, seed=1).count() == 50

    def test_without_replacement(self, nell_df):
        pdf = srs_sample(nell_df, 200, seed=2).toPandas()
        assert len(pdf.drop_duplicates()) == len(pdf)

    def test_deterministic_in_seed(self, nell_df):
        a = srs_sample(nell_df, 30, seed=3).toPandas().sort_values("object")
        b = srs_sample(nell_df, 30, seed=3).toPandas().sort_values("object")
        assert (a["object"].to_numpy() == b["object"].to_numpy()).all()

    def test_different_seeds_differ(self, nell_df):
        a = set(srs_sample(nell_df, 30, seed=4).toPandas()["object"])
        b = set(srs_sample(nell_df, 30, seed=5).toPandas()["object"])
        assert a != b

    def test_uniformity_over_triples(self, nell_df):
        """Mean label over a large sample approximates mu(G)."""
        mu = nell_like().accuracy
        got = srs_sample(nell_df, 1200, seed=6).toPandas()["label"].mean()
        assert got == pytest.approx(mu, abs=0.03)

    def test_rejects_nonpositive_n(self, nell_df):
        with pytest.raises(ValueError):
            srs_sample(nell_df, 0, seed=1)


class TestSrsEstimator:
    def test_point_estimate_is_sample_mean(self):
        e = estimate_srs(np.array([1, 1, 0, 1]), alpha=0.05)
        assert e.mu_hat == pytest.approx(0.75)
        assert e.n_units == 4

    def test_variance_formula(self):
        e = estimate_srs(np.ones(10) * 0.0 + np.arange(10) % 2, alpha=0.05)
        assert e.var_hat == pytest.approx(0.25 / 10)

    def test_empty_sample(self):
        assert estimate_srs(np.array([]), alpha=0.05).moe == float("inf")


class TestSrsDesignFormulas:
    def test_required_n_closed_form(self):
        # n = p(1-p) z^2 / eps^2 at p=0.9, eps=5%, alpha=5% -> 139.
        assert srs_required_n(0.9, alpha=0.05, eps=0.05) == 139

    def test_required_n_peaks_at_half(self):
        assert srs_required_n(0.5, alpha=0.05, eps=0.05) > srs_required_n(
            0.9, alpha=0.05, eps=0.05
        )

    def test_expected_entities_bounds(self):
        sizes = np.array([1, 2, 3, 4])
        # 0 draws -> 0 entities; huge draws -> all entities.
        assert srs_expected_entities(sizes, 0) == 0.0
        assert srs_expected_entities(sizes, 10_000) == pytest.approx(4.0)

    def test_expected_entities_matches_simulation(self):
        rng = np.random.default_rng(0)
        sizes = np.array([1, 1, 2, 5, 10])
        cum = np.cumsum(sizes)
        n_s = 6
        hits = []
        for _ in range(4000):
            draws = rng.choice(cum[-1], size=n_s, replace=False)
            hits.append(len(np.unique(np.searchsorted(cum, draws, side="right"))))
        # The closed form assumes with-replacement draws; drawing without
        # replacement spreads over strictly more entities, so the formula
        # is a lower bound that stays close for n_s << M (Sec 5.1).
        expect = srs_expected_entities(sizes, n_s)
        assert expect * 0.98 <= np.mean(hits) <= expect * 1.15
