"""Unit tests for repro.kg.labels (REM / BMM / calibration, Sec 7.1.2)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.kg import labels as L


@pytest.fixture
def rng():
    return np.random.default_rng(0)


class TestRem:
    def test_constant_probability(self):
        p = L.rem_probs(np.array([1, 5, 100]), r_err=0.1)
        assert np.allclose(p, 0.9)

    @pytest.mark.parametrize("r", [-0.1, 1.1])
    def test_rejects_bad_rate(self, r):
        with pytest.raises(ValueError):
            L.rem_probs(np.array([1]), r_err=r)

    def test_zero_error_rate_is_all_correct(self):
        assert np.allclose(L.rem_probs(np.array([3, 4]), r_err=0.0), 1.0)


class TestBmm:
    def test_small_clusters_sit_at_half(self, rng):
        # With sigma=0 and M_i < k the probability is exactly 0.5 (Eq 15).
        p = L.bmm_probs(np.array([1, 2]), c=0.01, sigma=0.0, k=3, rng=rng)
        assert np.allclose(p, 0.5)

    def test_sigmoid_branch_matches_formula(self, rng):
        m = np.array([10, 100, 1000])
        p = L.bmm_probs(m, c=0.01, sigma=0.0, k=3, rng=rng)
        expected = 1.0 / (1.0 + np.exp(-0.01 * (m - 3)))
        assert np.allclose(p, expected)

    def test_probabilities_clipped_to_unit_interval(self, rng):
        p = L.bmm_probs(np.arange(1, 500), c=0.5, sigma=2.0, k=3, rng=rng)
        assert (p >= 0).all() and (p <= 1).all()

    def test_larger_c_strengthens_size_accuracy_link(self):
        m = np.arange(3, 200)
        rng1, rng2 = np.random.default_rng(1), np.random.default_rng(1)
        weak = L.bmm_probs(m, c=0.0001, sigma=0.0, k=3, rng=rng1)
        strong = L.bmm_probs(m, c=0.5, sigma=0.0, k=3, rng=rng2)
        assert strong[-1] - strong[0] > weak[-1] - weak[0]

    def test_rejects_negative_c(self, rng):
        with pytest.raises(ValueError):
            L.bmm_probs(np.array([5]), c=-1.0, sigma=0.1, k=3, rng=rng)


class TestCalibrate:
    @given(target=st.floats(0.05, 0.95))
    @settings(max_examples=25, deadline=None)
    def test_hits_target_accuracy(self, target):
        rng = np.random.default_rng(2)
        sizes = rng.integers(1, 20, 200)
        probs = rng.random(200)
        cal = L.calibrate(sizes, probs, target)
        got = float(np.dot(sizes, cal) / sizes.sum())
        assert got == pytest.approx(target, abs=1e-3)

    def test_preserves_ordering_away_from_clip(self):
        sizes = np.ones(3, dtype=int)
        cal = L.calibrate(sizes, np.array([0.2, 0.3, 0.4]), 0.5)
        assert cal[0] < cal[1] < cal[2]

    def test_rejects_bad_target(self):
        with pytest.raises(ValueError):
            L.calibrate(np.array([1]), np.array([0.5]), 1.5)


class TestDrawClusterTaus:
    def test_bounds(self, rng):
        sizes = np.array([1, 5, 50, 500])
        taus = L.draw_cluster_taus(sizes, np.full(4, 0.7), rng=rng)
        assert (taus >= 0).all() and (taus <= sizes).all()

    def test_deterministic_extremes(self, rng):
        sizes = np.array([3, 7])
        assert (L.draw_cluster_taus(sizes, np.array([1.0, 1.0]), rng=rng) == sizes).all()
        assert (L.draw_cluster_taus(sizes, np.array([0.0, 0.0]), rng=rng) == 0).all()

    def test_mean_approaches_probability(self):
        rng = np.random.default_rng(3)
        sizes = np.full(5000, 10)
        taus = L.draw_cluster_taus(sizes, np.full(5000, 0.8), rng=rng)
        assert taus.mean() / 10 == pytest.approx(0.8, abs=0.01)
