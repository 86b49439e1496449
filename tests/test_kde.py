"""Tests for the Gaussian KDE used by the AL diversity signal (§V-B.3)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.kde import GaussianKDE


class TestGaussianKDE:
    def test_integrates_to_one(self):
        kde = GaussianKDE(np.random.default_rng(0).normal(size=500))
        xs = np.linspace(-8, 8, 4001)
        mass = np.trapz(kde.pdf(xs), xs)
        assert mass == pytest.approx(1.0, abs=0.01)

    def test_peaks_near_data(self):
        kde = GaussianKDE(np.concatenate([np.zeros(100), np.full(100, 5.0)]))
        assert kde.pdf(0.0)[0] > kde.pdf(2.5)[0]
        assert kde.pdf(5.0)[0] > kde.pdf(2.5)[0]

    def test_density_non_negative(self):
        kde = GaussianKDE(np.random.default_rng(1).normal(size=100))
        assert (kde.pdf(np.linspace(-10, 10, 100)) >= 0).all()

    def test_degenerate_samples_use_bandwidth_floor(self):
        kde = GaussianKDE(np.full(50, 3.0))
        assert kde.bandwidth >= 1e-3
        assert np.isfinite(kde.pdf(np.array([3.0, 100.0]))).all()

    def test_single_sample(self):
        kde = GaussianKDE(np.array([1.0]))
        assert kde.pdf(1.0)[0] > kde.pdf(2.0)[0]

    def test_empty_rejected(self):
        with pytest.raises(AssertionError):
            GaussianKDE(np.array([]))

    def test_scalar_and_array_inputs(self):
        kde = GaussianKDE(np.random.default_rng(2).normal(size=50))
        assert kde.pdf(0.5).shape == (1,)
        assert kde.pdf(np.zeros(7)).shape == (7,)

    def test_silverman_bandwidth_shrinks_with_n(self):
        rng = np.random.default_rng(3)
        small = GaussianKDE(rng.normal(size=20))
        large = GaussianKDE(rng.normal(size=20_000))
        assert large.bandwidth < small.bandwidth

    def test_matches_normal_density_roughly(self):
        kde = GaussianKDE(np.random.default_rng(4).normal(size=5000))
        at0 = kde.pdf(0.0)[0]
        assert at0 == pytest.approx(1 / np.sqrt(2 * np.pi), rel=0.1)

    def test_chunked_eval_consistent(self):
        kde = GaussianKDE(np.random.default_rng(5).normal(size=100))
        xs = np.linspace(-3, 3, 20000)  # crosses the 8192 chunk boundary
        dense = kde.pdf(xs)
        assert np.allclose(dense[:100], kde.pdf(xs[:100]))
