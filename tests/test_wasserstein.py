"""Tests for the squared 2-Wasserstein distance (Eq. 3) and the §V-A
Euclidean-on-means correlation that licenses LSH blocking."""
from __future__ import annotations

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from hypothesis.extra.numpy import arrays

from repro.core.wasserstein import euclidean_sq_means, w2_squared, w2_vector

_vec = arrays(
    np.float64,
    (4,),
    elements=st.floats(-10, 10, allow_nan=False, allow_infinity=False),
)
_pos = arrays(
    np.float64,
    (4,),
    elements=st.floats(0.01, 10, allow_nan=False, allow_infinity=False),
)


class TestClosedForm:
    def test_identical_distributions_zero(self):
        mu = np.array([1.0, 2.0])
        sg = np.array([0.5, 0.5])
        assert w2_squared(mu, sg, mu, sg) == 0.0

    def test_known_value(self):
        # mu diff (1,2), sigma diff (3, -1): 1+4+9+1 = 15
        assert w2_squared(
            np.array([1.0, 2.0]),
            np.array([4.0, 1.0]),
            np.array([0.0, 0.0]),
            np.array([1.0, 2.0]),
        ) == pytest.approx(15.0)

    def test_vector_sums_to_scalar(self):
        rng = np.random.default_rng(0)
        mp, sp, mq, sq = (rng.normal(size=5) for _ in range(4))
        v = w2_vector(mp, np.abs(sp), mq, np.abs(sq))
        assert v.sum() == pytest.approx(w2_squared(mp, np.abs(sp), mq, np.abs(sq)))

    def test_batched_broadcast(self):
        rng = np.random.default_rng(1)
        mp = rng.normal(size=(7, 3))
        sp = np.abs(rng.normal(size=(7, 3)))
        mq = rng.normal(size=(7, 3))
        sq = np.abs(rng.normal(size=(7, 3)))
        out = w2_squared(mp, sp, mq, sq)
        assert out.shape == (7,)
        assert out[2] == pytest.approx(w2_squared(mp[2], sp[2], mq[2], sq[2]))

    def test_concatenation_additivity(self):
        """W2 over concatenated attribute blocks = sum of per-block W2 —
        the property that lets representations be stored flattened."""
        rng = np.random.default_rng(2)
        mp, mq = rng.normal(size=(2, 6))
        sp, sq = np.abs(rng.normal(size=(2, 6)))
        whole = w2_squared(mp, sp, mq, sq)
        parts = w2_squared(mp[:3], sp[:3], mq[:3], sq[:3]) + w2_squared(
            mp[3:], sp[3:], mq[3:], sq[3:]
        )
        assert whole == pytest.approx(parts)


class TestProperties:
    @settings(max_examples=50, deadline=None)
    @given(_vec, _pos, _vec, _pos)
    def test_non_negative(self, mp, sp, mq, sq):
        assert w2_squared(mp, sp, mq, sq) >= 0

    @settings(max_examples=50, deadline=None)
    @given(_vec, _pos, _vec, _pos)
    def test_symmetric(self, mp, sp, mq, sq):
        assert w2_squared(mp, sp, mq, sq) == pytest.approx(
            w2_squared(mq, sq, mp, sp)
        )

    @settings(max_examples=50, deadline=None)
    @given(_vec, _pos, _vec, _pos)
    def test_lower_bounded_by_euclidean_on_means(self, mp, sp, mq, sq):
        """§V-A: W2^2 = Euclid^2(means) + non-negative sigma term, so
        Euclidean-on-means is a W2 lower bound (the LSH surrogate)."""
        assert w2_squared(mp, sp, mq, sq) >= euclidean_sq_means(mp, mq) - 1e-9

    def test_positive_correlation_with_euclidean(self):
        """Empirical version of the §V-A claim on random Gaussians."""
        rng = np.random.default_rng(3)
        mp = rng.normal(size=(500, 8))
        mq = rng.normal(size=(500, 8))
        sp = np.abs(rng.normal(size=(500, 8))) * 0.2
        sq = np.abs(rng.normal(size=(500, 8))) * 0.2
        w2 = w2_squared(mp, sp, mq, sq)
        eu = euclidean_sq_means(mp, mq)
        assert np.corrcoef(w2, eu)[0, 1] > 0.9
