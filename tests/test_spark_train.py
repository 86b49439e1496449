"""Tests for the data-parallel VAE trainer (`repro.core.spark_train`)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.core.spark_train import _flatten, _unflatten, fit_spark, partition_gradient
from repro.core.vae import VAE


class TestFlatten:
    def test_roundtrip(self):
        arrs = [np.arange(6).reshape(2, 3).astype(float), np.ones(4)]
        back = _unflatten(_flatten(arrs), arrs)
        assert all(np.array_equal(a, b) for a, b in zip(arrs, back))


class TestPartitionGradient:
    def test_weighted_sum_matches_local(self):
        """Two partition gradients, combined by count, must equal the
        single full-batch gradient — the correctness core of fit_spark."""
        rng = np.random.default_rng(0)
        X = rng.normal(size=(20, 5))
        dims = (5, 8, 3)

        class _Fixed:
            def __init__(self, eps):
                self.eps = eps

            def standard_normal(self, shape):
                n = int(np.prod(shape))
                return self.eps[:n].reshape(shape)

        eps = rng.normal(size=(2000,))
        vae = VAE(*dims, seed=1)
        state = vae.state()
        g1, l1, n1 = partition_gradient(state, dims, X[:8], _Fixed(eps[:40].repeat(10)))
        g2, l2, n2 = partition_gradient(state, dims, X[8:], _Fixed(eps[40:].copy()))
        # Full-batch reference with eps stitched per sample order
        stitched = np.concatenate(
            [eps[:40].repeat(10)[: 8 * 3].reshape(8, 3), eps[40:][: 12 * 3].reshape(12, 3)]
        )
        ref = VAE(*dims, seed=2)
        ref.load_state(state)
        loss_ref, _, _ = ref.loss_and_grads(X, _Fixed(stitched.ravel()))
        g_ref = _flatten(ref.grads)
        assert (g1 + g2) / (n1 + n2) == pytest.approx(g_ref, rel=1e-9)
        assert (l1 + l2) / (n1 + n2) == pytest.approx(loss_ref, rel=1e-9)


class TestFitSpark:
    @pytest.fixture(scope="class")
    def irs_df(self, spark):
        rng = np.random.default_rng(3)
        rows = [
            {"id": i, "table": "a", "irs": rng.normal(size=(2, 5)).tolist()}
            for i in range(60)
        ]
        return spark.createDataFrame(pd.DataFrame(rows)).repartition(4)

    def test_loss_decreases(self, irs_df):
        vae = VAE(5, 8, 3, seed=4)
        losses = fit_spark(irs_df, vae, epochs=8, lr=5e-3, seed=4)
        assert len(losses) == 8
        assert losses[-1] < losses[0]

    def test_updates_parameters(self, irs_df):
        vae = VAE(5, 8, 3, seed=5)
        before = [p.copy() for p in vae.params]
        fit_spark(irs_df, vae, epochs=2, seed=5)
        assert any(not np.allclose(b, p) for b, p in zip(before, vae.params))

    def test_encodes_after_training(self, irs_df):
        vae = VAE(5, 8, 3, seed=6)
        fit_spark(irs_df, vae, epochs=2, seed=6)
        mu, sigma = vae.encode(np.zeros((2, 5)))
        assert np.isfinite(mu).all() and (sigma > 0).all()
