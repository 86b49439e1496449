"""Tests for the Siamese matching model (`repro.core.siamese`, §IV)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.siamese import SiameseMatcher


def _enc_state(d=7, h=9, k=5, seed=3, scale=0.3):
    rng = np.random.default_rng(seed)
    return {
        "h_W": rng.normal(size=(d, h)) * scale,
        "h_b": rng.normal(size=h) * 0.05,
        "mu_W": rng.normal(size=(h, k)) * scale,
        "mu_b": rng.normal(size=k) * 0.05,
        "lv_W": rng.normal(size=(h, k)) * 0.05,
        "lv_b": rng.normal(size=k) * 0.05,
    }


class TestForward:
    def test_output_shape_and_range(self):
        sm = SiameseMatcher(_enc_state(), arity=3, hidden=6, seed=0)
        X = np.random.default_rng(0).normal(size=(5, 3, 7))
        p = sm.forward(X, X)
        assert p.shape == (5,)
        assert ((p > 0) & (p < 1)).all()

    def test_symmetric_in_pair_order(self):
        """The Distance layer is symmetric in (s, t), so swapping the
        sides cannot change the prediction."""
        sm = SiameseMatcher(_enc_state(), arity=3, hidden=6, seed=1)
        rng = np.random.default_rng(1)
        Xs, Xt = rng.normal(size=(2, 4, 3, 7))
        assert np.allclose(sm.forward(Xs, Xt), sm.forward(Xt, Xs))

    def test_identical_pair_distance_zero(self):
        sm = SiameseMatcher(_enc_state(), arity=2, hidden=6, seed=2)
        X = np.random.default_rng(2).normal(size=(3, 2, 7))
        sm.forward(X, X)
        assert np.allclose(sm._cache["dvec"], 0.0)

    def test_arity_mismatch_raises(self):
        sm = SiameseMatcher(_enc_state(), arity=3, hidden=6, seed=3)
        with pytest.raises(AssertionError):
            sm.forward(np.zeros((2, 4, 7)), np.zeros((2, 4, 7)))

    def test_shared_weights_initialised_from_state(self):
        state = _enc_state()
        sm = SiameseMatcher(state, arity=2, hidden=6, seed=4)
        assert np.allclose(sm.encoder.h.W, state["h_W"])
        assert np.allclose(sm.encoder.mu_head.W, state["mu_W"])


class TestLossAndGradients:
    def test_gradcheck(self):
        sm = SiameseMatcher(_enc_state(), arity=3, hidden=6, margin=0.5, seed=4)
        rng = np.random.default_rng(5)
        Xs = rng.normal(size=(4, 3, 7)) * 0.5
        Xt = Xs + rng.normal(size=(4, 3, 7)) * 0.3
        y = np.array([1.0, 0.0, 1.0, 0.0])

        def loss_at(flat):
            off = 0
            for p in sm.params:
                p[...] = flat[off : off + p.size].reshape(p.shape)
                off += p.size
            loss, _, _ = sm.loss_and_grads(Xs, Xt, y)
            return loss

        flat0 = np.concatenate([p.ravel().copy() for p in sm.params])
        loss_at(flat0)
        g = np.concatenate([gr.ravel().copy() for gr in sm.grads])
        for i in rng.choice(len(flat0), 40, replace=False):
            e = 1e-6
            fp, fm = flat0.copy(), flat0.copy()
            fp[i] += e
            fm[i] -= e
            gn = (loss_at(fp) - loss_at(fm)) / (2 * e)
            assert gn == pytest.approx(g[i], rel=1e-3, abs=1e-7)

    def test_loss_components(self):
        sm = SiameseMatcher(_enc_state(), arity=2, hidden=6, seed=5)
        rng = np.random.default_rng(6)
        X = rng.normal(size=(4, 2, 7)) * 0.3
        total, bce, contrast = sm.loss_and_grads(
            X, X + 0.1 * rng.normal(size=X.shape), np.array([1.0, 0, 1, 0])
        )
        assert total == pytest.approx(bce + contrast)
        assert bce > 0

    def test_margin_caps_negative_pressure(self):
        """Negatives already further than M contribute zero contrastive
        loss (Eq. 4's max(0, M - W2) hinge)."""
        state = _enc_state(scale=2.0)  # big weights -> large distances
        sm = SiameseMatcher(state, arity=2, hidden=6, margin=0.1, seed=6)
        rng = np.random.default_rng(7)
        Xs = rng.normal(size=(3, 2, 7)) * 3
        Xt = -Xs
        _, _, contrast = sm.loss_and_grads(Xs, Xt, np.zeros(3))
        assert contrast == pytest.approx(0.0)

    def test_positive_pairs_pull_representations_together(self):
        """Training on positive pairs only must shrink their W2."""
        sm = SiameseMatcher(_enc_state(seed=8), arity=2, hidden=6, seed=8)
        rng = np.random.default_rng(8)
        Xs = rng.normal(size=(30, 2, 7))
        Xt = rng.normal(size=(30, 2, 7))
        sm.forward(Xs, Xt)
        before = sm._cache["dvec"].sum()
        sm.fit(Xs, Xt, np.ones(30), epochs=30, seed=8)
        sm.forward(Xs, Xt)
        assert sm._cache["dvec"].sum() < before


class TestTraining:
    def test_learns_toy_duplicates(self):
        rng = np.random.default_rng(9)
        N, m, d = 150, 3, 7
        base = rng.normal(size=(N, m, d))
        Xs = np.concatenate([base, base])
        Xt = np.concatenate(
            [base + 0.05 * rng.normal(size=base.shape), rng.normal(size=base.shape)]
        )
        y = np.concatenate([np.ones(N), np.zeros(N)])
        sm = SiameseMatcher(_enc_state(seed=10), arity=m, hidden=8, seed=10)
        sm.fit(Xs, Xt, y, epochs=40, seed=10)
        acc = ((sm.predict_proba(Xs, Xt) > 0.5) == y).mean()
        assert acc > 0.95

    def test_fit_reduces_loss(self):
        rng = np.random.default_rng(11)
        Xs = rng.normal(size=(60, 2, 7))
        Xt = rng.normal(size=(60, 2, 7))
        y = (rng.random(60) > 0.5).astype(float)
        sm = SiameseMatcher(_enc_state(seed=11), arity=2, hidden=6, seed=11)
        losses = sm.fit(Xs, Xt, y, epochs=20, seed=11)
        assert losses[-1] < losses[0]

    def test_predict_chunking_consistent(self):
        sm = SiameseMatcher(_enc_state(seed=12), arity=2, hidden=6, seed=12)
        rng = np.random.default_rng(12)
        Xs = rng.normal(size=(50, 2, 7))
        Xt = rng.normal(size=(50, 2, 7))
        assert np.allclose(
            sm.predict_proba(Xs, Xt, chunk=7), sm.predict_proba(Xs, Xt, chunk=1000)
        )

    def test_deterministic_given_seed(self):
        rng = np.random.default_rng(13)
        Xs = rng.normal(size=(40, 2, 7))
        Xt = rng.normal(size=(40, 2, 7))
        y = (rng.random(40) > 0.5).astype(float)
        s1 = SiameseMatcher(_enc_state(seed=13), arity=2, hidden=6, seed=13)
        s2 = SiameseMatcher(_enc_state(seed=13), arity=2, hidden=6, seed=13)
        s1.fit(Xs, Xt, y, epochs=5, seed=13)
        s2.fit(Xs, Xt, y, epochs=5, seed=13)
        assert np.allclose(s1.predict_proba(Xs, Xt), s2.predict_proba(Xs, Xt))
