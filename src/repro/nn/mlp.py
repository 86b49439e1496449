"""Binary MLP classifier on the numpy substrate.

Used as the *Matching* layer of VAER's Siamese architecture (a two-layer
MLP per §IV-A) and as the classifier head of the baseline lites.
Exposes forward/backward so a caller (the Siamese trainer) can push
gradients through it into an upstream encoder.
"""
from __future__ import annotations

import numpy as np

from repro.nn.adam import Adam
from repro.nn.layers import Dense, relu, relu_grad, sigmoid


class MLPClassifier:
    """``in_dim -> hidden (ReLU) -> ... -> 1 (sigmoid)`` binary classifier."""

    def __init__(self, in_dim: int, hidden: tuple[int, ...] = (64,), seed: int = 0):
        rng = np.random.default_rng(seed)
        dims = [in_dim, *hidden, 1]
        self.layers = [Dense(a, b, rng) for a, b in zip(dims[:-1], dims[1:])]
        self._pre: list[np.ndarray] = []

    # ---- forward / backward -------------------------------------------------
    def forward(self, x: np.ndarray) -> np.ndarray:
        """Return P(match) of shape ``(batch,)``; caches for backward."""
        self._pre = []
        h = x
        for layer in self.layers[:-1]:
            z = layer.forward(h)
            self._pre.append(z)
            h = relu(z)
        logits = self.layers[-1].forward(h)
        return sigmoid(logits[:, 0])

    def backward_from_logit_grad(self, glogit: np.ndarray) -> np.ndarray:
        """Backprop dL/dlogit (shape ``(batch,)``) and return dL/dinput."""
        g = self.layers[-1].backward(glogit[:, None])
        for layer, z in zip(reversed(self.layers[:-1]), reversed(self._pre)):
            g = layer.backward(g * relu_grad(z))
        return g

    def backward_bce(self, p: np.ndarray, y: np.ndarray) -> np.ndarray:
        """Backprop mean binary cross-entropy; returns dL/dinput.

        With a sigmoid output, dBCE/dlogit = (p - y) / batch.
        """
        return self.backward_from_logit_grad((p - y) / len(y))

    # ---- training -----------------------------------------------------------
    @property
    def params(self) -> list[np.ndarray]:
        return [p for layer in self.layers for p in layer.params]

    @property
    def grads(self) -> list[np.ndarray]:
        return [g for layer in self.layers for g in layer.grads]

    def fit(
        self,
        X: np.ndarray,
        y: np.ndarray,
        *,
        epochs: int = 100,
        lr: float = 1e-3,
        batch_size: int = 64,
        seed: int = 0,
    ) -> list[float]:
        """Plain minibatch Adam training; returns per-epoch mean BCE."""
        rng = np.random.default_rng(seed)
        opt = Adam(self.params, lr=lr)
        losses = []
        n = len(X)
        for _ in range(epochs):
            order = rng.permutation(n)
            epoch_loss = 0.0
            for start in range(0, n, batch_size):
                idx = order[start : start + batch_size]
                p = self.forward(X[idx])
                p_c = np.clip(p, 1e-12, 1 - 1e-12)
                yb = y[idx]
                epoch_loss += float(
                    -(yb * np.log(p_c) + (1 - yb) * np.log(1 - p_c)).sum()
                )
                self.backward_bce(p, yb)
                opt.step(self.grads)
            losses.append(epoch_loss / n)
        return losses

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        return self.forward(X)
