"""Adam optimizer (Kingma & Ba) over lists of parameter arrays.

The paper's Table III fixes Adam with learning rate 0.001 for both the
representation and matching models; those are the defaults here.
"""
from __future__ import annotations

import numpy as np


class Adam:
    """Standard Adam with bias correction.

    Parameters are updated in place so that layer objects holding the
    same arrays see the new values without re-wiring.
    """

    def __init__(
        self,
        params: list[np.ndarray],
        lr: float = 1e-3,
        beta1: float = 0.9,
        beta2: float = 0.999,
        eps: float = 1e-8,
    ):
        self.params = params
        self.lr = lr
        self.beta1 = beta1
        self.beta2 = beta2
        self.eps = eps
        self.m = [np.zeros_like(p) for p in params]
        self.v = [np.zeros_like(p) for p in params]
        self.t = 0

    def step(self, grads: list[np.ndarray]) -> None:
        """One Adam update given gradients aligned with ``self.params``."""
        assert len(grads) == len(self.params)
        self.t += 1
        b1, b2 = self.beta1, self.beta2
        for p, g, m, v in zip(self.params, grads, self.m, self.v):
            m *= b1
            m += (1 - b1) * g
            v *= b2
            v += (1 - b2) * g * g
            mhat = m / (1 - b1**self.t)
            vhat = v / (1 - b2**self.t)
            p -= self.lr * mhat / (np.sqrt(vhat) + self.eps)
