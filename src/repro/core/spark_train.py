"""Data-parallel VAE training over a Spark IR DataFrame.

Each epoch broadcasts the current parameters, computes per-partition
gradient sums with `mapInPandas` (the full-batch gradient is the
sample-count-weighted mean of partition means), and applies one Adam
step on the driver — a classic synchronous parameter-server round
expressed in the DataFrame API.

The driver-local minibatch `VAE.fit` converges faster per second at this
repo's scales (the nets are tiny, so per-epoch job latency dominates);
`fit_spark` exists because Table II's largest inputs (64k tuples) are
exactly the case where collected-matrix training stops scaling. Both
paths optimise the same Eq. 2 objective — a test asserts they agree on
the gradient.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.core.vae import VAE


def _flatten(arrs: list[np.ndarray]) -> np.ndarray:
    return np.concatenate([a.ravel() for a in arrs])


def _unflatten(flat: np.ndarray, like: list[np.ndarray]) -> list[np.ndarray]:
    out, off = [], 0
    for a in like:
        out.append(flat[off : off + a.size].reshape(a.shape))
        off += a.size
    return out


def partition_gradient(
    state: dict[str, np.ndarray],
    dims: tuple[int, int, int],
    X: np.ndarray,
    rng: np.random.Generator,
) -> tuple[np.ndarray, float, int]:
    """(grad_sum_flat, loss_sum, n) for one partition's IR rows."""
    vae = VAE(*dims, seed=0)
    vae.load_state(state)
    loss, _, _ = vae.loss_and_grads(X, rng)
    n = len(X)
    return _flatten(vae.grads) * n, loss * n, n


def fit_spark(
    irs_df: DataFrame,
    vae: VAE,
    *,
    epochs: int = 10,
    lr: float = 1e-3,
    seed: int = 0,
) -> list[float]:
    """Full-batch distributed training of ``vae`` in place.

    ``irs_df`` is the `build_irs` output; every attribute-value IR of
    every tuple is one training sample, exactly as in `VAE.fit`.
    """
    from repro.nn.adam import Adam

    spark = irs_df.sparkSession
    sc = spark.sparkContext
    dims = (vae.in_dim, vae.hidden_dim, vae.latent_dim)
    flat = irs_df.select("irs").cache()
    opt = Adam(vae.params, lr=lr)
    losses = []
    try:
        for epoch in range(epochs):
            b_state = sc.broadcast(vae.state())

            def part(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
                from pyspark import TaskContext

                pid = TaskContext.get().partitionId() if TaskContext.get() else 0
                rng = np.random.default_rng((seed, epoch, pid))
                rows = []
                for pdf in it:
                    if len(pdf):
                        rows.append(
                            np.stack([np.stack(r) for r in pdf["irs"]])
                        )
                if not rows:
                    return
                irs = np.concatenate(rows)
                n, m, d = irs.shape
                g, loss, cnt = partition_gradient(
                    b_state.value, dims, irs.reshape(n * m, d), rng
                )
                yield pd.DataFrame({"g": [g], "loss": [loss], "n": [cnt]})

            parts = flat.mapInPandas(
                part, schema="g array<double>, loss double, n long"
            ).collect()
            b_state.unpersist()
            total_n = sum(r["n"] for r in parts)
            grad = sum(np.asarray(r["g"]) for r in parts) / total_n
            loss = sum(r["loss"] for r in parts) / total_n
            opt.step(_unflatten(grad, vae.params))
            losses.append(float(loss))
    finally:
        flat.unpersist()
    return losses
