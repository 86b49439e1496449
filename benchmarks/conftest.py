"""Benchmark fixtures: a reduced VAER configuration + bench scale.

Benchmarks run each table harness once (pedantic, 1 round): the
interesting number is end-to-end wall-clock per table at SF_BENCH, not
micro-op variance.
"""
from __future__ import annotations

import pytest

from repro.core.config import VaerConfig

SF_BENCH = 0.08
BENCH_DOMAINS = ("restaurants", "beer")


@pytest.fixture(scope="session")
def bench_cfg() -> VaerConfig:
    return VaerConfig(
        ir_dim=32,
        vae_hidden_dim=64,
        vae_latent_dim=16,
        vae_epochs=10,
        match_min_steps=600,
        match_max_epochs=200,
        kde_samples_per_pair=50,
    )
