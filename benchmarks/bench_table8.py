"""Benchmark: Table VIII active learning (bootstrap -> AL -> full)."""
from __future__ import annotations

from benchmarks.conftest import SF_BENCH
from repro.experiments.tables import table8_active_learning


def test_bench_table8_active(benchmark, spark, bench_cfg):
    df = benchmark.pedantic(
        lambda: table8_active_learning(
            spark, sf=SF_BENCH, domains=("restaurants",), cfg=bench_cfg
        ),
        rounds=1,
        iterations=1,
    )
    row = df.iloc[0]
    assert row["boot_pos"] > 0
    assert 0 <= row["al_F1"] <= 1
