"""Benchmark: Table VII transferability (local vs transferred repr.)."""
from __future__ import annotations

from benchmarks.conftest import SF_BENCH
from repro.experiments.tables import table7_transfer


def test_bench_table7_transfer(benchmark, spark, bench_cfg):
    df = benchmark.pedantic(
        lambda: table7_transfer(
            spark, sf=SF_BENCH, domains=("restaurants",), cfg=bench_cfg
        ),
        rounds=1,
        iterations=1,
    )
    assert {"recall_local", "recall_transf", "f1_delta"} <= set(df.columns)
