"""Benchmark: Table II dataset generation across all nine domains."""
from __future__ import annotations

from benchmarks.conftest import SF_BENCH
from repro.experiments.tables import table2_datasets


def test_bench_table2_datasets(benchmark, spark):
    df = benchmark.pedantic(
        lambda: table2_datasets(spark, sf=SF_BENCH), rounds=1, iterations=1
    )
    assert len(df) == 9
