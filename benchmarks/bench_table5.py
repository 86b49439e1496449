"""Benchmark: Table V supervised matching (VAER vs baseline lites)."""
from __future__ import annotations

from benchmarks.conftest import BENCH_DOMAINS, SF_BENCH
from repro.experiments.tables import table5_table6_matching


def test_bench_table5_matching(benchmark, spark, bench_cfg):
    df = benchmark.pedantic(
        lambda: table5_table6_matching(
            spark, sf=SF_BENCH, domains=BENCH_DOMAINS, cfg=bench_cfg
        ),
        rounds=1,
        iterations=1,
    )
    assert {"vaer_F1", "deeper_F1", "deepmatcher_F1", "ditto_F1"} <= set(df.columns)
