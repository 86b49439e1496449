"""Benchmark: Table IV representation learning (raw IR vs VAER @K=10)."""
from __future__ import annotations

from benchmarks.conftest import BENCH_DOMAINS, SF_BENCH
from repro.experiments.tables import table4_representation


def test_bench_table4_representation(benchmark, spark, bench_cfg):
    df = benchmark.pedantic(
        lambda: table4_representation(
            spark,
            sf=SF_BENCH,
            domains=BENCH_DOMAINS,
            kinds=("lsa", "bert"),
            cfg=bench_cfg,
        ),
        rounds=1,
        iterations=1,
    )
    assert len(df) == len(BENCH_DOMAINS) * 2
    assert (df["R_vaer"] > 0).any()
