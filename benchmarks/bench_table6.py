"""Benchmark: Table VI training-time measurement run.

The benchmark wall-clock *is* the experiment here: Table VI reports the
training cost of the Table V models, so this measures one domain's
full train-everything sweep and asserts VAER's matcher trains faster
than the heaviest baseline (the paper's cost-ordering claim).
"""
from __future__ import annotations

from benchmarks.conftest import SF_BENCH
from repro.experiments.tables import table5_table6_matching


def test_bench_table6_times(benchmark, spark, bench_cfg):
    df = benchmark.pedantic(
        lambda: table5_table6_matching(
            spark, sf=SF_BENCH, domains=("citations1",), cfg=bench_cfg
        ),
        rounds=1,
        iterations=1,
    )
    row = df.iloc[0]
    assert row["vaer_match_s"] < row["deepmatcher_s"]
