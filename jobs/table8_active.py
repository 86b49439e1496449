"""spark-submit entrypoint for Table VIII (active learning).

Bootstrap (Algorithm 1) vs A-budget actively labeled (Algorithm 2) vs
full supervised training; the 250-label budget of the paper scales with
``sf`` so the Training%% ratios are preserved.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.experiments.tables import ALL_DOMAINS, table8_active_learning


def main(spark: SparkSession, *, sf: float = 0.25, seed: int = 0, domains=None):
    return table8_active_learning(
        spark, sf=sf, seed=seed, domains=domains or ALL_DOMAINS
    )


if __name__ == "__main__":
    from _session import build_session, common_args, parse_domains

    args = common_args("Table VIII: active learning").parse_args()
    spark = build_session("table8")
    df = main(spark, sf=args.sf, seed=args.seed, domains=parse_domains(args.domains))
    print(df.round(2).to_string(index=False))
