"""spark-submit entrypoint for Table VI (training times, seconds).

Shares its measurement run with Table V — the paper's Table VI reports
the wall-clock training cost of exactly the Table V models.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.experiments.tables import ALL_DOMAINS, table5_table6_matching


def main(spark: SparkSession, *, sf: float = 0.25, seed: int = 0, domains=None):
    df = table5_table6_matching(
        spark, sf=sf, seed=seed, domains=domains or ALL_DOMAINS
    )
    cols = ["domain"] + [c for c in df.columns if c.endswith("_s")]
    return df[cols]


if __name__ == "__main__":
    from _session import build_session, common_args, parse_domains

    args = common_args("Table VI: training times").parse_args()
    spark = build_session("table6")
    df = main(spark, sf=args.sf, seed=args.seed, domains=parse_domains(args.domains))
    print(df.round(2).to_string(index=False))
