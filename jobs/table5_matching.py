"""spark-submit entrypoint for Table V (matching effectiveness).

Runs VAER^LSA and the three baseline lites per domain; Table VI's
training times come from the same runs (see jobs/table6_times.py).
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.experiments.tables import ALL_DOMAINS, table5_table6_matching


def main(spark: SparkSession, *, sf: float = 0.25, seed: int = 0, domains=None):
    return table5_table6_matching(
        spark, sf=sf, seed=seed, domains=domains or ALL_DOMAINS
    )


if __name__ == "__main__":
    from _session import build_session, common_args, parse_domains

    args = common_args("Table V: supervised matching").parse_args()
    spark = build_session("table5")
    df = main(spark, sf=args.sf, seed=args.seed, domains=parse_domains(args.domains))
    prf_cols = ["domain"] + [c for c in df.columns if c.endswith(("_P", "_R", "_F1"))]
    time_cols = ["domain"] + [c for c in df.columns if c.endswith("_s")]
    print("# Table V (effectiveness)")
    print(df[prf_cols].round(2).to_string(index=False))
    print("\n# Table VI (training seconds, same run)")
    print(df[time_cols].round(2).to_string(index=False))
