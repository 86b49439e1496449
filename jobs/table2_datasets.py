"""spark-submit entrypoint for Table II (dataset statistics)."""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.experiments.tables import ALL_DOMAINS, table2_datasets


def main(spark: SparkSession, *, sf: float = 0.25, seed: int = 0, domains=None):
    return table2_datasets(spark, sf=sf, seed=seed, domains=domains or ALL_DOMAINS)


if __name__ == "__main__":
    from _session import build_session, common_args, parse_domains

    args = common_args("Table II: dataset statistics").parse_args()
    spark = build_session("table2")
    df = main(spark, sf=args.sf, seed=args.seed, domains=parse_domains(args.domains))
    print(df.to_string(index=False))
