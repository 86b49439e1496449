"""spark-submit entrypoint for Table VII (representation transferability).

Trains the representation model on Citations 2 and reuses it, untrained,
on every other domain; reports recall@10 and matching F1 deltas against
locally trained representation models.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.experiments.tables import table7_transfer


def main(spark: SparkSession, *, sf: float = 0.25, seed: int = 0, domains=None):
    kw = {"domains": domains} if domains else {}
    return table7_transfer(spark, sf=sf, seed=seed, **kw)


if __name__ == "__main__":
    from _session import build_session, common_args, parse_domains

    args = common_args("Table VII: transferability").parse_args()
    spark = build_session("table7")
    df = main(spark, sf=args.sf, seed=args.seed, domains=parse_domains(args.domains))
    print(df.round(2).to_string(index=False))
