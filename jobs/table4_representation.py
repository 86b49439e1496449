"""spark-submit entrypoint for Table IV (representation learning P/R/F1).

Compares raw-IR top-10 nearest-neighbour search against VAER latent
representations for each of the four IR kinds, per domain.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.experiments.tables import ALL_DOMAINS, table4_representation


def main(
    spark: SparkSession,
    *,
    sf: float = 0.25,
    seed: int = 0,
    domains=None,
    kinds=("lsa", "w2v", "bert", "embdi"),
):
    return table4_representation(
        spark, sf=sf, seed=seed, domains=domains or ALL_DOMAINS, kinds=kinds
    )


if __name__ == "__main__":
    from _session import build_session, common_args, parse_domains

    p = common_args("Table IV: representation learning")
    p.add_argument("--kinds", type=str, default="lsa,w2v,bert,embdi")
    args = p.parse_args()
    spark = build_session("table4")
    df = main(
        spark,
        sf=args.sf,
        seed=args.seed,
        domains=parse_domains(args.domains),
        kinds=tuple(args.kinds.split(",")),
    )
    print(df.round(2).to_string(index=False))
