"""Run every table harness and emit the markdown blocks EXPERIMENTS.md
records. One process, one SparkSession, deterministic in --seed."""
from __future__ import annotations

import time


def main() -> None:
    from _session import build_session, common_args, parse_domains

    args = common_args("All tables").parse_args()
    spark = build_session("run_all")
    domains = parse_domains(args.domains)
    kw = dict(sf=args.sf, seed=args.seed, domains=domains)

    import table2_datasets, table4_representation, table5_matching, table7_transfer, table8_active

    for name, mod in (
        ("Table II", table2_datasets),
        ("Table IV", table4_representation),
        ("Table V+VI", table5_matching),
        ("Table VII", table7_transfer),
        ("Table VIII", table8_active),
    ):
        t0 = time.time()
        df = mod.main(spark, **kw)
        print(f"\n## {name} (sf={args.sf}, seed={args.seed}, {time.time()-t0:.0f}s)\n")
        print(df.round(3).to_markdown(index=False))


if __name__ == "__main__":
    main()
