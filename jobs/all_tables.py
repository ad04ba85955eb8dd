"""Run every table harness in one process and emit the markdown blocks.

Shares the lake cache across tables, so this is the cheapest way to
regenerate the full ``EXPERIMENTS.md`` measurement section:

    spark-submit jobs/all_tables.py --scale 1.0 > results.md
"""
from __future__ import annotations

from _common import get_spark, parse_args

from repro.experiments import tables as T


def main() -> None:
    args = parse_args("All tables")
    spark = get_spark("r2d2-all-tables")
    spark.sparkContext.setLogLevel("ERROR")
    sc, seed = args.scale, args.seed
    sections = [
        ("Table 1: enterprise data results",
         T.table1_rows(spark, scale=sc, seed=seed)),
        ("Table 2: synthetic data results",
         T.table2_rows(spark, scale=sc, seed=seed)),
        ("Table 3: pairwise row-level operations",
         T.table3_rows(spark, scale=sc, seed=seed)),
        ("Table 4: schema containment baselines",
         T.table4_rows(spark, scale=sc, seed=seed)),
        ("Table 5: time taken per stage (seconds)",
         T.table5_rows(spark, scale=sc, seed=seed)),
        ("Table 6: incorrect edges remaining per (s, t)",
         T.table6_rows(spark, scale=sc, seed=seed)),
        ("Table 7: optimization results",
         T.table7_rows(spark, scale=sc, seed=seed)),
    ]
    for title, rows in sections:
        print(f"\n### {title} (scale={sc}, seed={seed})\n")
        print(T.format_rows(rows))
    spark.stop()


if __name__ == "__main__":
    main()
