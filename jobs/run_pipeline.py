"""spark-submit entrypoint: run the full R2D2 pipeline on a preset lake.

Generates the requested preset lake (customer1/2/3, table_union,
kaggle), runs SGB -> MMP -> CLP, and prints per-stage edge accounting
against brute-force ground truth plus stage timings.

Usage: spark-submit jobs/run_pipeline.py [--lake customer1] [--scale 1.0]
       [--seed 0] [--s 4] [--t 10]
"""
from __future__ import annotations

import argparse

from _common import get_spark

from repro.core.pipeline import run_pipeline
from repro.experiments.tables import eval_lake


def main() -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument("--lake", default="customer1")
    p.add_argument("--scale", type=float, default=1.0)
    p.add_argument("--seed", type=int, default=0)
    p.add_argument("--s", type=int, default=4)
    p.add_argument("--t", type=int, default=10)
    args = p.parse_args()

    spark = get_spark(f"r2d2-{args.lake}")
    spark.sparkContext.setLogLevel("ERROR")
    ev = eval_lake(spark, args.lake, scale=args.scale, seed=args.seed)
    result = run_pipeline(ev.catalog, s=args.s, t=args.t, seed=args.seed)

    print(f"\nLake {args.lake}: {len(ev.catalog.names())} tables, "
          f"{ev.size_mb:.1f} MB, GT containment edges: {len(ev.content_gt.edges)}")
    for stage, acc in result.accounting(ev.content_gt.edges).items():
        print(f"  after {stage}: {acc.as_row()}  ({result.timings[stage]:.2f}s)")
    spark.stop()


if __name__ == "__main__":
    main()
