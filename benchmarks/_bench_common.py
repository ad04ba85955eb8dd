"""Shared helpers for the per-table benchmarks.

Each ``bench_tableN.py`` pre-builds the preset lakes it needs (cached
process-wide by ``repro.experiments.tables``), then benchmarks the table
harness itself with a single round (the harness already runs many Spark
jobs; statistical repetition would multiply minutes for no insight) and
prints the reproduced rows so ``bench_output.txt`` contains the tables
next to their timings.
"""
from __future__ import annotations

from repro.experiments.tables import eval_lake, format_rows

#: lake scale used by every benchmark (~2x the unit-test lakes).
BENCH_SCALE = 1.0
BENCH_SEED = 0


def prebuild(spark, names) -> None:
    """Materialise (and cache) the lakes outside the timed region."""
    for name in names:
        eval_lake(spark, name, scale=BENCH_SCALE, seed=BENCH_SEED)


def run_once(benchmark, fn):
    """Benchmark ``fn`` with one round/iteration and return its result."""
    return benchmark.pedantic(fn, rounds=1, iterations=1)


def show(title: str, rows) -> None:
    print(f"\n## {title} (scale={BENCH_SCALE}, seed={BENCH_SEED})\n")
    print(format_rows(rows))
