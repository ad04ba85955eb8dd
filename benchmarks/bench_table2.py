"""Benchmark + reproduction of Table 2 (synthetic edge accounting)."""
from __future__ import annotations

from benchmarks._bench_common import BENCH_SCALE, BENCH_SEED, prebuild, run_once, show

from repro.experiments.tables import SYNTHETIC, table2_rows


def test_table2_synthetic(benchmark, spark):
    prebuild(spark, SYNTHETIC)
    rows = run_once(
        benchmark,
        lambda: table2_rows(spark, scale=BENCH_SCALE, seed=BENCH_SEED),
    )
    show("Table 2: synthetic data results", rows)
    for r in rows:
        if r["Number of edges"] == "Not detected":
            assert r["Graph after CLP"] == 0
