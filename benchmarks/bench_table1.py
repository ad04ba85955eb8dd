"""Benchmark + reproduction of Table 1 (enterprise edge accounting)."""
from __future__ import annotations

from benchmarks._bench_common import BENCH_SCALE, BENCH_SEED, prebuild, run_once, show

from repro.experiments.tables import ENTERPRISE, table1_rows


def test_table1_enterprise(benchmark, spark):
    prebuild(spark, ENTERPRISE)
    rows = run_once(
        benchmark,
        lambda: table1_rows(spark, scale=BENCH_SCALE, seed=BENCH_SEED),
    )
    show("Table 1: enterprise data results", rows)
    for r in rows:
        if r["Number of edges"] == "Not detected":
            assert r["Graph after CLP"] == 0
