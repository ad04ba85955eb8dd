"""Benchmark + reproduction of Table 4 (schema baselines comparison)."""
from __future__ import annotations

from benchmarks._bench_common import BENCH_SCALE, BENCH_SEED, prebuild, run_once, show

from repro.experiments.tables import table4_rows

LAKES = ("customer1", "customer2")


def test_table4_schema_baselines(benchmark, spark):
    prebuild(spark, LAKES)
    rows = run_once(
        benchmark,
        lambda: table4_rows(
            spark, scale=BENCH_SCALE, seed=BENCH_SEED, lakes=LAKES
        ),
    )
    show("Table 4: schema containment baselines", rows)
    for r in rows:
        if r["Method"] == "SGB":
            assert r["Not Detected"] == 0
