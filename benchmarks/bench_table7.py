"""Benchmark + reproduction of Table 7 (OPT-RET optimization results)."""
from __future__ import annotations

from benchmarks._bench_common import BENCH_SCALE, BENCH_SEED, prebuild, run_once, show

from repro.experiments.tables import table7_rows

LAKES = ("customer1", "customer2")


def test_table7_optimization(benchmark, spark):
    prebuild(spark, LAKES)
    rows = run_once(
        benchmark,
        lambda: table7_rows(
            spark, scale=BENCH_SCALE, seed=BENCH_SEED, lakes=LAKES
        ),
    )
    show("Table 7: optimization results", rows)
    for r in rows:
        assert r["Deletion Nodes"] + r["Retention Nodes"] > 0
