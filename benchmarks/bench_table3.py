"""Benchmark + reproduction of Table 3 (pairwise operation counts)."""
from __future__ import annotations

from benchmarks._bench_common import BENCH_SCALE, BENCH_SEED, prebuild, run_once, show

from repro.experiments.tables import table3_rows

LAKES = ("customer2", "customer1", "kaggle", "table_union")


def test_table3_opcounts(benchmark, spark):
    prebuild(spark, LAKES)
    rows = run_once(
        benchmark,
        lambda: table3_rows(
            spark, scale=BENCH_SCALE, seed=BENCH_SEED, lakes=LAKES
        ),
    )
    show("Table 3: pairwise row-level operations", rows)
    by = {r["Method"]: r for r in rows}
    for lake in LAKES:
        assert by["Ground Truth Content"][lake] > by["CLP"][lake]
