"""Benchmark + reproduction of Table 5 (stage timings vs brute force).

The Ground Truth row measures the real per-edge Spark brute force, so
this is the slowest benchmark by design — that gap *is* the result.
"""
from __future__ import annotations

from benchmarks._bench_common import BENCH_SCALE, BENCH_SEED, prebuild, run_once, show

from repro.experiments.tables import table5_rows

LAKES = ("customer1", "customer2", "table_union", "kaggle")


def test_table5_timing(benchmark, spark):
    prebuild(spark, LAKES)
    rows = run_once(
        benchmark,
        lambda: table5_rows(
            spark, scale=BENCH_SCALE, seed=BENCH_SEED, lakes=LAKES,
            ground_truth_mode="spark",
        ),
    )
    show("Table 5: time taken per stage (seconds)", rows)
    by = {r["Method"]: r for r in rows}
    # At MB scale both sides are bounded below by per-job Spark overhead
    # (the paper's days-vs-hours gap comes from row-scan asymmetry that
    # grows with data size), so assert the aggregate ordering.
    ours = sum(by["Ours (Total)"][lake] for lake in LAKES)
    gt = sum(by["Ground Truth"][lake] for lake in LAKES)
    assert ours < gt
    for lake in LAKES:
        assert by["SGB"][lake] < by["CLP"][lake]
