"""Benchmark + reproduction of Table 6 (CLP parameter sweep s x t)."""
from __future__ import annotations

from benchmarks._bench_common import BENCH_SCALE, BENCH_SEED, prebuild, run_once, show

from repro.experiments.tables import table6_rows


def test_table6_clp_params(benchmark, spark):
    prebuild(spark, ("customer2",))
    rows = run_once(
        benchmark,
        lambda: table6_rows(
            spark, scale=BENCH_SCALE, seed=BENCH_SEED, lake_name="customer2"
        ),
    )
    show("Table 6: incorrect edges remaining per (s, t)", rows)
    for r in rows:
        assert r["30"] <= r["5"]
