"""Tests for the Parquet-footer statistics substrate (§4.2 metadata)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.lake.parquet_stats import (
    stats_from_parquet_metadata,
    stats_via_spark,
)


@pytest.fixture(scope="module")
def numeric_pdf():
    g = np.random.default_rng(42)
    return pd.DataFrame(
        {
            "i": g.integers(-50, 1000, 500),
            "f": np.round(g.uniform(-3.5, 99.5, 500), 4),
            "ts": pd.Timestamp("2021-06-01")
            + pd.to_timedelta(g.integers(0, 365, 500), unit="D"),
            "s": g.choice(["apple", "pear", "zebra"], 500),
        }
    )


@pytest.fixture(scope="module")
def parquet_path(spark, numeric_pdf, tmp_path_factory):
    path = str(tmp_path_factory.mktemp("pq") / "t")
    # INT96 (Spark's default) stores no footer stats for timestamps.
    spark.conf.set("spark.sql.parquet.outputTimestampType", "TIMESTAMP_MICROS")
    spark.createDataFrame(numeric_pdf).repartition(4).write.parquet(path)
    return path


class TestFooterStats:
    def test_int_min_max(self, parquet_path, numeric_pdf):
        stats = stats_from_parquet_metadata(parquet_path)
        assert stats["i"].min == numeric_pdf["i"].min()
        assert stats["i"].max == numeric_pdf["i"].max()

    def test_float_min_max(self, parquet_path, numeric_pdf):
        stats = stats_from_parquet_metadata(parquet_path)
        assert stats["f"].min == pytest.approx(numeric_pdf["f"].min())
        assert stats["f"].max == pytest.approx(numeric_pdf["f"].max())

    def test_timestamp_min_max(self, parquet_path, numeric_pdf):
        stats = stats_from_parquet_metadata(parquet_path)
        assert pd.Timestamp(stats["ts"].min) == numeric_pdf["ts"].min()
        assert pd.Timestamp(stats["ts"].max) == numeric_pdf["ts"].max()

    def test_all_columns_reported(self, parquet_path, numeric_pdf):
        stats = stats_from_parquet_metadata(parquet_path)
        assert set(stats) == set(numeric_pdf.columns)

    def test_agrees_with_spark_aggregation(self, spark, parquet_path):
        footer = stats_from_parquet_metadata(parquet_path)
        agg = stats_via_spark(spark.read.parquet(parquet_path))
        for c in ("i", "f"):
            assert footer[c].min == agg[c].min
            assert footer[c].max == agg[c].max

    def test_multifile_table_folds_across_files(
        self, spark, numeric_pdf, tmp_path
    ):
        # Two disjoint halves written as separate files under one dir:
        # folded stats must span both.
        lo = numeric_pdf.assign(i=numeric_pdf["i"] - 10_000)
        hi = numeric_pdf.assign(i=numeric_pdf["i"] + 10_000)
        path = str(tmp_path / "t2")
        spark.createDataFrame(pd.concat([lo, hi])).repartition(3).write.parquet(
            path
        )
        stats = stats_from_parquet_metadata(path)
        assert stats["i"].min == lo["i"].min()
        assert stats["i"].max == hi["i"].max()


class TestSparkStats:
    def test_matches_pandas_min_max(self, spark, numeric_pdf):
        stats = stats_via_spark(spark.createDataFrame(numeric_pdf))
        assert stats["i"].min == numeric_pdf["i"].min()
        assert stats["i"].max == numeric_pdf["i"].max()
        assert stats["f"].min == pytest.approx(numeric_pdf["f"].min())

    def test_matches_duckdb_oracle(self, spark, numeric_pdf):
        """Min/max agg cross-checked against the DuckDB oracle."""
        from pyspark.sql import functions as F

        from repro.oracle import assert_equivalent

        sdf = spark.createDataFrame(numeric_pdf[["i", "f"]])
        got = sdf.agg(
            F.min("i").alias("min_i"),
            F.max("i").alias("max_i"),
            F.min("f").alias("min_f"),
            F.max("f").alias("max_f"),
        )
        assert_equivalent(
            got,
            "SELECT min(i) AS min_i, max(i) AS max_i, "
            "min(f) AS min_f, max(f) AS max_f FROM t",
            t=numeric_pdf[["i", "f"]],
        )

    def test_null_only_column_is_none(self, spark):
        pdf = pd.DataFrame({"x": [None, None]}, dtype="float64")
        stats = stats_via_spark(spark.createDataFrame(pdf))
        assert stats["x"].min is None
        assert stats["x"].max is None

    def test_single_row(self, spark):
        stats = stats_via_spark(
            spark.createDataFrame(pd.DataFrame({"v": [7.0]}))
        )
        assert stats["v"].min == 7.0
        assert stats["v"].max == 7.0
