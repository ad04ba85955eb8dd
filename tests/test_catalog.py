"""Tests for the lake catalog substrate."""
from __future__ import annotations

import os

import pandas as pd
import pytest

from repro.lake.catalog import Catalog


@pytest.fixture()
def pdf():
    return pd.DataFrame({"a": [1.0, 2.0, 3.0], "b": ["x", "y", "z"]})


class TestParquetBacked:
    def test_roundtrip_registration(self, spark, tmp_path, pdf):
        cat = Catalog(spark=spark)
        meta = cat.add_parquet("t", spark.createDataFrame(pdf), str(tmp_path))
        assert meta.num_rows == 3
        assert meta.schema_set == {"a", "b"}
        assert meta.size_bytes > 0
        assert os.path.isdir(meta.path)

    def test_df_reads_back_same_rows(self, spark, tmp_path, pdf):
        cat = Catalog(spark=spark)
        cat.add_parquet("t", spark.createDataFrame(pdf), str(tmp_path))
        got = cat.df("t").toPandas().sort_values("a").reset_index(drop=True)
        pd.testing.assert_frame_equal(got, pdf, check_dtype=False)

    def test_provenance_stored(self, spark, tmp_path, pdf):
        cat = Catalog(spark=spark)
        cat.add_parquet(
            "t", spark.createDataFrame(pdf), str(tmp_path),
            provenance=("filter", "src"),
        )
        assert cat.meta("t").provenance == ("filter", "src")

    def test_total_bytes_sums(self, spark, tmp_path, pdf):
        cat = Catalog(spark=spark)
        cat.add_parquet("t1", spark.createDataFrame(pdf), str(tmp_path))
        cat.add_parquet("t2", spark.createDataFrame(pdf), str(tmp_path))
        assert cat.total_bytes() == (
            cat.meta("t1").size_bytes + cat.meta("t2").size_bytes
        )


class TestFrameBacked:
    def test_add_frame_metadata(self, spark, pdf):
        cat = Catalog(spark=spark)
        meta = cat.add_frame("t", spark.createDataFrame(pdf))
        assert meta.path is None
        assert meta.num_rows == 3
        assert meta.size_bytes > 0

    def test_names_sorted(self, spark, pdf):
        cat = Catalog(spark=spark)
        sdf = spark.createDataFrame(pdf)
        for n in ("zeta", "alpha", "mid"):
            cat.add_frame(n, sdf)
        assert cat.names() == ["alpha", "mid", "zeta"]

    def test_schemas_map(self, spark, pdf):
        cat = Catalog(spark=spark)
        cat.add_frame("t", spark.createDataFrame(pdf))
        assert cat.schemas() == {"t": frozenset({"a", "b"})}
