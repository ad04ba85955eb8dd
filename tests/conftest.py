"""Shared fixtures: small Parquet-backed lakes and catalog builders.

The expensive artifacts (generated lakes plus their brute-force ground
truth) are session-scoped so the whole suite reuses them; pure-python
tests take plain dict/graph inputs and never touch Spark.
"""
from __future__ import annotations

import pandas as pd
import pytest

from repro.groundtruth.content_gt import ground_truth_content_pandas
from repro.groundtruth.schema_gt import ground_truth_schema_graph
from repro.lake.catalog import Catalog
from repro.lake.generator import LakeSpec, generate_lake


@pytest.fixture(scope="session")
def small_lake(spark, tmp_path_factory):
    """A small Parquet-backed lake with mixed transformations."""
    root = str(tmp_path_factory.mktemp("small_lake"))
    spec = LakeSpec(
        name="small", n_roots=4, n_derived=12, root_rows=(120, 350), seed=7
    )
    return generate_lake(spark, spec, root)


@pytest.fixture(scope="session")
def small_lake_gt(small_lake):
    """(schema GT, content GT) for ``small_lake``."""
    schema_gt = ground_truth_schema_graph(small_lake.catalog.schemas())
    content_gt = ground_truth_content_pandas(
        small_lake.frames, schema_gt.graph
    )
    return schema_gt, content_gt


@pytest.fixture()
def make_catalog(spark):
    """Factory: build an in-memory Catalog from pandas frames."""

    def _make(frames: dict[str, pd.DataFrame]) -> Catalog:
        cat = Catalog(spark=spark)
        for name, pdf in frames.items():
            cat.add_frame(name, spark.createDataFrame(pdf))
        return cat

    return _make


@pytest.fixture()
def make_parquet_catalog(spark, tmp_path):
    """Factory: build a Parquet-backed Catalog from pandas frames."""

    def _make(frames: dict[str, pd.DataFrame]) -> Catalog:
        cat = Catalog(spark=spark)
        for name, pdf in frames.items():
            cat.add_parquet(name, spark.createDataFrame(pdf), str(tmp_path))
        return cat

    return _make
