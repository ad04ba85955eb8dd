"""Tests for the data-lake generator substrate (§6.1.1 transformations)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.groundtruth.content_gt import containment_fraction_pandas
from repro.lake.generator import (
    LakeSpec,
    column_kind,
    generate_lake,
    preset,
)


class TestColumnKinds:
    @pytest.mark.parametrize(
        "name, kind",
        [
            ("id", "int"),
            ("user_id", "int"),
            ("timestamp", "datetime"),
            ("created_at", "datetime"),
            ("status", "category"),
            ("region", "category"),
            ("value", "float"),
            ("price", "float"),
        ],
    )
    def test_kinds(self, name, kind):
        assert column_kind(name) == kind

    def test_kinds_stable_across_tables(self):
        # Shared typing is what makes cross-table joins on common
        # columns valid.
        assert column_kind("amount") == column_kind("amount")


class TestGeneratedLake:
    def test_table_counts(self, small_lake):
        spec = small_lake.spec
        names = small_lake.catalog.names()
        n_roots = sum(1 for n in names if "_root" in n or "_sroot" in n)
        n_derived = sum(1 for n in names if "_d0" in n or "_d1" in n)
        assert n_roots >= spec.n_roots
        assert n_derived == spec.n_derived

    def test_all_tables_parquet_backed(self, small_lake):
        for name in small_lake.catalog.names():
            meta = small_lake.catalog.meta(name)
            assert meta.path is not None
            assert meta.size_bytes > 0
            assert meta.num_rows > 0 or "d0" in name

    def test_row_counts_match_frames(self, small_lake):
        for name, pdf in small_lake.frames.items():
            assert small_lake.catalog.meta(name).num_rows == len(pdf)

    def test_no_duplicate_rows_in_any_table(self, small_lake):
        # Distinct-row invariant: makes physical row counts usable as
        # set cardinalities by MMP's row-count guard.
        for name, pdf in small_lake.frames.items():
            assert not pdf.duplicated().any(), name

    def test_provenance_recorded(self, small_lake):
        derived = [r for r in small_lake.records]
        assert len(derived) == small_lake.spec.n_derived
        for rec in derived:
            meta = small_lake.catalog.meta(rec.child)
            assert meta.provenance == (rec.transform, rec.parent)

    def test_child_in_parent_transforms_truly_contained(self, small_lake):
        for rec in small_lake.records:
            if rec.contained != "child_in_parent":
                continue
            frac = containment_fraction_pandas(
                small_lake.frames, rec.parent, rec.child
            )
            assert frac == 1.0, (rec.transform, rec.child)

    def test_parent_in_child_transforms_truly_contained(self, small_lake):
        for rec in small_lake.records:
            if rec.contained != "parent_in_child":
                continue
            frac = containment_fraction_pandas(
                small_lake.frames, rec.child, rec.parent
            )
            assert frac == 1.0, (rec.transform, rec.child)

    def test_none_transforms_break_containment(self, small_lake):
        for rec in small_lake.records:
            if rec.contained != "none":
                continue
            frac = containment_fraction_pandas(
                small_lake.frames, rec.parent, rec.child
            )
            assert frac < 1.0, (rec.transform, rec.child)

    def test_schema_of_projected_child_is_subset(self, small_lake):
        schemas = small_lake.catalog.schemas()
        for rec in small_lake.records:
            if rec.transform in ("filter", "project", "filter_project", "copy"):
                assert schemas[rec.child] <= schemas[rec.parent]
            if rec.transform == "add_cols":
                assert schemas[rec.parent] < schemas[rec.child]

    def test_determinism(self, spark, tmp_path):
        spec = LakeSpec(name="det", n_roots=2, n_derived=4,
                        root_rows=(50, 80), seed=123)
        lake1 = generate_lake(spark, spec, str(tmp_path / "a"))
        lake2 = generate_lake(spark, spec, str(tmp_path / "b"))
        assert lake1.catalog.names() == lake2.catalog.names()
        for n in lake1.frames:
            pd.testing.assert_frame_equal(lake1.frames[n], lake2.frames[n])
        assert [
            (r.child, r.parent, r.transform) for r in lake1.records
        ] == [(r.child, r.parent, r.transform) for r in lake2.records]

    def test_oracle_validates_filter_children(self, spark, small_lake):
        """DuckDB oracle: every filter/copy child's rows appear in its
        parent (left-semi count == child count)."""
        from pyspark.sql import functions as F

        from repro.core.clp import _null_safe_eq
        from repro.oracle import assert_equivalent

        checked = 0
        for rec in small_lake.records:
            if rec.transform not in ("filter", "copy") or checked >= 2:
                continue
            child = small_lake.catalog.df(rec.child)
            parent = small_lake.catalog.df(rec.parent)
            common = sorted(set(child.columns) & set(parent.columns))
            c = child.select(*common).alias("c")
            p = parent.select(*common).alias("p")
            got = (
                c.join(p, on=_null_safe_eq(c, p, common), how="left_semi")
                .agg(F.count(F.lit(1)).alias("matched"))
            )
            eqs = " AND ".join(f'p."{x}" = c."{x}"' for x in common)
            assert_equivalent(
                got,
                f"SELECT count(*) AS matched FROM c WHERE EXISTS "
                f"(SELECT 1 FROM p WHERE {eqs})",
                c=small_lake.frames[rec.child],
                p=small_lake.frames[rec.parent],
            )
            checked += 1
        assert checked > 0


class TestPresets:
    @pytest.mark.parametrize(
        "name", ["customer1", "customer2", "customer3", "table_union", "kaggle"]
    )
    def test_preset_specs_build(self, name):
        spec = preset(name, scale=1.0)
        assert spec.n_roots >= 2
        assert spec.n_derived >= 2
        assert abs(sum(spec.mix.values()) - 1.0) < 0.05

    def test_unknown_preset_raises(self):
        with pytest.raises(ValueError):
            preset("nope")

    def test_scale_multiplies_counts(self):
        small = preset("customer1", scale=1.0)
        big = preset("customer1", scale=2.0)
        assert big.n_derived == 2 * small.n_derived
        assert big.root_rows[0] >= 2 * small.root_rows[0] - 1

    def test_kaggle_preset_uses_tpch_roots(self, spark, tmp_path):
        spec = preset("kaggle", scale=1.0)
        assert spec.tpch_roots_sf is not None
        # Shrink for test speed, then verify TPC-H root tables appear.
        spec.n_roots, spec.n_derived, spec.superset_roots = 1, 2, 0
        lake = generate_lake(spark, spec, str(tmp_path))
        tpch = [n for n in lake.catalog.names() if "_tpch_" in n]
        assert {"kaggle_tpch_lineitem", "kaggle_tpch_orders"} <= set(tpch)
