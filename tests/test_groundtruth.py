"""Tests for the brute-force ground-truth substrate (§6.2)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.core.graph import ContainmentGraph
from repro.groundtruth.content_gt import (
    containment_fraction,
    containment_fraction_pandas,
    ground_truth_content,
    ground_truth_content_pandas,
)
from repro.groundtruth.schema_gt import ground_truth_schema_graph


def _schemas(d):
    return {k: frozenset(v) for k, v in d.items()}


class TestSchemaGT:
    def test_all_pairs_comparisons(self):
        gt = ground_truth_schema_graph(
            _schemas({"A": "ab", "B": "abc", "C": "x", "D": "aby"})
        )
        assert gt.comparisons == 6  # C(4,2)

    def test_edges_directed_larger_to_smaller(self):
        gt = ground_truth_schema_graph(_schemas({"A": "ab", "B": "abc"}))
        assert gt.edges == {("B", "A")}

    def test_equal_schemas_both_directions(self):
        gt = ground_truth_schema_graph(_schemas({"A": "ab", "B": "ab"}))
        assert gt.edges == {("A", "B"), ("B", "A")}

    def test_no_edges_for_disjoint(self):
        gt = ground_truth_schema_graph(_schemas({"A": "ab", "B": "cd"}))
        assert gt.edges == set()

    def test_overlap_without_containment_no_edge(self):
        gt = ground_truth_schema_graph(_schemas({"A": "abx", "B": "aby"}))
        assert gt.edges == set()


@pytest.fixture()
def pair_catalog(make_catalog):
    g = np.random.default_rng(5)
    parent = pd.DataFrame(
        {
            "a": g.uniform(0, 50, 200).round(3),
            "b": g.integers(0, 99, 200),
            "c": g.choice(list("uvw"), 200),
        }
    ).drop_duplicates()
    child = parent.iloc[::2].reset_index(drop=True)
    mixed = pd.concat(
        [parent.iloc[:50], parent.iloc[:50].assign(a=lambda d: d.a + 999)]
    ).reset_index(drop=True)
    frames = {"parent": parent, "child": child, "mixed": mixed}
    return make_catalog(frames), frames


class TestContentFraction:
    def test_full_containment_is_one(self, pair_catalog):
        cat, _ = pair_catalog
        assert containment_fraction(cat, "parent", "child") == 1.0

    def test_half_containment(self, pair_catalog):
        cat, _ = pair_catalog
        frac = containment_fraction(cat, "parent", "mixed")
        assert frac == pytest.approx(0.5)

    def test_pandas_path_agrees_with_spark(self, pair_catalog):
        cat, frames = pair_catalog
        for parent, child in [
            ("parent", "child"),
            ("parent", "mixed"),
            ("child", "parent"),
        ]:
            assert containment_fraction(
                cat, parent, child
            ) == pytest.approx(
                containment_fraction_pandas(frames, parent, child)
            )

    def test_oracle_validates_fraction(self, spark, pair_catalog):
        """DuckDB oracle check of the Spark semi-join count."""
        from pyspark.sql import functions as F

        from repro.core.clp import _null_safe_eq
        from repro.oracle import assert_equivalent

        cat, frames = pair_catalog
        common = sorted(frames["mixed"].columns)
        c = cat.df("mixed").select(*common).distinct().alias("c")
        p = cat.df("parent").select(*common).alias("p")
        got = c.join(p, on=_null_safe_eq(c, p, common), how="left_semi").agg(
            F.count(F.lit(1)).alias("matched")
        )
        cols = ", ".join(f'"{x}"' for x in common)
        eqs = " AND ".join(f'p."{x}" = sub."{x}"' for x in common)
        assert_equivalent(
            got,
            f"SELECT count(*) AS matched FROM "
            f"(SELECT DISTINCT {cols} FROM c) sub WHERE EXISTS "
            f"(SELECT 1 FROM p WHERE {eqs})",
            c=frames["mixed"],
            p=frames["parent"],
        )

    def test_no_common_columns_zero(self, make_catalog):
        cat = make_catalog(
            {
                "a": pd.DataFrame({"x": [1.0]}),
                "b": pd.DataFrame({"y": [1.0]}),
            }
        )
        assert containment_fraction(cat, "a", "b") == 0.0

    def test_duplicates_in_child_use_set_semantics(self, make_catalog):
        cat = make_catalog(
            {
                "p": pd.DataFrame({"x": [1.0, 2.0]}),
                "c": pd.DataFrame({"x": [1.0, 1.0, 1.0, 5.0]}),
            }
        )
        # Distinct child rows: {1, 5}; only 1 is in p -> 0.5.
        assert containment_fraction(cat, "p", "c") == pytest.approx(0.5)


class TestContentGTGraph:
    def _schema_graph(self):
        g = ContainmentGraph()
        g.add_edge("parent", "child")
        g.add_edge("parent", "mixed")
        g.add_edge("child", "parent")
        return g

    def test_edges_only_full_containment(self, pair_catalog):
        cat, _ = pair_catalog
        gt = ground_truth_content(cat, self._schema_graph())
        assert ("parent", "child") in gt.edges
        assert ("parent", "mixed") not in gt.edges
        # parent has more rows than child, so child cannot contain it.
        assert ("child", "parent") not in gt.edges

    def test_fractions_recorded_for_all_edges(self, pair_catalog):
        cat, _ = pair_catalog
        gt = ground_truth_content(cat, self._schema_graph())
        assert set(gt.fractions) == set(self._schema_graph().edge_list())

    def test_row_operations_sum(self, pair_catalog):
        cat, _ = pair_catalog
        gt = ground_truth_content(cat, self._schema_graph())
        expected = sum(
            cat.meta(p).num_rows * cat.meta(c).num_rows
            for p, c in self._schema_graph().edge_list()
        )
        assert gt.row_operations == expected

    def test_pandas_gt_agrees_with_spark_gt(self, pair_catalog):
        cat, frames = pair_catalog
        graph = self._schema_graph()
        spark_gt = ground_truth_content(cat, graph)
        pandas_gt = ground_truth_content_pandas(frames, graph)
        assert spark_gt.edges == pandas_gt.edges
        for k in spark_gt.fractions:
            assert spark_gt.fractions[k] == pytest.approx(
                pandas_gt.fractions[k]
            )

    def test_graph_export(self, pair_catalog):
        cat, _ = pair_catalog
        gt = ground_truth_content(cat, self._schema_graph())
        assert set(gt.graph().edge_list()) == gt.edges

    def test_lake_gt_consistency(self, spark, small_lake, small_lake_gt):
        """On the generated lake, the Spark and pandas GT agree edge-for-
        edge (sampled to keep runtime bounded)."""
        schema_gt, content_gt = small_lake_gt
        edges = schema_gt.graph.edge_list()[:8]
        for parent, child in edges:
            s = containment_fraction(small_lake.catalog, parent, child)
            p = containment_fraction_pandas(small_lake.frames, parent, child)
            assert s == pytest.approx(p), (parent, child)
