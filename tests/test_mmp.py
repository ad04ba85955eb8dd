"""Tests for Min-Max Pruning (Algorithm 2, §4.2)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.core.graph import ContainmentGraph
from repro.core.mmp import StatsProvider, min_max_prune


def _graph(edges):
    g = ContainmentGraph()
    for p, c in edges:
        g.add_edge(p, c)
    return g


@pytest.fixture()
def contained_pair():
    g = np.random.default_rng(0)
    parent = pd.DataFrame(
        {"a": g.uniform(0, 100, 300).round(3), "b": g.integers(0, 50, 300)}
    ).drop_duplicates()
    child = parent.iloc[:100].reset_index(drop=True)
    return {"parent": parent, "child": child}


class TestPruningRules:
    def test_contained_edge_survives(self, make_catalog, contained_pair):
        cat = make_catalog(contained_pair)
        res = min_max_prune(_graph([("parent", "child")]), StatsProvider(cat))
        assert res.graph.has_edge("parent", "child")
        assert res.pruned == []

    def test_child_min_below_parent_min_pruned(self, make_catalog):
        cat = make_catalog(
            {
                "parent": pd.DataFrame({"a": [10.0, 20.0, 30.0]}),
                "child": pd.DataFrame({"a": [5.0, 15.0]}),
            }
        )
        res = min_max_prune(_graph([("parent", "child")]), StatsProvider(cat))
        assert not res.graph.has_edge("parent", "child")
        assert ("parent", "child") in res.pruned

    def test_child_max_above_parent_max_pruned(self, make_catalog):
        cat = make_catalog(
            {
                "parent": pd.DataFrame({"a": [10.0, 20.0], "b": [1, 2]}),
                "child": pd.DataFrame({"a": [15.0, 25.0], "b": [1, 2]}),
            }
        )
        res = min_max_prune(_graph([("parent", "child")]), StatsProvider(cat))
        assert not res.graph.has_edge("parent", "child")

    def test_equal_ranges_survive(self, make_catalog):
        pdf = pd.DataFrame({"a": [1.0, 2.0, 3.0]})
        cat = make_catalog({"parent": pdf, "child": pdf.copy()})
        res = min_max_prune(_graph([("parent", "child")]), StatsProvider(cat))
        assert res.graph.has_edge("parent", "child")

    def test_row_count_guard_prunes_bigger_child(self, make_catalog):
        cat = make_catalog(
            {
                "parent": pd.DataFrame({"a": [1.0, 2.0]}),
                "child": pd.DataFrame({"a": [1.0, 1.5, 2.0]}),
            }
        )
        res = min_max_prune(_graph([("parent", "child")]), StatsProvider(cat))
        assert not res.graph.has_edge("parent", "child")

    def test_row_count_guard_can_be_disabled(self, make_catalog):
        cat = make_catalog(
            {
                "parent": pd.DataFrame({"a": [1.0, 2.0]}),
                "child": pd.DataFrame({"a": [1.0, 1.5, 2.0]}),
            }
        )
        res = min_max_prune(
            _graph([("parent", "child")]),
            StatsProvider(cat),
            check_row_counts=False,
        )
        assert res.graph.has_edge("parent", "child")

    def test_only_common_columns_compared(self, make_catalog):
        # The child's extra-range column does not exist in the parent, so
        # it cannot prune; the shared column is in range.
        cat = make_catalog(
            {
                "parent": pd.DataFrame({"a": [1.0, 5.0], "x": [1, 2]}),
                "child": pd.DataFrame({"a": [2.0, 4.0], "z": [99, 100]}),
            }
        )
        res = min_max_prune(_graph([("parent", "child")]), StatsProvider(cat))
        assert res.graph.has_edge("parent", "child")

    def test_string_columns_ignored_by_default(self, make_catalog):
        cat = make_catalog(
            {
                "parent": pd.DataFrame({"s": ["m", "n"], "a": [1.0, 2.0]}),
                "child": pd.DataFrame({"s": ["a", "z"], "a": [1.0, 2.0]}),
            }
        )
        res = min_max_prune(_graph([("parent", "child")]), StatsProvider(cat))
        assert res.graph.has_edge("parent", "child")

    def test_string_columns_prune_when_enabled(self, make_catalog):
        cat = make_catalog(
            {
                "parent": pd.DataFrame({"s": ["m", "n"], "a": [1.0, 2.0]}),
                "child": pd.DataFrame({"s": ["a", "z"], "a": [1.0, 2.0]}),
            }
        )
        res = min_max_prune(
            _graph([("parent", "child")]),
            StatsProvider(cat),
            include_strings=True,
        )
        assert not res.graph.has_edge("parent", "child")

    def test_timestamp_ranges_prune(self, make_catalog):
        cat = make_catalog(
            {
                "parent": pd.DataFrame(
                    {"ts": pd.to_datetime(["2021-01-01", "2021-06-01"])}
                ),
                "child": pd.DataFrame(
                    {"ts": pd.to_datetime(["2020-12-01", "2021-03-01"])}
                ),
            }
        )
        res = min_max_prune(_graph([("parent", "child")]), StatsProvider(cat))
        assert not res.graph.has_edge("parent", "child")

    def test_input_graph_not_mutated(self, make_catalog):
        cat = make_catalog(
            {
                "parent": pd.DataFrame({"a": [10.0, 20.0]}),
                "child": pd.DataFrame({"a": [5.0, 15.0]}),
            }
        )
        g = _graph([("parent", "child")])
        min_max_prune(g, StatsProvider(cat))
        assert g.has_edge("parent", "child")

    def test_counters(self, make_catalog, contained_pair):
        cat = make_catalog(contained_pair)
        res = min_max_prune(_graph([("parent", "child")]), StatsProvider(cat))
        assert res.edges_examined == 1
        assert res.column_comparisons >= 1


class TestParquetBackedMMP:
    def test_footer_stats_drive_pruning(self, make_parquet_catalog):
        g = np.random.default_rng(1)
        parent = pd.DataFrame({"a": g.uniform(0, 10, 200).round(3)})
        inside = pd.DataFrame({"a": g.uniform(2, 8, 50).round(3)})
        outside = pd.DataFrame({"a": g.uniform(5, 20, 50).round(3)})
        cat = make_parquet_catalog(
            {"parent": parent, "inside": inside, "outside": outside}
        )
        graph = _graph([("parent", "inside"), ("parent", "outside")])
        res = min_max_prune(graph, StatsProvider(cat))
        assert res.graph.has_edge("parent", "inside")
        assert not res.graph.has_edge("parent", "outside")

    def test_provider_prefers_footers_and_caches(self, make_parquet_catalog):
        cat = make_parquet_catalog(
            {"t": pd.DataFrame({"a": [1.0, 2.0, 3.0]})}
        )
        provider = StatsProvider(cat)
        s1 = provider.stats("t")
        s2 = provider.stats("t")
        assert s1 is s2
        assert s1["a"].min == 1.0
        assert s1["a"].max == 3.0


class TestMMPSafety:
    """MMP never prunes a truly contained edge (paper's safety claim)."""

    @pytest.mark.parametrize("frac", [0.1, 0.5, 0.9])
    def test_random_subsets_never_pruned(self, make_catalog, frac):
        g = np.random.default_rng(int(frac * 100))
        parent = pd.DataFrame(
            {
                "a": g.uniform(-5, 5, 400).round(3),
                "b": g.integers(0, 1000, 400),
                "ts": pd.Timestamp("2022-01-01")
                + pd.to_timedelta(g.integers(0, 100, 400), unit="D"),
            }
        ).drop_duplicates()
        child = parent.sample(
            frac=frac, random_state=7
        ).reset_index(drop=True)
        cat = make_catalog({"parent": parent, "child": child})
        res = min_max_prune(_graph([("parent", "child")]), StatsProvider(cat))
        assert res.graph.has_edge("parent", "child")

    def test_lake_correct_edges_survive(self, small_lake, small_lake_gt):
        _, content_gt = small_lake_gt
        from repro.core.sgb import build_schema_graph

        sgb = build_schema_graph(small_lake.catalog.schemas())
        res = min_max_prune(sgb.graph, StatsProvider(small_lake.catalog))
        surviving = set(res.graph.edge_list())
        assert content_gt.edges <= surviving
