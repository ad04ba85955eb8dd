"""Tests for Content-Level Pruning (Algorithm 3, §4.3)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.core.clp import content_level_prune, sample_child
from repro.core.graph import ContainmentGraph
from repro.core.mmp import StatsProvider


def _graph(edges):
    g = ContainmentGraph()
    for p, c in edges:
        g.add_edge(p, c)
    return g


def _rand_pdf(seed: int, n: int = 300) -> pd.DataFrame:
    g = np.random.default_rng(seed)
    return pd.DataFrame(
        {
            "a": g.uniform(0, 100, n).round(3),
            "b": g.integers(0, 500, n),
            "c": g.choice(["x", "y", "z"], n),
        }
    ).drop_duplicates()


class TestPruningBehaviour:
    def test_true_containment_never_pruned(self, make_catalog):
        parent = _rand_pdf(0)
        child = parent.iloc[:80].reset_index(drop=True)
        cat = make_catalog({"p": parent, "c": child})
        res = content_level_prune(_graph([("p", "c")]), cat, s=2, t=10)
        assert res.graph.has_edge("p", "c")
        assert res.pruned == []

    def test_disjoint_content_pruned(self, make_catalog):
        cat = make_catalog({"p": _rand_pdf(1), "c": _rand_pdf(2)})
        res = content_level_prune(_graph([("p", "c")]), cat, s=2, t=10)
        assert not res.graph.has_edge("p", "c")

    def test_projection_containment_survives(self, make_catalog):
        parent = _rand_pdf(3)
        child = parent[["a", "b"]].drop_duplicates().iloc[:50]
        cat = make_catalog({"p": parent, "c": child})
        res = content_level_prune(_graph([("p", "c")]), cat, s=4, t=10)
        assert res.graph.has_edge("p", "c")

    def test_partially_foreign_child_pruned(self, make_catalog):
        # Half the child's rows are foreign in every column and sit at
        # the head of the table, so the WHERE-filter sample must hit
        # them and the edge must be pruned.
        parent = _rand_pdf(4, n=200)
        foreign = parent.copy()
        foreign["a"] = foreign["a"] + 1000.0
        foreign["b"] = foreign["b"] + 1000
        foreign["c"] = "foreign"
        child = pd.concat([foreign, parent]).reset_index(drop=True)
        cat = make_catalog({"p": parent, "c": child})
        res = content_level_prune(
            _graph([("p", "c")]), cat, s=3, t=30, seed=1
        )
        assert not res.graph.has_edge("p", "c")

    def test_seed_determinism(self, make_catalog):
        parent = _rand_pdf(5)
        child = _rand_pdf(6)
        cat = make_catalog({"p": parent, "c": child})
        r1 = content_level_prune(_graph([("p", "c")]), cat, s=2, t=5, seed=9)
        r2 = content_level_prune(_graph([("p", "c")]), cat, s=2, t=5, seed=9)
        assert r1.graph.edge_list() == r2.graph.edge_list()

    def test_input_graph_not_mutated(self, make_catalog):
        cat = make_catalog({"p": _rand_pdf(7), "c": _rand_pdf(8)})
        g = _graph([("p", "c")])
        content_level_prune(g, cat, s=2, t=10)
        assert g.has_edge("p", "c")

    def test_empty_child_not_pruned(self, make_catalog, spark):
        parent = _rand_pdf(9)
        cat = make_catalog({"p": parent})
        cat.add_frame("c", spark.createDataFrame(parent).limit(0))
        res = content_level_prune(_graph([("p", "c")]), cat, s=2, t=10)
        # An empty table is trivially contained; CLP must not prune it.
        assert res.graph.has_edge("p", "c")

    def test_null_rows_matched_null_safely(self, make_catalog, spark):
        parent = pd.DataFrame(
            {"a": [1.0, None, 3.0], "b": ["x", "y", None]}
        )
        child = parent.iloc[[1, 2]].reset_index(drop=True)
        cat = make_catalog({"p": parent, "c": child})
        res = content_level_prune(_graph([("p", "c")]), cat, s=2, t=10)
        assert res.graph.has_edge("p", "c")

    def test_row_operations_counter(self, make_catalog):
        parent = _rand_pdf(10)
        child = parent.iloc[:50]
        cat = make_catalog({"p": parent, "c": child})
        res = content_level_prune(_graph([("p", "c")]), cat, s=2, t=10)
        assert res.row_operations > 0
        assert res.row_operations <= len(parent) * 10
        assert res.edges_examined == 1

    def test_uses_footer_metadata_values_when_available(
        self, make_parquet_catalog
    ):
        parent = _rand_pdf(11)
        child = parent.iloc[:60]
        cat = make_parquet_catalog({"p": parent, "c": child})
        provider = StatsProvider(cat)
        res = content_level_prune(
            _graph([("p", "c")]), cat, s=2, t=10, provider=provider
        )
        assert res.graph.has_edge("p", "c")


class TestSampleChild:
    def test_limit_respected(self, spark):
        df = spark.createDataFrame(_rand_pdf(12))
        out = sample_child(df, ["a"], {}, 5)
        assert out.count() <= 5

    def test_where_filter_applied(self, spark):
        pdf = _rand_pdf(13)
        df = spark.createDataFrame(pdf)
        val = float(pdf["a"].iloc[0])
        out = sample_child(df, ["a"], {"a": val}, 100).toPandas()
        assert (out["a"] == val).all()

    def test_or_of_equalities_across_columns(self, spark):
        pdf = pd.DataFrame({"a": [1.0, 2.0, 3.0], "b": [10, 20, 30]})
        df = spark.createDataFrame(pdf)
        out = sample_child(df, ["a", "b"], {"a": 1.0, "b": 30}, 10).toPandas()
        assert set(out["b"]) == {10, 30}

    def test_unmatched_filter_falls_back_to_limit(self, spark):
        df = spark.createDataFrame(_rand_pdf(14))
        out = sample_child(df, ["a"], {"a": -999.0}, 7)
        assert 0 < out.count() <= 7


class TestTheorem42OnLake:
    def test_correct_edges_always_survive_clp(self, small_lake, small_lake_gt):
        """CLP safety on a whole generated lake: zero missed edges."""
        from repro.core.mmp import min_max_prune
        from repro.core.sgb import build_schema_graph

        cat = small_lake.catalog
        provider = StatsProvider(cat)
        sgb = build_schema_graph(cat.schemas())
        mmp = min_max_prune(sgb.graph, provider)
        clp = content_level_prune(mmp.graph, cat, s=4, t=10, provider=provider)
        _, content_gt = small_lake_gt
        assert content_gt.edges <= set(clp.graph.edge_list())

    def test_more_rows_prune_no_fewer_edges(self, small_lake):
        """Monotonicity in t: larger samples can only expose more
        counterexamples (Table 6's columns)."""
        from repro.core.mmp import min_max_prune
        from repro.core.sgb import build_schema_graph

        cat = small_lake.catalog
        provider = StatsProvider(cat)
        mmp = min_max_prune(build_schema_graph(cat.schemas()).graph, provider)
        survivors = {}
        for t in (1, 30):
            clp = content_level_prune(
                mmp.graph, cat, s=2, t=t, provider=provider, seed=3
            )
            survivors[t] = clp.graph.num_edges
        assert survivors[30] <= survivors[1]
