"""Tests for §7.1 dynamic graph updates (incremental dataset addition)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.core.dynamic import add_dataset, remove_dataset
from repro.core.graph import ContainmentGraph
from repro.core.sgb import build_schema_graph
from repro.lake.catalog import Catalog


@pytest.fixture()
def base_catalog(spark, make_catalog):
    g = np.random.default_rng(11)
    big = pd.DataFrame(
        {
            "a": g.uniform(0, 100, 300).round(3),
            "b": g.integers(0, 500, 300),
            "c": g.choice(list("pqr"), 300),
        }
    ).drop_duplicates()
    other = pd.DataFrame(
        {"x": g.uniform(0, 1, 100).round(3), "y": g.integers(0, 9, 100)}
    ).drop_duplicates()
    return make_catalog({"big": big, "other": other}), {"big": big, "other": other}


class TestAddDataset:
    def _pipeline_state(self, catalog):
        sgb = build_schema_graph(catalog.schemas())
        return sgb, sgb.graph.copy()

    def test_contained_newcomer_gets_edge(self, spark, base_catalog):
        cat, frames = base_catalog
        sgb, graph = self._pipeline_state(cat)
        child = frames["big"].iloc[:60].reset_index(drop=True)
        cat.add_frame("newchild", spark.createDataFrame(child))
        schemas = cat.schemas()
        upd = add_dataset(sgb, graph, cat, schemas, "newchild")
        assert ("big", "newchild") in upd.new_edges
        assert upd.graph.has_edge("big", "newchild")

    def test_unrelated_newcomer_no_edges(self, spark, base_catalog):
        cat, _ = base_catalog
        sgb, graph = self._pipeline_state(cat)
        fresh = pd.DataFrame({"zz": [1.0, 2.0], "ww": [3, 4]})
        cat.add_frame("fresh", spark.createDataFrame(fresh))
        upd = add_dataset(sgb, graph, cat, cat.schemas(), "fresh")
        assert upd.new_edges == []
        assert "fresh" in upd.graph.nodes

    def test_schema_contained_but_content_foreign_pruned(
        self, spark, base_catalog
    ):
        cat, frames = base_catalog
        sgb, graph = self._pipeline_state(cat)
        foreign = frames["big"].iloc[:40].copy()
        foreign["a"] = foreign["a"] + 10_000.0
        cat.add_frame("foreign", spark.createDataFrame(foreign))
        upd = add_dataset(sgb, graph, cat, cat.schemas(), "foreign")
        assert not upd.graph.has_edge("big", "foreign")

    def test_new_superset_dataset_becomes_parent(self, spark, base_catalog):
        cat, frames = base_catalog
        sgb, graph = self._pipeline_state(cat)
        superset = frames["big"].copy()
        superset["extra"] = np.arange(len(superset), dtype=float)
        cat.add_frame("super", spark.createDataFrame(superset))
        upd = add_dataset(sgb, graph, cat, cat.schemas(), "super")
        assert upd.graph.has_edge("super", "big")

    def test_comparisons_linear_in_datasets(self, spark, make_catalog):
        g = np.random.default_rng(3)
        frames = {
            f"t{i}": pd.DataFrame(
                {f"c{i}": g.uniform(0, 1, 20), "shared": g.uniform(0, 1, 20)}
            )
            for i in range(8)
        }
        cat = make_catalog(frames)
        sgb = build_schema_graph(cat.schemas())
        graph = sgb.graph.copy()
        new = pd.DataFrame({"brand_new": [1.0, 2.0]})
        cat.add_frame("new", spark.createDataFrame(new))
        upd = add_dataset(sgb, graph, cat, cat.schemas(), "new")
        n = len(cat.names())
        # O(N): at most one check per cluster + one sweep over datasets.
        assert upd.comparisons <= 2 * n

    def test_matches_full_rerun_for_incident_edges(self, spark, base_catalog):
        """Incremental result ⊇ containment edges a full SGB rerun finds
        incident on the new node (Theorem 4.1 carried over)."""
        cat, frames = base_catalog
        sgb, graph = self._pipeline_state(cat)
        child = frames["big"][["a", "b"]].drop_duplicates().iloc[:50]
        cat.add_frame("proj", spark.createDataFrame(child.reset_index(drop=True)))
        schemas = cat.schemas()
        upd = add_dataset(sgb, graph, cat, schemas, "proj")
        full = build_schema_graph(schemas)
        full_incident = {
            (p, c)
            for p, c in full.graph.edge_list()
            if "proj" in (p, c)
        }
        # Every full-rerun schema edge incident on the newcomer was
        # considered; those surviving MMP+CLP appear in the update.
        assert ("big", "proj") in full_incident
        assert ("big", "proj") in upd.new_edges


class TestRemoveDataset:
    def test_node_and_edges_removed(self):
        g = ContainmentGraph()
        g.add_edge("a", "b")
        g.add_edge("b", "c")
        out = remove_dataset(g, "b")
        assert out.nodes == {"a", "c"}
        assert out.num_edges == 0

    def test_other_edges_survive(self):
        g = ContainmentGraph()
        g.add_edge("a", "b")
        g.add_edge("x", "y")
        out = remove_dataset(g, "b")
        assert out.edge_list() == [("x", "y")]

    def test_original_untouched(self):
        g = ContainmentGraph()
        g.add_edge("a", "b")
        remove_dataset(g, "a")
        assert g.has_edge("a", "b")
