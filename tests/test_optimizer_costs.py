"""Tests for the §5.1 cost model and graph pre-processing."""
from __future__ import annotations

import pytest

from repro.core.graph import ContainmentGraph
from repro.lake.catalog import Catalog, TableMeta
from repro.optimizer.costs import (
    CostParams,
    OptNode,
    edge_cost_latency,
    preprocess,
    sample_access_profile,
    transformation_known,
)

_GB = float(1 << 30)


def _fake_catalog(entries) -> Catalog:
    """Catalog stub with only metadata (no Spark needed)."""
    cat = Catalog.__new__(Catalog)
    cat.tables = {
        name: TableMeta(
            name=name,
            path=None,
            schema_set=frozenset("ab"),
            num_rows=rows,
            size_bytes=size,
            provenance=prov,
        )
        for name, (rows, size, prov) in entries.items()
    }
    cat._frames = {}
    return cat


class TestCostFormulas:
    def test_retain_cost_formula(self):
        p = CostParams()
        node = OptNode(
            name="v", size_gb=2.0, num_rows=10,
            accesses_per_month=1.0, maintenance_per_month=3.0,
        )
        expected = (p.storage_per_gb_month + p.maintenance_per_gb_op * 3.0) * 2.0
        assert node.retain_cost(p) == pytest.approx(expected)

    def test_edge_cost_read_parent_write_child(self):
        p = CostParams()
        cost, lat = edge_cost_latency(4.0, 1.0, p)
        assert cost == pytest.approx(p.read_per_gb * 4 + p.write_per_gb * 1)
        assert lat == pytest.approx(
            p.read_latency_s_per_gb * 4 + p.write_latency_s_per_gb * 1
        )

    def test_write_cost_dominates_for_equal_sizes(self):
        """§5.1: C_e ≈ w·s_q because w is an order of magnitude above r."""
        p = CostParams()
        cost, _ = edge_cost_latency(1.0, 1.0, p)
        assert cost == pytest.approx(p.write_per_gb, rel=0.15)


class TestTransformationKnown:
    def test_direct_provenance(self):
        cat = _fake_catalog(
            {"root": (100, 100, None), "child": (50, 50, ("filter", "root"))}
        )
        assert transformation_known(cat, "root", "child")

    def test_chain_provenance(self):
        cat = _fake_catalog(
            {
                "root": (100, 100, None),
                "mid": (80, 80, ("filter", "root")),
                "leaf": (50, 50, ("project", "mid")),
            }
        )
        assert transformation_known(cat, "root", "leaf")

    def test_reverse_direction_chain(self):
        # add_rows flips the containment direction: the graph edge goes
        # child-table -> parent-table, still provenance-connected.
        cat = _fake_catalog(
            {"small": (50, 50, None), "grown": (80, 80, ("add_rows", "small"))}
        )
        assert transformation_known(cat, "grown", "small")

    def test_unrelated_tables_unknown(self):
        cat = _fake_catalog(
            {"a": (10, 10, None), "b": (10, 10, None)}
        )
        assert not transformation_known(cat, "a", "b")

    def test_siblings_not_connected(self):
        cat = _fake_catalog(
            {
                "root": (100, 100, None),
                "c1": (50, 50, ("filter", "root")),
                "c2": (60, 60, ("filter", "root")),
            }
        )
        assert not transformation_known(cat, "c1", "c2")


class TestPreprocess:
    def _graph(self):
        g = ContainmentGraph()
        g.add_edge("root", "child")
        g.add_edge("stranger", "child")
        return g

    def _catalog(self, child_size=int(0.5 * _GB)):
        return _fake_catalog(
            {
                "root": (1000, int(2 * _GB), None),
                "child": (400, child_size, ("filter", "root")),
                "stranger": (900, int(1 * _GB), None),
            }
        )

    def test_unknown_transformation_edges_dropped(self):
        prob = preprocess(
            self._graph(), self._catalog(), {}, CostParams()
        )
        kept = {(e.parent, e.child) for e in prob.edges}
        assert kept == {("root", "child")}

    def test_latency_threshold_prunes(self):
        params = CostParams(latency_threshold_s=1.0)
        prob = preprocess(self._graph(), self._catalog(), {}, params)
        assert prob.edges == []

    def test_can_disable_transform_requirement(self):
        prob = preprocess(
            self._graph(), self._catalog(), {},
            CostParams(), require_known_transform=False,
        )
        assert len(prob.edges) == 2

    def test_nodes_carry_profile(self):
        profile = {"root": (2.5, 7.0)}
        prob = preprocess(self._graph(), self._catalog(), profile)
        assert prob.nodes["root"].accesses_per_month == 2.5
        assert prob.nodes["root"].maintenance_per_month == 7.0

    def test_default_profile_has_weekly_maintenance(self):
        prob = preprocess(self._graph(), self._catalog(), {})
        assert prob.nodes["child"].maintenance_per_month == pytest.approx(
            52.0 / 12.0
        )

    def test_edge_costs_positive(self):
        prob = preprocess(self._graph(), self._catalog(), {})
        for e in prob.edges:
            assert e.recon_cost > 0
            assert e.latency_s > 0


class TestAccessProfile:
    def test_deterministic(self):
        a = sample_access_profile(["x", "y"], seed=4)
        b = sample_access_profile(["x", "y"], seed=4)
        assert a == b

    def test_includes_privacy_maintenance_floor(self):
        prof = sample_access_profile(["x"], weekly_privacy_accesses=2.0)
        _accesses, maint = prof["x"]
        assert maint >= 2.0 * 52 / 12

    def test_nonnegative(self):
        prof = sample_access_profile([f"t{i}" for i in range(50)], seed=1)
        for a, f in prof.values():
            assert a >= 0
            assert f > 0
