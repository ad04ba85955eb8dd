"""Integration tests for the full R2D2 pipeline (§4, Tables 1-3 shape)."""
from __future__ import annotations

import pytest

from repro.core.pipeline import run_pipeline


@pytest.fixture(scope="module")
def pipeline_result(small_lake):
    return run_pipeline(small_lake.catalog, s=4, t=10, seed=0)


class TestPipelineStructure:
    def test_stage_graphs_monotone_shrinking(self, pipeline_result):
        g = pipeline_result.stage_graphs()
        assert g["SGB"].num_edges >= g["MMP"].num_edges >= g["CLP"].num_edges

    def test_stage_edges_are_subsets(self, pipeline_result):
        g = pipeline_result.stage_graphs()
        assert set(g["MMP"].edge_list()) <= set(g["SGB"].edge_list())
        assert set(g["CLP"].edge_list()) <= set(g["MMP"].edge_list())

    def test_timings_recorded(self, pipeline_result):
        assert set(pipeline_result.timings) == {"SGB", "MMP", "CLP"}
        assert all(v >= 0 for v in pipeline_result.timings.values())

    def test_sgb_is_fastest_stage(self, pipeline_result):
        # The paper's Table 5: SGB is metadata-only and orders of
        # magnitude faster than the data-touching stages.
        t = pipeline_result.timings
        assert t["SGB"] < t["CLP"]

    def test_final_graph_is_clp_graph(self, pipeline_result):
        assert pipeline_result.final_graph is pipeline_result.clp.graph


class TestPipelineCorrectness:
    def test_no_correct_edge_ever_lost(self, pipeline_result, small_lake_gt):
        """Tables 1-2's invariant: Not detected = 0 at every stage."""
        _, content_gt = small_lake_gt
        acc = pipeline_result.accounting(content_gt.edges)
        for stage in ("SGB", "MMP", "CLP"):
            assert acc[stage].not_detected == 0, stage
            assert acc[stage].correct == len(content_gt.edges)

    def test_incorrect_edges_monotonically_reduced(
        self, pipeline_result, small_lake_gt
    ):
        _, content_gt = small_lake_gt
        acc = pipeline_result.accounting(content_gt.edges)
        assert (
            acc["SGB"].incorrect
            >= acc["MMP"].incorrect
            >= acc["CLP"].incorrect
        )

    def test_each_stage_actually_prunes_something(
        self, pipeline_result, small_lake_gt
    ):
        """On the mixed-transform lake both pruning stages have work."""
        _, content_gt = small_lake_gt
        acc = pipeline_result.accounting(content_gt.edges)
        assert acc["SGB"].incorrect > acc["MMP"].incorrect
        assert acc["MMP"].incorrect > acc["CLP"].incorrect or (
            acc["MMP"].incorrect == acc["CLP"].incorrect == 0
        )

    def test_deterministic_given_seed(self, small_lake):
        r1 = run_pipeline(small_lake.catalog, s=2, t=5, seed=42)
        r2 = run_pipeline(small_lake.catalog, s=2, t=5, seed=42)
        assert r1.final_graph.edge_list() == r2.final_graph.edge_list()


class TestOpCounts:
    def test_gt_schema_is_all_pairs(self, pipeline_result, small_lake):
        n = len(small_lake.catalog.names())
        assert pipeline_result.ops.gt_schema == n * (n - 1) // 2

    def test_mmp_ops_equal_sgb_edges(self, pipeline_result):
        assert (
            pipeline_result.ops.mmp == pipeline_result.sgb.graph.num_edges
        )

    def test_gt_content_dominates_clp(self, pipeline_result):
        """Table 3's headline: brute-force content comparisons dwarf the
        pipeline's sampled comparisons (the gap widens with scale; at
        this tiny test scale we assert a conservative 5x)."""
        assert pipeline_result.ops.gt_content > 5 * pipeline_result.ops.clp

    def test_clp_ops_bounded_by_sampling_budget(
        self, pipeline_result, small_lake
    ):
        max_rows = max(
            small_lake.catalog.meta(n).num_rows
            for n in small_lake.catalog.names()
        )
        edges = pipeline_result.clp.edges_examined
        assert pipeline_result.ops.clp <= edges * max_rows * 10

    def test_sgb_comparisons_recorded(self, pipeline_result):
        assert pipeline_result.ops.sgb > 0
