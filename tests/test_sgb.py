"""Tests for SGB (Algorithm 1), including the Theorem 4.1 recall property."""
from __future__ import annotations

from hypothesis import given, settings, strategies as st

from repro.core.sgb import build_schema_graph
from repro.groundtruth.schema_gt import ground_truth_schema_graph


def _schemas(d: dict[str, str]) -> dict[str, frozenset]:
    return {k: frozenset(v) for k, v in d.items()}


class TestPaperStyleExample:
    """A Fig-3-like worked example: 6 schemas, overlapping clusters."""

    SCHEMAS = _schemas(
        {
            "S1": "abcde",
            "S2": "abc",
            "S3": "ab",
            "S4": "cdefg",
            "S5": "cd",
            "S6": "xy",
        }
    )

    def test_edges_match_ground_truth_superset(self):
        res = build_schema_graph(self.SCHEMAS)
        gt = ground_truth_schema_graph(self.SCHEMAS)
        assert gt.edges <= set(res.graph.edge_list())

    def test_specific_containments_found(self):
        res = build_schema_graph(self.SCHEMAS)
        assert res.graph.has_edge("S1", "S2")  # abc ⊆ abcde
        assert res.graph.has_edge("S1", "S3")  # ab ⊆ abcde
        assert res.graph.has_edge("S2", "S3")  # ab ⊆ abc
        assert res.graph.has_edge("S1", "S5")  # cd ⊆ abcde
        assert res.graph.has_edge("S4", "S5")  # cd ⊆ cdefg

    def test_disjoint_schema_isolated(self):
        res = build_schema_graph(self.SCHEMAS)
        assert res.graph.parents_of("S6") == set()
        assert res.graph.children_of("S6") == set()

    def test_first_processed_is_center(self):
        res = build_schema_graph(self.SCHEMAS)
        centers = {c.center for c in res.clusters}
        # The two largest schemas are not contained in each other, so
        # both must be centers; S6 is disjoint so it must be a center.
        assert {"S1", "S4", "S6"} <= centers

    def test_overlapping_membership(self):
        res = build_schema_graph(self.SCHEMAS)
        member_of = {
            c.center: set(c.members) for c in res.clusters
        }
        # S5 = {c, d} is contained in both S1's and S4's centers.
        assert "S5" in member_of["S1"]
        assert "S5" in member_of["S4"]


class TestEdgeSemantics:
    def test_equal_schemas_edges_both_directions(self):
        res = build_schema_graph(_schemas({"A": "ab", "B": "ab"}))
        assert res.graph.has_edge("A", "B")
        assert res.graph.has_edge("B", "A")

    def test_edge_from_larger_to_smaller_only(self):
        res = build_schema_graph(_schemas({"big": "abc", "small": "ab"}))
        assert res.graph.has_edge("big", "small")
        assert not res.graph.has_edge("small", "big")

    def test_no_self_edges(self):
        res = build_schema_graph(_schemas({"A": "ab", "B": "ab", "C": "a"}))
        for p, c in res.graph.edge_list():
            assert p != c

    def test_all_nodes_present_even_isolated(self):
        res = build_schema_graph(_schemas({"A": "ab", "B": "xy"}))
        assert res.graph.nodes == {"A", "B"}

    def test_empty_input(self):
        res = build_schema_graph({})
        assert res.graph.num_edges == 0
        assert res.clusters == []

    def test_single_schema(self):
        res = build_schema_graph(_schemas({"A": "abc"}))
        assert res.graph.num_edges == 0
        assert len(res.clusters) == 1
        assert res.clusters[0].center == "A"

    def test_chain_transitive_edges_all_present(self):
        res = build_schema_graph(
            _schemas({"A": "abcd", "B": "abc", "C": "ab", "D": "a"})
        )
        edges = set(res.graph.edge_list())
        expected = {
            ("A", "B"), ("A", "C"), ("A", "D"),
            ("B", "C"), ("B", "D"), ("C", "D"),
        }
        assert expected <= edges

    def test_comparisons_counter_positive(self):
        res = build_schema_graph(
            _schemas({"A": "abcd", "B": "abc", "C": "ab"})
        )
        assert res.comparisons > 0


# Random schema-set universes for the recall theorem. Tokens come from a
# small alphabet so containment relations are frequent.
_schema_universe = st.dictionaries(
    keys=st.text(alphabet="STUVWX", min_size=1, max_size=3),
    values=st.frozensets(st.sampled_from("abcdefghij"), min_size=1, max_size=8),
    min_size=1,
    max_size=12,
)


class TestTheorem41Recall:
    @given(schemas=_schema_universe)
    @settings(max_examples=150, deadline=None)
    def test_no_ground_truth_edge_missed(self, schemas):
        """Theorem 4.1: SGB's graph is a superset of the GT schema graph."""
        res = build_schema_graph(schemas)
        gt = ground_truth_schema_graph(schemas)
        assert gt.edges <= set(res.graph.edge_list())

    @given(schemas=_schema_universe)
    @settings(max_examples=60, deadline=None)
    def test_sgb_edges_are_real_schema_containments(self, schemas):
        """SGB never fabricates an edge: every edge is a true schema
        containment (precision loss in the paper is w.r.t. *content*
        containment, not schema containment)."""
        res = build_schema_graph(schemas)
        for p, c in res.graph.edge_list():
            assert schemas[c] <= schemas[p]

    @given(schemas=_schema_universe)
    @settings(max_examples=60, deadline=None)
    def test_every_schema_in_some_cluster(self, schemas):
        res = build_schema_graph(schemas)
        members = {m for c in res.clusters for m in c.members}
        assert members == set(schemas)

    @given(schemas=_schema_universe)
    @settings(max_examples=60, deadline=None)
    def test_members_contained_in_their_center(self, schemas):
        res = build_schema_graph(schemas)
        for cluster in res.clusters:
            for m in cluster.members:
                assert schemas[m] <= schemas[cluster.center]

    @given(schemas=_schema_universe)
    @settings(max_examples=60, deadline=None)
    def test_centers_mutually_uncontained(self, schemas):
        """A center is never contained in an *earlier* (larger) center —
        that is what made it a center."""
        res = build_schema_graph(schemas)
        for i, ci in enumerate(res.clusters):
            for cj in res.clusters[:i]:
                assert not (
                    schemas[ci.center] <= schemas[cj.center]
                )

    @given(schemas=_schema_universe)
    @settings(max_examples=30, deadline=None)
    def test_comparisons_at_most_all_pairs_plus_center_checks(self, schemas):
        n = len(schemas)
        res = build_schema_graph(schemas)
        k = len(res.clusters)
        # Traversal does at most K checks per schema; within-cluster
        # pair checks are bounded by sum of C(|members|, 2).
        max_pairs = sum(
            len(c.members) * (len(c.members) - 1) // 2 for c in res.clusters
        )
        assert res.comparisons <= n * k + max_pairs
