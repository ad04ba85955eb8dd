"""Unit tests for the containment graph structure and edge accounting."""
from __future__ import annotations

from repro.core.graph import ContainmentGraph, account_edges


def _graph(edges):
    g = ContainmentGraph()
    for p, c in edges:
        g.add_edge(p, c)
    return g


class TestGraphOps:
    def test_add_edge_adds_nodes(self):
        g = _graph([("a", "b")])
        assert g.nodes == {"a", "b"}

    def test_has_edge(self):
        g = _graph([("a", "b")])
        assert g.has_edge("a", "b")
        assert not g.has_edge("b", "a")

    def test_remove_edge(self):
        g = _graph([("a", "b"), ("a", "c")])
        g.remove_edge("a", "b")
        assert not g.has_edge("a", "b")
        assert g.has_edge("a", "c")

    def test_remove_last_edge_clears_bucket(self):
        g = _graph([("a", "b")])
        g.remove_edge("a", "b")
        assert g.num_edges == 0
        assert "a" not in g.edges

    def test_remove_missing_edge_noop(self):
        g = _graph([("a", "b")])
        g.remove_edge("x", "y")
        assert g.num_edges == 1

    def test_edge_list_sorted_deterministic(self):
        g = _graph([("b", "z"), ("a", "y"), ("a", "x")])
        assert g.edge_list() == [("a", "x"), ("a", "y"), ("b", "z")]

    def test_parents_and_children(self):
        g = _graph([("a", "c"), ("b", "c"), ("a", "d")])
        assert g.parents_of("c") == {"a", "b"}
        assert g.children_of("a") == {"c", "d"}

    def test_num_edges(self):
        g = _graph([("a", "b"), ("a", "c"), ("b", "c")])
        assert g.num_edges == 3

    def test_duplicate_add_is_idempotent(self):
        g = _graph([("a", "b"), ("a", "b")])
        assert g.num_edges == 1

    def test_copy_is_deep_for_edges(self):
        g = _graph([("a", "b")])
        g2 = g.copy()
        g2.remove_edge("a", "b")
        assert g.has_edge("a", "b")
        assert not g2.has_edge("a", "b")

    def test_isolated_node(self):
        g = ContainmentGraph()
        g.add_node("lonely")
        assert "lonely" in g.nodes
        assert g.num_edges == 0


class TestAccounting:
    def test_all_correct(self):
        g = _graph([("a", "b"), ("a", "c")])
        acc = account_edges(g, {("a", "b"), ("a", "c")})
        assert (acc.correct, acc.incorrect, acc.not_detected) == (2, 0, 0)

    def test_incorrect_extra_edges(self):
        g = _graph([("a", "b"), ("x", "y")])
        acc = account_edges(g, {("a", "b")})
        assert (acc.correct, acc.incorrect, acc.not_detected) == (1, 1, 0)

    def test_not_detected(self):
        g = _graph([("a", "b")])
        acc = account_edges(g, {("a", "b"), ("p", "q")})
        assert acc.not_detected == 1

    def test_empty_graph_vs_empty_gt(self):
        acc = account_edges(ContainmentGraph(), set())
        assert (acc.correct, acc.incorrect, acc.not_detected) == (0, 0, 0)

    def test_direction_matters(self):
        g = _graph([("b", "a")])
        acc = account_edges(g, {("a", "b")})
        assert (acc.correct, acc.incorrect, acc.not_detected) == (0, 1, 1)

    def test_as_row_labels(self):
        g = _graph([("a", "b")])
        row = account_edges(g, {("a", "b")}).as_row()
        assert row == {"Correct": 1, "Incorrect (<1)": 0, "Not detected": 0}
