"""Tests for Dyn-Lin (§5.3): the O(N) line-graph dynamic program."""
from __future__ import annotations

import pytest
from hypothesis import given, settings, strategies as st

from repro.optimizer.costs import CostParams, OptEdge, OptNode, OptProblem
from repro.optimizer.dyn_lin import solve_line
from repro.optimizer.opt_ret import brute_force, solve_opt_ret


def _line_problem(retain, recon) -> OptProblem:
    """Wrap parallel cost arrays as an OptProblem line graph.

    Node sizes are chosen so retain_cost(node i) == retain[i] under unit
    prices; recon costs are injected directly with A_v = 1.
    """
    params = CostParams(
        storage_per_gb_month=1.0, maintenance_per_gb_op=0.0
    )
    n = len(retain)
    nodes = {
        f"n{i}": OptNode(
            name=f"n{i}", size_gb=retain[i], num_rows=10,
            accesses_per_month=1.0, maintenance_per_month=0.0,
        )
        for i in range(n)
    }
    edges = [
        OptEdge(
            parent=f"n{i-1}", child=f"n{i}", recon_cost=recon[i], latency_s=1.0
        )
        for i in range(1, n)
    ]
    return OptProblem(params=params, nodes=nodes, edges=edges)


class TestBaseCases:
    def test_empty(self):
        sol = solve_line([], [])
        assert sol.retained == [] and sol.deleted == []
        assert sol.total_cost == 0.0

    def test_single_node_retained(self):
        sol = solve_line([5.0], [0.0])
        assert sol.retained == [0]
        assert sol.total_cost == 5.0

    def test_two_nodes_keep_cheap_child(self):
        sol = solve_line([5.0, 1.0], [0.0, 10.0])
        assert sol.retained == [0, 1]
        assert sol.total_cost == 6.0

    def test_two_nodes_delete_expensive_child(self):
        sol = solve_line([5.0, 10.0], [0.0, 1.0])
        assert sol.retained == [0]
        assert sol.deleted == [1]
        assert sol.total_cost == 6.0

    def test_mismatched_lengths_rejected(self):
        with pytest.raises(ValueError):
            solve_line([1.0, 2.0], [0.0])


class TestAlternation:
    def test_cannot_delete_adjacent_pair(self):
        """Deleting node i forces retaining i-1: two consecutive
        deletions are impossible on a line."""
        sol = solve_line([10.0, 10.0, 10.0], [0.0, 0.1, 0.1])
        deleted = set(sol.deleted)
        for i in sol.deleted:
            assert i - 1 not in deleted
            assert i - 1 in set(sol.retained)

    def test_all_cheap_reconstruction_alternates(self):
        n = 7
        sol = solve_line([10.0] * n, [0.0] + [0.01] * (n - 1))
        # Optimal solutions delete floor(n/2) = 3 nodes, never adjacent
        # (several tying optima exist; any is acceptable).
        assert len(sol.deleted) == 3
        assert sol.total_cost == pytest.approx(4 * 10.0 + 3 * 0.01)
        deleted = set(sol.deleted)
        assert all(i - 1 not in deleted for i in deleted)


class TestEquivalenceWithILP:
    @given(
        n=st.integers(1, 9),
        data=st.data(),
    )
    @settings(max_examples=80, deadline=None)
    def test_matches_brute_force_ilp(self, n, data):
        retain = [data.draw(st.floats(0.1, 10.0)) for _ in range(n)]
        recon = [0.0] + [data.draw(st.floats(0.01, 10.0)) for _ in range(n - 1)]
        line = solve_line(retain, recon)
        prob = _line_problem(retain, recon)
        ref = brute_force(prob)
        assert line.total_cost == pytest.approx(ref.total_cost)

    @given(
        n=st.integers(1, 12),
        data=st.data(),
    )
    @settings(max_examples=60, deadline=None)
    def test_matches_branch_and_bound(self, n, data):
        retain = [data.draw(st.floats(0.1, 10.0)) for _ in range(n)]
        recon = [0.0] + [data.draw(st.floats(0.01, 10.0)) for _ in range(n - 1)]
        line = solve_line(retain, recon)
        sol = solve_opt_ret(_line_problem(retain, recon), method="exact")
        assert line.total_cost == pytest.approx(sol.total_cost)

    @given(n=st.integers(1, 10), data=st.data())
    @settings(max_examples=40, deadline=None)
    def test_backtrack_cost_consistent(self, n, data):
        """The retained/deleted sets reproduce the reported optimum."""
        retain = [data.draw(st.floats(0.1, 10.0)) for _ in range(n)]
        recon = [0.0] + [data.draw(st.floats(0.01, 10.0)) for _ in range(n - 1)]
        sol = solve_line(retain, recon)
        total = sum(retain[i] for i in sol.retained) + sum(
            recon[i] for i in sol.deleted
        )
        assert total == pytest.approx(sol.total_cost)
        assert sorted(sol.retained + sol.deleted) == list(range(n))
        assert 0 in sol.retained or n == 0
