"""Tests for the OPT-RET solver (Eq. 3): exactness, feasibility, structure."""
from __future__ import annotations

import pytest
from hypothesis import given, settings, strategies as st

from repro.optimizer.costs import CostParams, OptEdge, OptNode, OptProblem
from repro.optimizer.opt_ret import (
    brute_force,
    gdpr_row_scan_savings,
    solve_opt_ret,
)


def _problem(nodes, edges, params=None) -> OptProblem:
    """nodes: {name: (size_gb, accesses, maintenance)}; edges: [(u, v, C_e)]."""
    p = params or CostParams()
    return OptProblem(
        params=p,
        nodes={
            n: OptNode(
                name=n, size_gb=sz, num_rows=int(sz * 1000) + 1,
                accesses_per_month=a, maintenance_per_month=f,
            )
            for n, (sz, a, f) in nodes.items()
        },
        edges=[
            OptEdge(parent=u, child=v, recon_cost=c, latency_s=1.0)
            for u, v, c in edges
        ],
    )


def _feasible(problem: OptProblem, solution) -> bool:
    parents = {n: set() for n in problem.nodes}
    for e in problem.edges:
        parents[e.child].add(e.parent)
    for v in solution.deleted:
        if not (parents[v] & solution.retained):
            return False
    return True


def _cost(problem: OptProblem, retained: set) -> float:
    total = 0.0
    for v in problem.nodes:
        if v in retained:
            total += problem.retain_cost(v)
        else:
            opts = [
                problem.recon_cost(e)
                for e in problem.edges
                if e.child == v and e.parent in retained
            ]
            total += min(opts)
    return total


class TestSimpleCases:
    def test_parentless_node_always_retained(self):
        prob = _problem({"a": (1.0, 1.0, 4.0)}, [])
        sol = solve_opt_ret(prob)
        assert sol.retained == {"a"}
        assert sol.deleted == set()

    def test_cheap_reconstruction_deletes_child(self):
        # Rarely-accessed duplicate: deletion saves the retention cost.
        prob = _problem(
            {"p": (1.0, 1.0, 4.0), "c": (1.0, 0.01, 4.0)},
            [("p", "c", 0.065)],
        )
        sol = solve_opt_ret(prob)
        assert sol.deleted == {"c"}
        assert sol.reconstruction == {"c": "p"}

    def test_hot_child_retained(self):
        # Heavily accessed child: reconstruction would dominate.
        prob = _problem(
            {"p": (1.0, 1.0, 4.0), "c": (1.0, 1000.0, 4.0)},
            [("p", "c", 0.065)],
        )
        sol = solve_opt_ret(prob)
        assert sol.deleted == set()

    def test_cheapest_parent_chosen(self):
        prob = _problem(
            {"p1": (1.0, 0.0, 4.0), "p2": (1.0, 0.0, 4.0), "c": (1.0, 1.0, 4.0)},
            [("p1", "c", 0.5), ("p2", "c", 0.001)],
        )
        sol = solve_opt_ret(prob)
        if "c" in sol.deleted:
            assert sol.reconstruction["c"] == "p2"

    def test_two_cycle_duplicates_one_survives(self):
        """Exact duplicates (edges both ways): the solver must retain at
        least one — deleting both would leave no reconstruction source."""
        prob = _problem(
            {"a": (1.0, 0.01, 4.0), "b": (1.0, 0.01, 4.0)},
            [("a", "b", 0.065), ("b", "a", 0.065)],
        )
        sol = solve_opt_ret(prob)
        assert len(sol.retained) >= 1
        assert _feasible(prob, sol)

    def test_empty_problem(self):
        prob = _problem({}, [])
        sol = solve_opt_ret(prob)
        assert sol.retained == set() and sol.deleted == set()
        assert sol.total_cost == 0.0


class TestExactness:
    def test_matches_brute_force_on_chain(self):
        prob = _problem(
            {f"n{i}": (1.0 + 0.3 * i, 0.2 * i, 4.0) for i in range(6)},
            [(f"n{i}", f"n{i+1}", 0.05 + 0.01 * i) for i in range(5)],
        )
        exact = solve_opt_ret(prob, method="exact")
        ref = brute_force(prob)
        assert exact.total_cost == pytest.approx(ref.total_cost)

    def test_matches_brute_force_on_diamond(self):
        prob = _problem(
            {
                "r": (3.0, 0.5, 4.0),
                "a": (2.0, 0.1, 4.0),
                "b": (2.0, 0.1, 4.0),
                "leaf": (1.5, 0.05, 4.0),
            },
            [
                ("r", "a", 0.2), ("r", "b", 0.2),
                ("a", "leaf", 0.1), ("b", "leaf", 0.12),
            ],
        )
        exact = solve_opt_ret(prob, method="exact")
        ref = brute_force(prob)
        assert exact.total_cost == pytest.approx(ref.total_cost)

    @given(
        n=st.integers(2, 7),
        data=st.data(),
    )
    @settings(max_examples=60, deadline=None)
    def test_matches_brute_force_random(self, n, data):
        nodes = {
            f"v{i}": (
                data.draw(st.floats(0.1, 5.0)),
                data.draw(st.floats(0.0, 3.0)),
                data.draw(st.floats(1.0, 8.0)),
            )
            for i in range(n)
        }
        edges = []
        for i in range(n):
            for j in range(i + 1, n):
                if data.draw(st.booleans()):
                    edges.append(
                        (f"v{i}", f"v{j}", data.draw(st.floats(0.001, 1.0)))
                    )
        prob = _problem(nodes, edges)
        exact = solve_opt_ret(prob, method="exact")
        ref = brute_force(prob)
        assert exact.total_cost == pytest.approx(ref.total_cost)
        assert _feasible(prob, exact)
        assert exact.total_cost == pytest.approx(_cost(prob, exact.retained))

    def test_component_decomposition_sums(self):
        prob = _problem(
            {
                "a": (1.0, 0.01, 4.0), "b": (1.0, 0.01, 4.0),
                "x": (2.0, 0.01, 4.0), "y": (2.0, 0.01, 4.0),
            },
            [("a", "b", 0.05), ("x", "y", 0.1)],
        )
        whole = solve_opt_ret(prob, method="exact")
        left = solve_opt_ret(
            _problem(
                {"a": (1.0, 0.01, 4.0), "b": (1.0, 0.01, 4.0)},
                [("a", "b", 0.05)],
            ),
            method="exact",
        )
        right = solve_opt_ret(
            _problem(
                {"x": (2.0, 0.01, 4.0), "y": (2.0, 0.01, 4.0)},
                [("x", "y", 0.1)],
            ),
            method="exact",
        )
        assert whole.total_cost == pytest.approx(
            left.total_cost + right.total_cost
        )


class TestGreedy:
    @given(n=st.integers(2, 10), data=st.data())
    @settings(max_examples=40, deadline=None)
    def test_greedy_feasible_and_no_better_than_exact(self, n, data):
        nodes = {
            f"v{i}": (
                data.draw(st.floats(0.1, 5.0)),
                data.draw(st.floats(0.0, 2.0)),
                data.draw(st.floats(1.0, 8.0)),
            )
            for i in range(n)
        }
        edges = [
            (f"v{i}", f"v{j}", data.draw(st.floats(0.001, 1.0)))
            for i in range(n)
            for j in range(i + 1, n)
            if data.draw(st.integers(0, 3)) == 0
        ]
        prob = _problem(nodes, edges)
        greedy = solve_opt_ret(prob, method="greedy")
        exact = solve_opt_ret(prob, method="exact")
        assert _feasible(prob, greedy)
        assert greedy.total_cost >= exact.total_cost - 1e-9
        assert greedy.total_cost <= _cost(prob, set(prob.nodes)) + 1e-9

    def test_auto_switches_to_greedy_on_large_component(self):
        n = 40
        nodes = {f"v{i}": (1.0, 0.01, 4.0) for i in range(n)}
        edges = [(f"v{i}", f"v{i+1}", 0.05) for i in range(n - 1)]
        prob = _problem(nodes, edges)
        sol = solve_opt_ret(prob, method="auto", exact_limit=10)
        assert sol.method == "greedy"
        assert _feasible(prob, sol)


class TestGdprSavings:
    def test_savings_sum_rows_of_deleted(self):
        prob = _problem(
            {"p": (1.0, 1.0, 4.0), "c": (1.0, 0.0, 4.0)},
            [("p", "c", 0.01)],
        )
        sol = solve_opt_ret(prob)
        assert sol.deleted == {"c"}
        expected = prob.nodes["c"].num_rows * 52 / 12
        assert gdpr_row_scan_savings(prob, sol) == pytest.approx(expected)

    def test_zero_when_nothing_deleted(self):
        prob = _problem({"a": (1.0, 1.0, 4.0)}, [])
        sol = solve_opt_ret(prob)
        assert gdpr_row_scan_savings(prob, sol) == 0.0
