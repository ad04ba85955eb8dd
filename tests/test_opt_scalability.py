"""Solver scalability on Erdős–Rényi graphs (the paper's Fig 6 sweep)."""
from __future__ import annotations

import time

import pytest

from repro.optimizer.opt_ret import solve_opt_ret
from repro.optimizer.random_graphs import erdos_renyi_problem


def _feasible(problem, solution) -> bool:
    parents = {n: set() for n in problem.nodes}
    for e in problem.edges:
        parents[e.child].add(e.parent)
    return all(
        parents[v] & solution.retained for v in solution.deleted
    )


class TestInstanceGeneration:
    def test_node_count(self):
        prob = erdos_renyi_problem(30, 0.1, seed=1)
        assert len(prob.nodes) == 30

    def test_acyclic_orientation(self):
        prob = erdos_renyi_problem(25, 0.3, seed=2)
        for e in prob.edges:
            assert e.parent < e.child  # low index -> high index

    def test_edge_probability_scales_edges(self):
        sparse = erdos_renyi_problem(40, 0.05, seed=3)
        dense = erdos_renyi_problem(40, 0.4, seed=3)
        assert len(dense.edges) > len(sparse.edges)

    def test_deterministic(self):
        a = erdos_renyi_problem(20, 0.2, seed=9)
        b = erdos_renyi_problem(20, 0.2, seed=9)
        assert [(e.parent, e.child) for e in a.edges] == [
            (e.parent, e.child) for e in b.edges
        ]


class TestSolverScalability:
    @pytest.mark.parametrize("n", [10, 50, 150])
    def test_nodes_sweep_solves_feasibly(self, n):
        """Fig 6(i): growing nodes at fixed p."""
        prob = erdos_renyi_problem(n, 0.1, seed=n)
        t0 = time.perf_counter()
        sol = solve_opt_ret(prob)
        elapsed = time.perf_counter() - t0
        assert _feasible(prob, sol)
        assert elapsed < 30.0

    @pytest.mark.parametrize("p", [0.02, 0.1, 0.3])
    def test_edges_sweep_solves_feasibly(self, p):
        """Fig 6(ii): growing edge probability at fixed nodes."""
        prob = erdos_renyi_problem(60, p, seed=7)
        sol = solve_opt_ret(prob)
        assert _feasible(prob, sol)
        assert sol.retained | sol.deleted == set(prob.nodes)

    def test_denser_graphs_enable_more_deletion(self):
        """More containment edges -> more reconstruction options -> at
        least as many deletions (the economic driver of Table 7)."""
        sparse = erdos_renyi_problem(60, 0.02, seed=11)
        dense = erdos_renyi_problem(60, 0.5, seed=11)
        del_sparse = len(solve_opt_ret(sparse).deleted)
        del_dense = len(solve_opt_ret(dense).deleted)
        assert del_dense >= del_sparse

    def test_solution_cost_never_exceeds_retain_all(self):
        prob = erdos_renyi_problem(80, 0.15, seed=13)
        sol = solve_opt_ret(prob)
        retain_all = sum(prob.retain_cost(n) for n in prob.nodes)
        assert sol.total_cost <= retain_all + 1e-9
