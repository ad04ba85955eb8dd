"""OPT-RET (Equation 3, §5.2): optimally retain/delete datasets.

The ILP: minimise ``Σ_v (C_s + C_m f_v) S_v x_v + Σ_e A_v C_e y_e``
subject to (i) a deleted node's reconstruction parent must be retained
(``y_e ≤ x_u``), (ii) every node is retained or has a reconstruction
parent (``x_v + Σ y_e ≥ 1``), (iii) ``y_e ≤ 1 - x_v``.

Key structural fact used by the solver: once the retained set ``X`` is
fixed, the optimal ``y`` picks the cheapest retained parent for every
deleted node. So the search is over ``X`` only, with cost

    J(X) = Σ_{v∈X} R_v + Σ_{v∉X} A_v · min_{u∈P_v∩X} C_uv ,

infeasible when some deleted node has no retained parent. Parentless
nodes are forcibly retained, and the graph decomposes into weakly
connected components solved independently:

- **exact** branch-and-bound per component (admissible lower bound:
  each undecided node contributes ``min(R_v, min_e A_v C_e)``), used up
  to ``exact_limit`` free nodes — no MILP solver ships in this
  environment, and exactness is cross-checked against brute force and
  Dyn-Lin in the tests;
- **greedy local search** beyond that (delete best-saving node while
  feasible), for the Fig-6-style Erdős–Rényi scalability sweeps.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from .costs import OptEdge, OptProblem


@dataclass
class Solution:
    retained: set[str]
    deleted: set[str]
    #: deleted child -> the retained parent chosen for reconstruction
    #: (the edge with y_e = 1).
    reconstruction: dict[str, str]
    total_cost: float
    method: str

    @property
    def deletion_edges(self) -> int:
        """Containment edges pointing *into* deleted nodes (Table 7)."""
        return len(self.reconstruction)


@dataclass
class _Component:
    nodes: list[str]
    retain: dict[str, float]
    #: child -> list of (recon expected cost, parent)
    parents: dict[str, list[tuple[float, str]]]


def _components(problem: OptProblem) -> list[_Component]:
    adj: dict[str, set[str]] = {n: set() for n in problem.nodes}
    for e in problem.edges:
        adj[e.parent].add(e.child)
        adj[e.child].add(e.parent)
    seen: set[str] = set()
    comps: list[_Component] = []
    parents_all: dict[str, list[tuple[float, str]]] = {n: [] for n in problem.nodes}
    for e in problem.edges:
        parents_all[e.child].append((problem.recon_cost(e), e.parent))
    for start in sorted(problem.nodes):
        if start in seen:
            continue
        stack, comp = [start], []
        seen.add(start)
        while stack:
            u = stack.pop()
            comp.append(u)
            for v in adj[u]:
                if v not in seen:
                    seen.add(v)
                    stack.append(v)
        comp.sort()
        comps.append(
            _Component(
                nodes=comp,
                retain={n: problem.retain_cost(n) for n in comp},
                parents={n: sorted(parents_all[n]) for n in comp},
            )
        )
    return comps


def _solve_exact(comp: _Component) -> tuple[set[str], float]:
    """Branch and bound over retain/delete decisions of one component."""
    nodes = comp.nodes
    n = len(nodes)
    # Nodes without parents are forced retained; branch on the rest.
    forced = [v for v in nodes if not comp.parents[v]]
    free = [v for v in nodes if comp.parents[v]]
    base_cost = sum(comp.retain[v] for v in forced)
    # Per-node admissible bound: cheapest conceivable contribution.
    lower = {
        v: min(comp.retain[v], comp.parents[v][0][0]) for v in free
    }
    # Branch nodes in descending retain-cost order (big savings first).
    free.sort(key=lambda v: -comp.retain[v])

    best_cost = base_cost + sum(comp.retain[v] for v in free)
    best_set = set(nodes)

    decided: dict[str, bool] = {v: True for v in forced}

    def finish_cost() -> float | None:
        """Exact J(X) for a full assignment; None if infeasible."""
        total = base_cost
        for v in free:
            if decided[v]:
                total += comp.retain[v]
            else:
                opts = [c for c, u in comp.parents[v] if decided.get(u, False)]
                if not opts:
                    return None
                total += min(opts)
        return total

    def rec(i: int, partial: float) -> None:
        nonlocal best_cost, best_set
        remaining_lb = sum(lower[free[j]] for j in range(i, len(free)))
        if partial + remaining_lb >= best_cost - 1e-12:
            return
        if i == len(free):
            exact = finish_cost()
            if exact is not None and exact < best_cost - 1e-12:
                best_cost = exact
                best_set = {v for v in nodes if decided.get(v, False)}
            return
        v = free[i]
        # Try delete first (it is why we are optimising), then retain.
        for choice in (False, True):
            decided[v] = choice
            contribution = comp.retain[v] if choice else lower[v]
            # Feasibility pre-check on delete: some parent could still
            # be retained (undecided parents count as possible).
            if not choice:
                possible = any(
                    decided.get(u, True) for _c, u in comp.parents[v]
                )
                if not possible:
                    del decided[v]
                    continue
            rec(i + 1, partial + contribution)
            del decided[v]

    rec(0, base_cost)
    return best_set, best_cost


def _cost_of(comp: _Component, retained: set[str]) -> float | None:
    total = 0.0
    for v in comp.nodes:
        if v in retained:
            total += comp.retain[v]
        else:
            opts = [c for c, u in comp.parents[v] if u in retained]
            if not opts:
                return None
            total += min(opts)
    return total


def _solve_greedy(comp: _Component) -> tuple[set[str], float]:
    """Local search: start all-retained, delete best-saving node."""
    retained = set(comp.nodes)
    cost = _cost_of(comp, retained)
    assert cost is not None
    improved = True
    while improved:
        improved = False
        best_delta, best_v = 0.0, None
        for v in sorted(retained):
            if not comp.parents[v]:
                continue
            cand = _cost_of(comp, retained - {v})
            if cand is not None and cost - cand > best_delta + 1e-12:
                best_delta, best_v = cost - cand, v
        if best_v is not None:
            retained.discard(best_v)
            cost -= best_delta
            improved = True
    return retained, cost


def solve_opt_ret(
    problem: OptProblem, *, method: str = "auto", exact_limit: int = 26
) -> Solution:
    """Solve OPT-RET; exact per component unless it exceeds ``exact_limit``
    free (parented) nodes, in which case greedy local search is used for
    that component (``method="greedy"`` forces greedy, ``"exact"``
    forces branch-and-bound everywhere).
    """
    retained: set[str] = set()
    total = 0.0
    used = []
    for comp in _components(problem):
        free = sum(1 for v in comp.nodes if comp.parents[v])
        if method == "greedy" or (method == "auto" and free > exact_limit):
            r, c = _solve_greedy(comp)
            used.append("greedy")
        else:
            r, c = _solve_exact(comp)
            used.append("exact")
        retained |= r
        total += c

    deleted = set(problem.nodes) - retained
    recon: dict[str, str] = {}
    best_parent: dict[str, tuple[float, str]] = {}
    for e in problem.edges:
        if e.child in deleted and e.parent in retained:
            cand = (problem.recon_cost(e), e.parent)
            if e.child not in best_parent or cand < best_parent[e.child]:
                best_parent[e.child] = cand
    for child, (_c, parent) in best_parent.items():
        recon[child] = parent
    return Solution(
        retained=retained,
        deleted=deleted,
        reconstruction=recon,
        total_cost=total,
        method="+".join(sorted(set(used))) if used else "exact",
    )


def brute_force(problem: OptProblem) -> Solution:
    """Exhaustive reference solver for tests (≤ ~15 nodes)."""
    names = sorted(problem.nodes)
    parents: dict[str, list[OptEdge]] = {n: [] for n in names}
    for e in problem.edges:
        parents[e.child].append(e)
    best: tuple[float, set[str]] | None = None
    for mask in range(1 << len(names)):
        retained = {names[i] for i in range(len(names)) if mask >> i & 1}
        total = 0.0
        ok = True
        for v in names:
            if v in retained:
                total += problem.retain_cost(v)
            else:
                opts = [
                    problem.recon_cost(e)
                    for e in parents[v]
                    if e.parent in retained
                ]
                if not opts:
                    ok = False
                    break
                total += min(opts)
        if ok and (best is None or total < best[0] - 1e-12):
            best = (total, retained)
    assert best is not None, "all-retained is always feasible"
    cost, retained = best
    deleted = set(names) - retained
    recon = {}
    for v in deleted:
        opts = [
            (problem.recon_cost(e), e.parent)
            for e in parents[v]
            if e.parent in retained
        ]
        recon[v] = min(opts)[1]
    return Solution(
        retained=retained,
        deleted=deleted,
        reconstruction=recon,
        total_cost=cost,
        method="brute",
    )


def gdpr_row_scan_savings(
    problem: OptProblem, solution: Solution, *, weekly_accesses: float = 1.0
) -> float:
    """Monthly full-table row scans avoided by deletion (Table 7).

    §1: every privacy-initiated access is a full table scan; deleting a
    dataset saves ``rows × weekly accesses × 52/12`` scans per month.
    """
    monthly = weekly_accesses * 52.0 / 12.0
    return sum(
        problem.nodes[v].num_rows * monthly for v in solution.deleted
    )
