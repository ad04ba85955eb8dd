"""Dyn-Lin (§5.3, Theorem 5.1): O(N) dynamic program for line graphs.

When the pruned containment graph is a line (every parent has one child,
every child one parent — e.g. a chain of saved intermediate edits), the
recursion of §5.3 solves OPT-RET exactly in one forward pass plus a
backtracking pass:

    ALG[0] = R_0                       (the root must be retained)
    ALG[1] = min(R_1, A_1·C_{0,1}) + ALG[0]
    ALG[i] = min( R_i + ALG[i-1],
                  A_i·C_{i-1,i} + R_{i-1} + ALG[i-2] )

where ``R_i = (C_s + C_m·f_i)·S_i``. Equivalence with the general
branch-and-bound solver is asserted in the tests.
"""
from __future__ import annotations

from dataclasses import dataclass


@dataclass
class LineSolution:
    retained: list[int]
    deleted: list[int]
    total_cost: float


def solve_line(
    retain_costs: list[float], recon_costs: list[float]
) -> LineSolution:
    """Solve OPT-RET on a line graph ``0 -> 1 -> ... -> N-1``.

    ``retain_costs[i]`` is ``R_i``; ``recon_costs[i]`` (for i >= 1) is
    ``A_i · C_{i-1,i}``, the expected cost of reconstructing node ``i``
    from node ``i-1``. ``recon_costs[0]`` is ignored (the root has no
    parent).
    """
    n = len(retain_costs)
    if n == 0:
        return LineSolution(retained=[], deleted=[], total_cost=0.0)
    if len(recon_costs) != n:
        raise ValueError("retain_costs and recon_costs must align")

    alg = [0.0] * n
    #: choice[i]: True -> node i retained, False -> deleted.
    choice = [True] * n
    alg[0] = retain_costs[0]
    if n > 1:
        keep = retain_costs[1]
        drop = recon_costs[1]
        choice[1] = keep <= drop
        alg[1] = min(keep, drop) + alg[0]
    for i in range(2, n):
        keep = retain_costs[i] + alg[i - 1]
        drop = recon_costs[i] + retain_costs[i - 1] + alg[i - 2]
        if keep <= drop:
            alg[i] = keep
            choice[i] = True
        else:
            alg[i] = drop
            choice[i] = False

    # Backtrack: a deleted node i pins node i-1 retained and resumes the
    # optimal sub-solution at i-2; a retained node resumes at i-1.
    retained_set: set[int] = set()
    i = n - 1
    while i >= 0:
        if i == 0:
            retained_set.add(0)
            break
        if choice[i]:
            retained_set.add(i)
            i -= 1
        else:
            retained_set.add(i - 1)
            i -= 2
    retained = sorted(retained_set)
    deleted = [i for i in range(n) if i not in retained_set]
    return LineSolution(retained=retained, deleted=deleted, total_cost=alg[-1])
