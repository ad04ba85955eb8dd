"""Erdős–Rényi random containment graphs for solver scalability checks.

The paper's Fig. 6 measures OPT-RET solve time as (i) nodes grow with
fixed edge probability ``p`` and (ii) edges grow with fixed nodes.
Figures are out of scope for this reproduction, but the same sweep
drives ``tests/test_opt_scalability.py`` and ``benchmarks``; this module
builds the random OPT-RET instances (numpy-only — networkx is not
installed offline).
"""
from __future__ import annotations

import numpy as np

from .costs import CostParams, OptEdge, OptNode, OptProblem


def erdos_renyi_problem(
    n: int,
    p: float,
    *,
    seed: int = 0,
    params: CostParams = CostParams(),
) -> OptProblem:
    """Random OPT-RET instance: G(n, p) oriented low-index -> high-index.

    Orienting edges from lower to higher index keeps the graph acyclic
    (a containment DAG), matching what the R2D2 pipeline emits. Sizes
    are log-normal; access/maintenance frequencies are power-law, as in
    §6.7.
    """
    g = np.random.default_rng(seed)
    nodes: dict[str, OptNode] = {}
    for i in range(n):
        size_gb = float(np.round(g.lognormal(mean=-1.0, sigma=1.0), 4))
        nodes[f"v{i:04d}"] = OptNode(
            name=f"v{i:04d}",
            size_gb=size_gb,
            num_rows=max(1, int(size_gb * 1e6)),
            accesses_per_month=float(np.round(g.pareto(2.5) * 0.5, 3)),
            maintenance_per_month=52.0 / 12.0 + float(np.round(g.pareto(3.0), 3)),
        )
    edges: list[OptEdge] = []
    for i in range(n):
        for j in range(i + 1, n):
            if g.random() < p:
                parent, child = f"v{i:04d}", f"v{j:04d}"
                cost = (
                    params.read_per_gb * nodes[parent].size_gb
                    + params.write_per_gb * nodes[child].size_gb
                )
                lat = (
                    params.read_latency_s_per_gb * nodes[parent].size_gb
                    + params.write_latency_s_per_gb * nodes[child].size_gb
                )
                edges.append(
                    OptEdge(
                        parent=parent, child=child, recon_cost=cost, latency_s=lat
                    )
                )
    return OptProblem(params=params, nodes=nodes, edges=edges)
