"""Cost model and §5.1 graph pre-processing for "safe deletion".

Prices mirror ADLS Gen2 hot-tier list prices (2023, rounded): storage
per GB-month, read/write per GB (write an order of magnitude above
read, which §5.1 notes lets ``C_e ≈ w·s_q`` when sizes are comparable).
Latency per GB for read/write stands in for the estimates the paper
derives from historical logs; only their product with dataset sizes
against the QoS threshold matters.

Pre-processing (§5.1) turns a containment graph into an OPT-RET input:

1. drop edges whose generating transformation is unknown — the lake
   generator's provenance plays the paper's human expert;
2. estimate reconstruction cost ``C_e ≈ r·s_p + w·s_q`` and latency
   ``L_e ≈ r_ℓ·s_p + w_ℓ·s_q``; drop edges with ``L_e ≥ Th``.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from ..core.graph import ContainmentGraph

_GB = float(1 << 30)


@dataclass(frozen=True)
class CostParams:
    """Price/latency constants (per GB unless stated)."""

    storage_per_gb_month: float = 0.0208  # C_s, ADLS hot LRS
    maintenance_per_gb_op: float = 0.01  # C_m, per maintenance op
    read_per_gb: float = 0.005  # r
    write_per_gb: float = 0.065  # w  (≈ 13x read, per §5.1)
    read_latency_s_per_gb: float = 2.0  # r_ℓ
    write_latency_s_per_gb: float = 4.0  # w_ℓ
    latency_threshold_s: float = 600.0  # Th (QoS bound)


@dataclass
class OptNode:
    name: str
    size_gb: float
    num_rows: int
    accesses_per_month: float  # A_v
    maintenance_per_month: float  # f_v

    def retain_cost(self, p: CostParams) -> float:
        """``(C_s + C_m·f_v)·S_v`` — monthly cost of keeping the node."""
        return (
            p.storage_per_gb_month
            + p.maintenance_per_gb_op * self.maintenance_per_month
        ) * self.size_gb


@dataclass
class OptEdge:
    parent: str
    child: str
    recon_cost: float  # C_e
    latency_s: float  # L_e


@dataclass
class OptProblem:
    """Pre-processed OPT-RET input: nodes, surviving edges, prices."""

    params: CostParams
    nodes: dict[str, OptNode]
    edges: list[OptEdge] = field(default_factory=list)

    def parents_of(self, child: str) -> list[OptEdge]:
        return [e for e in self.edges if e.child == child]

    def retain_cost(self, name: str) -> float:
        return self.nodes[name].retain_cost(self.params)

    def recon_cost(self, edge: OptEdge) -> float:
        """``A_v · C_e`` — expected monthly reconstruction spend."""
        return self.nodes[edge.child].accesses_per_month * edge.recon_cost


def edge_cost_latency(
    size_parent_gb: float, size_child_gb: float, p: CostParams
) -> tuple[float, float]:
    """``C_e ≈ r·s_p + w·s_q`` and ``L_e ≈ r_ℓ·s_p + w_ℓ·s_q`` (§5.1)."""
    cost = p.read_per_gb * size_parent_gb + p.write_per_gb * size_child_gb
    lat = (
        p.read_latency_s_per_gb * size_parent_gb
        + p.write_latency_s_per_gb * size_child_gb
    )
    return cost, lat


def transformation_known(catalog, parent: str, child: str) -> bool:
    """Whether the transformation behind edge parent->child is known.

    True when a provenance chain (recorded by the lake generator, our
    stand-in for the §5.1 human expert) connects the two tables in
    either derivation direction — e.g. the child was filtered from the
    parent, possibly through intermediates, or the parent was built by
    adding rows/columns to the child.
    """

    def ancestors(name: str) -> set[str]:
        out: set[str] = set()
        cur = name
        while True:
            prov = catalog.meta(cur).provenance
            if prov is None or prov[1] in out:
                return out
            out.add(prov[1])
            cur = prov[1]

    return parent in ancestors(child) or child in ancestors(parent)


def sample_access_profile(
    names: list[str],
    *,
    seed: int = 0,
    weekly_privacy_accesses: float = 1.0,
) -> dict[str, tuple[float, float]]:
    """Power-law (A_v, f_v) per dataset, as the paper does for synthetic
    data (§6.7), plus the guaranteed weekly privacy-initiated
    maintenance scan (§1) folded into f_v.
    """
    g = np.random.default_rng(seed)
    out: dict[str, tuple[float, float]] = {}
    monthly_privacy = weekly_privacy_accesses * 52.0 / 12.0
    for name in sorted(names):
        accesses = float(np.round(g.pareto(2.5) * 0.5, 3))
        maint = monthly_privacy + float(np.round(g.pareto(3.0), 3))
        out[name] = (accesses, maint)
    return out


def preprocess(
    graph: ContainmentGraph,
    catalog,
    access_profile: dict[str, tuple[float, float]],
    params: CostParams = CostParams(),
    *,
    require_known_transform: bool = True,
) -> OptProblem:
    """§5.1: build the OPT-RET input from a containment graph."""
    nodes: dict[str, OptNode] = {}
    for name in sorted(graph.nodes):
        meta = catalog.meta(name)
        a_v, f_v = access_profile.get(name, (0.0, 52.0 / 12.0))
        nodes[name] = OptNode(
            name=name,
            size_gb=meta.size_bytes / _GB,
            num_rows=meta.num_rows,
            accesses_per_month=a_v,
            maintenance_per_month=f_v,
        )
    edges: list[OptEdge] = []
    for parent, child in graph.edge_list():
        if require_known_transform and not transformation_known(
            catalog, parent, child
        ):
            continue
        cost, lat = edge_cost_latency(
            nodes[parent].size_gb, nodes[child].size_gb, params
        )
        if lat >= params.latency_threshold_s:
            continue
        edges.append(
            OptEdge(parent=parent, child=child, recon_cost=cost, latency_s=lat)
        )
    return OptProblem(params=params, nodes=nodes, edges=edges)
