"""Dynamic graph updates (§7.1): add a new dataset in O(N).

When a dataset ``v`` arrives, the full pipeline need not rerun:

1. check ``v`` against every cluster center (SGB state); join each
   containing cluster, or become a new center and sweep the other
   datasets once for membership — linear in N either way;
2. add schema-containment edges between ``v`` and its co-members (both
   directions: v may contain or be contained);
3. prune only the edges incident on ``v`` with MMP then CLP.

Deletion is the trivial case (drop the node and incident edges), also
provided for completeness.
"""
from __future__ import annotations

from dataclasses import dataclass

from .clp import content_level_prune
from .graph import ContainmentGraph
from .mmp import StatsProvider, min_max_prune
from .schema_set import SchemaSet, schema_contained
from .sgb import SchemaCluster, SGBResult


@dataclass
class DynamicUpdate:
    graph: ContainmentGraph
    #: edges incident on the new dataset that survived MMP+CLP.
    new_edges: list[tuple[str, str]]
    #: schema comparisons performed — linear in N (tested).
    comparisons: int


def add_dataset(
    sgb: SGBResult,
    graph: ContainmentGraph,
    catalog,
    schemas: dict[str, SchemaSet],
    name: str,
    *,
    s: int = 4,
    t: int = 10,
    seed: int = 0,
) -> DynamicUpdate:
    """Incrementally insert ``name`` (already registered in ``catalog``).

    Mutates ``sgb.clusters`` (the incremental SGB state) and returns an
    updated copy of ``graph`` with the surviving incident edges. The
    ground-truth recall argument of Theorem 4.1 carries over: ``v``
    joins every cluster whose center contains it, and any dataset whose
    schema relates to ``v`` shares a cluster with it.
    """
    sv = schemas[name]
    comparisons = 0
    candidate_members: set[str] = set()
    joined = False
    for cluster in sgb.clusters:
        comparisons += 1
        center_set = schemas[cluster.center]
        if len(sv) <= len(center_set) and schema_contained(sv, center_set):
            cluster.members.append(name)
            candidate_members.update(m for m in cluster.members if m != name)
            joined = True
    if not joined:
        cluster = SchemaCluster(center=name, members=[name])
        # One linear sweep: existing schemas contained in the new center
        # become members (they can only be smaller-or-equal sets).
        for other, so in schemas.items():
            if other == name:
                continue
            comparisons += 1
            if len(so) <= len(sv) and schema_contained(so, sv):
                cluster.members.append(other)
                candidate_members.add(other)
        sgb.clusters.append(cluster)

    incident = ContainmentGraph()
    incident.add_node(name)
    for other in sorted(candidate_members):
        so = schemas[other]
        if schema_contained(sv, so):
            incident.add_edge(other, name)
        if schema_contained(so, sv):
            incident.add_edge(name, other)

    provider = StatsProvider(catalog)
    pruned = min_max_prune(incident, provider)
    final = content_level_prune(
        pruned.graph, catalog, s=s, t=t, provider=provider, seed=seed
    )

    out = graph.copy()
    out.add_node(name)
    surviving = final.graph.edge_list()
    for p, c in surviving:
        out.add_edge(p, c)
    return DynamicUpdate(graph=out, new_edges=surviving, comparisons=comparisons)


def remove_dataset(graph: ContainmentGraph, name: str) -> ContainmentGraph:
    """Drop ``name`` and every incident edge from the containment graph."""
    out = ContainmentGraph()
    for node in graph.nodes:
        if node != name:
            out.add_node(node)
    for p, c in graph.edge_list():
        if name not in (p, c):
            out.add_edge(p, c)
    return out
