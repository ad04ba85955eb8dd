"""Brute-force ground-truth schema containment graph (§6.2).

Compares the flattened schema sets of *all* dataset pairs — the paper's
"Ground Truth Schema" baseline with its binomial(N, 2) comparisons
(Table 3 row 1) — and emits every directed containment edge
larger-schema -> smaller-schema.
"""
from __future__ import annotations

from dataclasses import dataclass

from ..core.graph import ContainmentGraph
from ..core.schema_set import SchemaSet, schema_contained


@dataclass
class SchemaGT:
    graph: ContainmentGraph
    #: pairwise schema comparisons performed = C(N, 2) (Table 3).
    comparisons: int

    @property
    def edges(self) -> set[tuple[str, str]]:
        return set(self.graph.edge_list())


def ground_truth_schema_graph(schemas: dict[str, SchemaSet]) -> SchemaGT:
    """All-pairs schema containment; edge x -> y iff ``y.schema ⊆ x.schema``.

    Schema-equal pairs produce edges in both directions, consistently
    with SGB (each direction is a distinct content-containment
    hypothesis).
    """
    names = sorted(schemas)
    graph = ContainmentGraph()
    for n in names:
        graph.add_node(n)
    comparisons = 0
    for i in range(len(names)):
        for j in range(i + 1, len(names)):
            comparisons += 1
            a, b = names[i], names[j]
            sa, sb = schemas[a], schemas[b]
            if schema_contained(sb, sa):
                graph.add_edge(a, b)
            if schema_contained(sa, sb):
                graph.add_edge(b, a)
    return SchemaGT(graph=graph, comparisons=comparisons)
