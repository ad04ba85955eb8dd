"""KMeans schema-clustering baseline (§6.4.1, Table 4).

Embeds each table schema (average of hashed-trigram column embeddings),
clusters the embeddings with Lloyd's KMeans (numpy — sklearn is not
installed offline), then checks pairwise schema containment only
*within* clusters, as the paper's baseline does. Unlike SGB's
overlapping containment clusters, hard KMeans partitions can separate a
contained pair into different clusters, so this baseline misses edges —
the "Not Detected" column of Table 4.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from ..core.graph import ContainmentGraph
from ..core.schema_set import SchemaSet, schema_contained
from .embeddings import embed_schema


def kmeans(
    points: np.ndarray, k: int, *, seed: int = 0, iters: int = 50
) -> np.ndarray:
    """Lloyd's algorithm; returns the cluster label per row."""
    g = np.random.default_rng(seed)
    n = len(points)
    k = min(k, n)
    centers = points[g.choice(n, size=k, replace=False)].copy()
    labels = np.zeros(n, dtype=int)
    for it in range(iters):
        d = ((points[:, None, :] - centers[None, :, :]) ** 2).sum(axis=2)
        new_labels = d.argmin(axis=1)
        if it > 0 and np.array_equal(new_labels, labels):
            break
        labels = new_labels
        for c in range(k):
            mask = labels == c
            if mask.any():
                centers[c] = points[mask].mean(axis=0)
            else:
                centers[c] = points[g.integers(0, n)]
    return labels


@dataclass
class KMeansSchemaResult:
    graph: ContainmentGraph
    labels: dict[str, int]


def kmeans_schema_graph(
    schemas: dict[str, SchemaSet], *, k: int | None = None, seed: int = 0
) -> KMeansSchemaResult:
    """Build a schema graph via KMeans clusters + within-cluster checks."""
    names = sorted(schemas)
    if not names:
        return KMeansSchemaResult(graph=ContainmentGraph(), labels={})
    points = np.stack([embed_schema(schemas[n]) for n in names])
    if k is None:
        k = max(2, int(np.sqrt(len(names))))
    labels = kmeans(points, k, seed=seed)
    graph = ContainmentGraph()
    for n in names:
        graph.add_node(n)
    by_cluster: dict[int, list[str]] = {}
    for name, lab in zip(names, labels):
        by_cluster.setdefault(int(lab), []).append(name)
    for members in by_cluster.values():
        for i in range(len(members)):
            for j in range(i + 1, len(members)):
                a, b = members[i], members[j]
                sa, sb = schemas[a], schemas[b]
                if schema_contained(sb, sa):
                    graph.add_edge(a, b)
                if schema_contained(sa, sb):
                    graph.add_edge(b, a)
    return KMeansSchemaResult(
        graph=graph, labels={n: int(l) for n, l in zip(names, labels)}
    )
