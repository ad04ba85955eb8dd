"""Directed containment graph and ground-truth-relative edge accounting.

Nodes are dataset names. A directed edge ``x -> y`` encodes the hypothesis
"y is contained in x" (``y ⊆ x``): at the SGB stage it means
``y.schema ⊆ x.schema``; after MMP/CLP it means content containment with
high probability. Tables 1 and 2 of the paper classify every edge of the
graph after each stage against the ground-truth containment graph as
*correct* (GT containment fraction = 1), *incorrect (<1)* (anything less),
and count GT edges the stage graph misses as *not detected*.
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass
class ContainmentGraph:
    """A mutable directed graph over dataset names.

    ``edges`` maps parent -> set of children. An edge ``(parent, child)``
    asserts ``child ⊆ parent``.
    """

    nodes: set[str] = field(default_factory=set)
    edges: dict[str, set[str]] = field(default_factory=dict)

    def add_node(self, name: str) -> None:
        self.nodes.add(name)

    def add_edge(self, parent: str, child: str) -> None:
        """Add ``parent -> child`` (child contained in parent)."""
        self.nodes.add(parent)
        self.nodes.add(child)
        self.edges.setdefault(parent, set()).add(child)

    def remove_edge(self, parent: str, child: str) -> None:
        kids = self.edges.get(parent)
        if kids and child in kids:
            kids.discard(child)
            if not kids:
                del self.edges[parent]

    def has_edge(self, parent: str, child: str) -> bool:
        return child in self.edges.get(parent, ())

    def edge_list(self) -> list[tuple[str, str]]:
        """All edges as (parent, child), deterministically ordered."""
        return sorted(
            (p, c) for p, kids in self.edges.items() for c in kids
        )

    def parents_of(self, child: str) -> set[str]:
        return {p for p, kids in self.edges.items() if child in kids}

    def children_of(self, parent: str) -> set[str]:
        return set(self.edges.get(parent, ()))

    @property
    def num_edges(self) -> int:
        return sum(len(kids) for kids in self.edges.values())

    def copy(self) -> "ContainmentGraph":
        return ContainmentGraph(
            nodes=set(self.nodes),
            edges={p: set(kids) for p, kids in self.edges.items()},
        )


@dataclass(frozen=True)
class EdgeAccounting:
    """Per-stage edge classification vs ground truth (Tables 1 and 2)."""

    correct: int
    incorrect: int
    not_detected: int

    def as_row(self) -> dict[str, int]:
        return {
            "Correct": self.correct,
            "Incorrect (<1)": self.incorrect,
            "Not detected": self.not_detected,
        }


def account_edges(
    graph: ContainmentGraph, gt_edges: set[tuple[str, str]]
) -> EdgeAccounting:
    """Classify ``graph``'s edges against the ground-truth edge set.

    ``gt_edges`` holds (parent, child) pairs with true containment
    fraction exactly 1. Edges present in both are *correct*; edges only
    in ``graph`` are *incorrect (<1)*; GT edges absent from ``graph`` are
    *not detected*.
    """
    present = set(graph.edge_list())
    correct = len(present & gt_edges)
    return EdgeAccounting(
        correct=correct,
        incorrect=len(present) - correct,
        not_detected=len(gt_edges - present),
    )
