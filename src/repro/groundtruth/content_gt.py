"""Brute-force ground-truth content containment (§6.2).

For every schema-containment edge ``x -> y``, the ground-truth
containment fraction ``CM(y, x) = |rows(y) ∩ rows(x)| / |rows(y)|`` is
computed over the common columns with *set* semantics: distinct child
rows matched against the parent via a null-safe ``left_semi`` join.

This is the "Ground Truth" baseline of §6.4.2 — conceptually each child
row is hashed and compared against every parent row, which is the
``Σ M_i·M_j`` cost the paper reports in Table 3 (the literal pairwise
count is returned as ``row_operations``; the Spark hash join merely
evaluates it faster than nested loops would).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import functions as F

from ..core.clp import _null_safe_eq
from ..core.graph import ContainmentGraph


@dataclass
class ContentGT:
    #: (parent, child) -> true containment fraction of child in parent.
    fractions: dict[tuple[str, str], float]
    #: GT containment edges: fraction == 1 (and parent has >= child rows).
    edges: set[tuple[str, str]]
    #: Table 3 "Ground Truth Content" cost: sum of M_parent * M_child.
    row_operations: int

    def graph(self) -> ContainmentGraph:
        g = ContainmentGraph()
        for p, c in self.edges:
            g.add_edge(p, c)
        return g


def containment_fraction(catalog, parent: str, child: str) -> float:
    """``CM(child, parent)`` over the pair's common columns via Spark."""
    common = sorted(
        catalog.meta(parent).schema_set & catalog.meta(child).schema_set
    )
    if not common:
        return 0.0
    sel = [F.col(f"`{c}`") for c in common]
    child_rows = catalog.df(child).select(*sel).distinct().alias("c")
    parent_rows = catalog.df(parent).select(*sel).alias("p")
    total = child_rows.count()
    if total == 0:
        return 1.0
    matched = child_rows.join(
        parent_rows, on=_null_safe_eq(child_rows, parent_rows, common), how="left_semi"
    ).count()
    return matched / total


def ground_truth_content(
    catalog, schema_graph: ContainmentGraph
) -> ContentGT:
    """Evaluate every schema-graph edge's true containment fraction."""
    fractions: dict[tuple[str, str], float] = {}
    edges: set[tuple[str, str]] = set()
    row_ops = 0
    for parent, child in schema_graph.edge_list():
        frac = containment_fraction(catalog, parent, child)
        fractions[(parent, child)] = frac
        row_ops += catalog.meta(parent).num_rows * catalog.meta(child).num_rows
        if frac == 1.0 and (
            catalog.meta(parent).num_rows >= catalog.meta(child).num_rows
        ):
            edges.add((parent, child))
    return ContentGT(fractions=fractions, edges=edges, row_operations=row_ops)


def containment_fraction_pandas(
    frames: dict, parent: str, child: str
) -> float:
    """Same semantics as :func:`containment_fraction`, on pandas frames.

    A per-edge inner merge over the common columns replaces the Spark
    ``left_semi`` join; tests assert both implementations agree (and the
    DuckDB oracle validates the Spark path). Used by the table
    harnesses, where ground truth is needed for *labels* only and a
    per-edge Spark job would dominate wall-clock.
    """
    p_pdf, c_pdf = frames[parent], frames[child]
    common = sorted(set(p_pdf.columns) & set(c_pdf.columns))
    if not common:
        return 0.0
    child_rows = c_pdf[common].drop_duplicates()
    if len(child_rows) == 0:
        return 1.0
    parent_rows = p_pdf[common].drop_duplicates()
    merged = child_rows.merge(parent_rows, on=common, how="inner")
    return len(merged.drop_duplicates()) / len(child_rows)


def ground_truth_content_pandas(
    frames: dict, schema_graph: ContainmentGraph
) -> ContentGT:
    """Brute-force ground truth over pandas copies of the lake tables."""
    fractions: dict[tuple[str, str], float] = {}
    edges: set[tuple[str, str]] = set()
    row_ops = 0
    rows = {name: len(pdf) for name, pdf in frames.items()}
    for parent, child in schema_graph.edge_list():
        frac = containment_fraction_pandas(frames, parent, child)
        fractions[(parent, child)] = frac
        row_ops += rows[parent] * rows[child]
        if frac == 1.0 and rows[parent] >= rows[child]:
            edges.add((parent, child))
    return ContentGT(fractions=fractions, edges=edges, row_operations=row_ops)
