"""JOSIE [30]-style top-k overlap set similarity search (§6.4.2).

JOSIE finds, for a query column (as a set of distinct values), the k
candidate columns with the largest value overlap, using an inverted
index over column values with posting lists ordered to minimise reads.
The paper's point in §6.4.2 is that JOSIE targets *relatedness* of
individual columns, not table containment, so even a faithful top-k
overlap search cannot decide whether whole row tuples are contained —
reproduced here so the tests can demonstrate exactly that gap.
"""
from __future__ import annotations

from collections import defaultdict
from dataclasses import dataclass

from pyspark.sql import functions as F


@dataclass
class JosieIndex:
    """Inverted index: value -> posting list of (table, column) ids."""

    postings: dict[object, list[tuple[str, str]]]
    column_sets: dict[tuple[str, str], frozenset]


def build_index(catalog, *, max_distinct: int | None = None) -> JosieIndex:
    """Index every column of every table as a set of distinct values."""
    postings: dict[object, list[tuple[str, str]]] = defaultdict(list)
    column_sets: dict[tuple[str, str], frozenset] = {}
    for name in catalog.names():
        df = catalog.df(name)
        for c in df.columns:
            col = (
                df.select(F.col(f"`{c}`").cast("string").alias("v"))
                .distinct()
            )
            if max_distinct is not None:
                col = col.limit(max_distinct)
            vals = frozenset(col.toPandas()["v"].dropna())
            key = (name, c)
            column_sets[key] = vals
            for v in vals:
                postings[v].append(key)
    return JosieIndex(postings=dict(postings), column_sets=column_sets)


def top_k_overlap(
    index: JosieIndex, query: frozenset, k: int, *, exclude_table: str | None = None
) -> list[tuple[tuple[str, str], int]]:
    """Top-k columns by overlap with ``query``, by posting-list merge."""
    counts: dict[tuple[str, str], int] = defaultdict(int)
    for v in query:
        for key in index.postings.get(v, ()):
            if exclude_table is not None and key[0] == exclude_table:
                continue
            counts[key] += 1
    ranked = sorted(counts.items(), key=lambda kv: (-kv[1], kv[0]))
    return ranked[:k]


def josie_table_candidates(
    catalog, k: int = 10
) -> set[tuple[str, str]]:
    """Modified-JOSIE table-level heuristic, as §6.4.2 discusses.

    For each child table, every column issues a top-k overlap query;
    a parent is predicted when each child column finds some column of
    that parent in its top-k with overlap equal to the child column's
    cardinality (full column containment). This inherits LCJoin's
    columns-as-sets inaccuracy — deliberately, that is the baseline's
    documented failure mode.
    """
    index = build_index(catalog)
    by_table: dict[str, list[tuple[str, frozenset]]] = defaultdict(list)
    for (table, col), vals in index.column_sets.items():
        by_table[table].append((col, vals))
    predicted: set[tuple[str, str]] = set()
    names = catalog.names()
    for child in names:
        # parent -> how many child columns found a fully-containing
        # column of that parent.
        support: dict[str, int] = defaultdict(int)
        n_cols = len(by_table[child])
        for _col, vals in by_table[child]:
            hits = top_k_overlap(index, vals, k, exclude_table=child)
            seen_parents: set[str] = set()
            for (p_table, _p_col), overlap in hits:
                if overlap == len(vals) and p_table not in seen_parents:
                    support[p_table] += 1
                    seen_parents.add(p_table)
        for parent, cnt in support.items():
            if cnt == n_cols and n_cols > 0:
                predicted.add((parent, child))
    return predicted
