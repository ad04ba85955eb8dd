"""LCJoin [9]-style set-containment join, modified as in §6.4.2.

LCJoin finds all pairs (R, S) with R ⊆ S between two collections of
sets. The paper applies it to table containment in two (both flawed)
ways, which we reproduce to demonstrate the failure modes:

- **columns-as-sets**: each column becomes a set of its distinct
  values; a table pair is reported when every child column is
  set-contained in some parent column. Inaccurate because column-wise
  containment ignores row-tuple alignment (the paper's June/May
  example: two tables can swap values across rows and still pass).
- **rows-as-sets**: each table becomes a set of full row tuples.
  Inaccurate in the other direction: a child whose schema is a strict
  subset of the parent's can never match, because its row tuples have
  a different arity than the parent's.

The core subset join uses the prefix-filter + inverted-index idea of
the original (sort elements by global frequency, probe the rarest
element's posting list), which is the optimisation LCJoin's
"list crosscutting" refines.
"""
from __future__ import annotations

from collections import defaultdict
from dataclasses import dataclass

from pyspark.sql import functions as F


def set_containment_join(
    collection_r: dict[str, frozenset],
    collection_s: dict[str, frozenset],
) -> set[tuple[str, str]]:
    """All (r, s) with ``R_r ⊆ S_s``, via rarest-element index probing.

    Builds an inverted index over the S collection; each R set probes
    only the posting list of its globally rarest element rather than
    comparing against every S set.
    """
    index: dict[object, set[str]] = defaultdict(set)
    for s_name, s_set in collection_s.items():
        for el in s_set:
            index[el].add(s_name)
    out: set[tuple[str, str]] = set()
    for r_name, r_set in collection_r.items():
        if not r_set:
            out.update((r_name, s_name) for s_name in collection_s)
            continue
        rarest = min(r_set, key=lambda el: len(index.get(el, ())))
        for s_name in index.get(rarest, ()):
            if r_set <= collection_s[s_name]:
                out.add((r_name, s_name))
    return out


@dataclass
class LCJoinResult:
    #: (parent, child) pairs the modified baseline claims are contained.
    predicted_edges: set[tuple[str, str]]
    mode: str


def _column_sets(catalog, name: str) -> dict[str, frozenset]:
    df = catalog.df(name)
    out: dict[str, frozenset] = {}
    for c in df.columns:
        vals = (
            df.select(F.col(f"`{c}`").cast("string").alias("v"))
            .distinct()
            .toPandas()["v"]
        )
        out[c] = frozenset(vals.dropna())
    return out


def lcjoin_columns_as_sets(catalog) -> LCJoinResult:
    """Columns-as-sets variant: child ⊆ parent iff every child column's
    value set is contained in *some* parent column's value set."""
    names = catalog.names()
    col_sets = {n: _column_sets(catalog, n) for n in names}
    predicted: set[tuple[str, str]] = set()
    for child in names:
        for parent in names:
            if parent == child:
                continue
            if len(col_sets[child]) > len(col_sets[parent]):
                continue
            ok = True
            for _c_name, c_set in col_sets[child].items():
                if not any(
                    c_set <= p_set for p_set in col_sets[parent].values()
                ):
                    ok = False
                    break
            if ok:
                predicted.add((parent, child))
    return LCJoinResult(predicted_edges=predicted, mode="columns-as-sets")


def lcjoin_rows_as_sets(catalog) -> LCJoinResult:
    """Rows-as-sets variant: tables as sets of full row tuples.

    Misses every projection-style containment (child with fewer
    columns), because tuples of different arity never compare equal —
    the failure the paper calls out.
    """
    names = catalog.names()
    row_sets: dict[str, frozenset] = {}
    for n in names:
        df = catalog.df(n)
        cols = sorted(df.columns)
        pdf = df.select(*[F.col(f"`{c}`").cast("string") for c in cols]).toPandas()
        row_sets[n] = frozenset(map(tuple, pdf.itertuples(index=False, name=None)))
    pairs = set_containment_join(row_sets, row_sets)
    predicted = {
        (parent, child) for child, parent in pairs if parent != child
    }
    return LCJoinResult(predicted_edges=predicted, mode="rows-as-sets")
