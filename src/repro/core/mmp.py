"""MMP — Min-Max Pruning (Algorithm 2, §4.2).

For every schema-graph edge ``x -> y`` (hypothesis: ``y ⊆ x``), compare
per-column minima/maxima over the common columns. Containment requires
``min(y.c) >= min(x.c)`` and ``max(y.c) <= max(x.c)`` for every common
column ``c``; any violation disproves containment and the edge is pruned.

Statistics come from Parquet footer metadata when the table is
Parquet-backed (see ``lake.parquet_stats``) — i.e. *zero* data scanned —
with a one-pass Spark aggregation fallback otherwise. By default only
numeric and timestamp columns participate (the paper's "statistical
min-max pruning on numerical columns"); Parquet string statistics may be
truncated by writers, so strings are opt-in.

A row-count guard rides along (also pure metadata): an edge whose child
has more rows than its parent cannot be exact containment under the
paper's ``n(B) >= n(A)`` convention, so it is pruned too.

MMP never prunes a truly contained edge: if ``y ⊆ x`` then every common
column of ``y`` has its range inside ``x``'s, and ``n(y) <= n(x)``.
"""
from __future__ import annotations

import datetime as _dt
from dataclasses import dataclass, field
from numbers import Number

from .graph import ContainmentGraph
from ..lake.catalog import Catalog
from ..lake.parquet_stats import (
    ColumnStats,
    TableStats,
    stats_from_parquet_metadata,
    stats_via_spark,
)


@dataclass
class MMPResult:
    graph: ContainmentGraph
    pruned: list[tuple[str, str]]
    #: edges examined — the paper's Table 3 counts MMP cost as E_1.
    edges_examined: int
    #: column-level min/max comparisons, a finer-grained counter.
    column_comparisons: int = 0


@dataclass
class StatsProvider:
    """Caches per-table column statistics, preferring Parquet footers.

    Mirrors the paper's note that caching columnar min/max "would improve
    the speed even further" — each table's stats are computed once per
    pipeline run regardless of how many edges touch it.
    """

    catalog: Catalog
    _cache: dict[str, TableStats] = field(default_factory=dict)

    def stats(self, name: str) -> TableStats:
        if name not in self._cache:
            meta = self.catalog.meta(name)
            if meta.path is not None:
                self._cache[name] = stats_from_parquet_metadata(meta.path)
            else:
                self._cache[name] = stats_via_spark(self.catalog.df(name))
        return self._cache[name]


def _kind(v) -> str | None:
    if isinstance(v, bool):
        return None  # booleans carry no useful range information
    if isinstance(v, Number):
        return "num"
    if isinstance(v, (_dt.datetime, _dt.date)):
        return "time"
    if isinstance(v, str):
        return "str"
    return None


def _comparable(a: ColumnStats, b: ColumnStats, include_strings: bool) -> bool:
    """Both stats present and of the same comparable family.

    Same-named columns can carry different types across lake tables;
    comparing a timestamp range against a numeric one would be
    meaningless (and raise), so such pairs are skipped rather than used
    to prune.
    """
    if a.min is None or a.max is None or b.min is None or b.max is None:
        return False
    kinds = {_kind(v) for v in (a.min, a.max, b.min, b.max)}
    if len(kinds) != 1 or None in kinds:
        return False
    return kinds != {"str"} or include_strings


def min_max_prune(
    graph: ContainmentGraph,
    provider: StatsProvider,
    *,
    include_strings: bool = False,
    check_row_counts: bool = True,
) -> MMPResult:
    """Run Algorithm 2 over ``graph``, returning the pruned graph.

    The input graph is not mutated; a pruned copy is returned along with
    the list of removed edges and the operation counters used by Table 3.
    """
    out = graph.copy()
    pruned: list[tuple[str, str]] = []
    edges = graph.edge_list()
    col_cmps = 0

    for parent, child in edges:
        if check_row_counts:
            if (
                provider.catalog.meta(child).num_rows
                > provider.catalog.meta(parent).num_rows
            ):
                out.remove_edge(parent, child)
                pruned.append((parent, child))
                continue
        ps, cs = provider.stats(parent), provider.stats(child)
        common = set(ps) & set(cs)
        for c in sorted(common):
            if not _comparable(ps[c], cs[c], include_strings):
                continue
            col_cmps += 1
            if cs[c].min < ps[c].min or cs[c].max > ps[c].max:
                out.remove_edge(parent, child)
                pruned.append((parent, child))
                break

    return MMPResult(
        graph=out,
        pruned=pruned,
        edges_examined=len(edges),
        column_comparisons=col_cmps,
    )
