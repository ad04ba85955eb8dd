"""CLP — Content-Level Pruning (Algorithm 3, §4.3).

For every surviving edge ``x -> y`` (hypothesis ``y ⊆ x``):

1. ``searchCols`` = sample of ``s`` common columns;
2. ``sY`` = up to ``t`` rows of the child selected by WHERE equality
   filters on the sampled columns (the paper's
   ``SELECT * FROM y WHERE col = value`` sampling — the filter values are
   taken from column *metadata* (the columnar minimum, guaranteed to
   occur in the data) so picking them needs no table scan, falling back
   to the child's first row otherwise);
3. left-anti join the sample against the parent over all common columns
   (null-safe): any surviving row is a child row absent from the parent,
   disproving containment, so the edge is pruned.

Because the sample is drawn from the child only, a truly contained edge
can never be pruned (every child row *is* in the parent); Theorem 4.2
bounds how many sampled rows are needed to catch a given containment
deficit with given confidence (see ``core.sampling``).
"""
from __future__ import annotations

import random
from dataclasses import dataclass

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from .graph import ContainmentGraph
from .mmp import StatsProvider


@dataclass
class CLPResult:
    graph: ContainmentGraph
    pruned: list[tuple[str, str]]
    #: Table 3 CLP cost: sum over examined edges of (parent rows x rows
    #: actually sampled) — each sampled row is matched against the parent.
    row_operations: int
    edges_examined: int


def _pick_filter_values(
    df: DataFrame,
    provider: StatsProvider | None,
    table: str,
    cols: list[str],
) -> dict[str, object]:
    """One observed value per search column, cheapest source first.

    Columnar minima from footer metadata are real data values, so they
    are used when available; otherwise one ``limit(1)`` row supplies the
    values (the paper's "sampling does not need to scan the full table").
    """
    values: dict[str, object] = {}
    missing: list[str] = []
    if provider is not None:
        stats = provider.stats(table)
        for c in cols:
            st = stats.get(c)
            if st is not None and st.min is not None:
                values[c] = st.min
            else:
                missing.append(c)
    else:
        missing = list(cols)
    if missing:
        head = df.select(*[F.col(f"`{c}`") for c in missing]).limit(1).collect()
        if head:
            row = head[0]
            for c in missing:
                values[c] = row[c]
    return values


def _null_safe_eq(left: DataFrame, right: DataFrame, cols: list[str]) -> Column:
    cond = None
    for c in cols:
        piece = left[c].eqNullSafe(right[c])
        cond = piece if cond is None else cond & piece
    return cond


def sample_child(
    child: DataFrame,
    search_cols: list[str],
    filter_values: dict[str, object],
    max_rows: int,
) -> DataFrame:
    """``sample(y, searchCols, maxRows=t)`` from Algorithm 3.

    OR-of-equalities over the search columns bounds the scan when the
    data is partitioned/indexed by those columns; ``limit`` caps the
    sample at ``t`` rows. Falls back to a bare ``limit(t)`` if the filter
    matched nothing (possible when metadata minima describe a column the
    filter combination over-restricts).

    The sample is collected to the driver (it is at most ``t`` rows by
    construction) and re-planned as a local relation, so the downstream
    anti-join runs as a single job instead of re-scanning the child.
    """
    filt = None
    for c in search_cols:
        if c not in filter_values:
            continue
        piece = F.col(f"`{c}`").eqNullSafe(F.lit(filter_values[c]))
        filt = piece if filt is None else filt | piece
    sampled = child.where(filt) if filt is not None else child
    rows = sampled.limit(max_rows).collect()
    if filt is not None and not rows:
        rows = child.limit(max_rows).collect()
    spark = child.sparkSession
    return spark.createDataFrame(rows, schema=child.schema)


def content_level_prune(
    graph: ContainmentGraph,
    catalog,
    *,
    s: int = 4,
    t: int = 10,
    provider: StatsProvider | None = None,
    seed: int = 0,
) -> CLPResult:
    """Run Algorithm 3 over ``graph`` using Spark DataFrame jobs.

    ``s`` = max search columns, ``t`` = max sampled rows (the paper lands
    on s=4, t=10 as the speed/accuracy sweet spot, Table 6). The input
    graph is not mutated.
    """
    out = graph.copy()
    pruned: list[tuple[str, str]] = []
    row_ops = 0
    edges = graph.edge_list()
    rng = random.Random(seed)

    for parent, child in edges:
        p_meta = catalog.meta(parent)
        c_meta = catalog.meta(child)
        common = sorted(p_meta.schema_set & c_meta.schema_set)
        if not common:
            continue
        search_cols = rng.sample(common, min(s, len(common)))
        child_df = catalog.df(child)
        parent_df = catalog.df(parent)

        values = _pick_filter_values(child_df, provider, child, search_cols)
        sampled = sample_child(child_df, search_cols, values, t).select(
            *[F.col(f"`{c}`") for c in common]
        )
        sampled_n = sampled.count()
        row_ops += p_meta.num_rows * max(sampled_n, 1)

        left = sampled.alias("sY")
        right = parent_df.select(*[F.col(f"`{c}`") for c in common]).alias("x")
        anti = left.join(right, on=_null_safe_eq(left, right, common), how="left_anti")
        if not anti.isEmpty():
            out.remove_edge(parent, child)
            pruned.append((parent, child))

    return CLPResult(
        graph=out,
        pruned=pruned,
        row_operations=row_ops,
        edges_examined=len(edges),
    )
