"""Columnar min/max from Parquet footer metadata — no data scan.

§4.2 of the paper: "for datasets that are partitioned and stored in
parquet format, values such as the columnar minimum and maximum are often
stored as metadata. This makes looking up these values very fast, since a
full table scan is not necessary." This module is that lookup: it walks a
table's Parquet files and folds the per-row-group statistics from the
footers via pyarrow, touching only metadata pages.

A Spark-aggregation fallback (`stats_via_spark`) exists for tables that
are not Parquet-backed; the pipeline prefers footers when a path exists.
"""
from __future__ import annotations

import datetime as _dt
import math
import os
from dataclasses import dataclass

import pyarrow.parquet as pq
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


@dataclass(frozen=True)
class ColumnStats:
    """Min/max for one column (None when no non-null value was seen)."""

    min: object | None
    max: object | None


TableStats = dict[str, ColumnStats]


def _parquet_files(path: str) -> list[str]:
    files = []
    for dirpath, _dirs, names in os.walk(path):
        for n in names:
            if n.endswith(".parquet") and not n.startswith(("_", ".")):
                files.append(os.path.join(dirpath, n))
    return sorted(files)


def _norm(value):
    """Normalise footer stat values for cross-type comparability."""
    if isinstance(value, _dt.datetime):
        return value.replace(tzinfo=None)
    return value


def stats_from_parquet_metadata(path: str) -> TableStats:
    """Fold per-row-group footer statistics into table-level min/max.

    Only footers are read (``ParquetFile.metadata``), mirroring the
    paper's partition-metadata lookup. Columns whose row groups carry no
    statistics come back as ``ColumnStats(None, None)``.
    """
    mins: dict[str, object] = {}
    maxs: dict[str, object] = {}
    seen: set[str] = set()
    for f in _parquet_files(path):
        md = pq.ParquetFile(f).metadata
        for rg in range(md.num_row_groups):
            group = md.row_group(rg)
            for ci in range(group.num_columns):
                col = group.column(ci)
                name = col.path_in_schema
                seen.add(name)
                stats = col.statistics
                if stats is None or not stats.has_min_max:
                    continue
                lo, hi = _norm(stats.min), _norm(stats.max)
                if lo is not None and (name not in mins or lo < mins[name]):
                    mins[name] = lo
                if hi is not None and (name not in maxs or hi > maxs[name]):
                    maxs[name] = hi
    return {
        name: ColumnStats(mins.get(name), maxs.get(name)) for name in seen
    }


def stats_via_spark(df: DataFrame) -> TableStats:
    """Min/max per leaf column via one Spark aggregation pass.

    Fallback for frames with no Parquet backing; one job computes every
    column's extrema at once (a single scan, not one per column).
    """
    cols = df.columns
    aggs = []
    for c in cols:
        aggs.append(F.min(F.col(f"`{c}`")).alias(f"min__{c}"))
        aggs.append(F.max(F.col(f"`{c}`")).alias(f"max__{c}"))
    row = df.agg(*aggs).collect()[0]
    out: TableStats = {}
    for c in cols:
        out[c] = ColumnStats(_norm_py(row[f"min__{c}"]), _norm_py(row[f"max__{c}"]))
    return out


def _norm_py(v):
    if isinstance(v, _dt.datetime):
        return v.replace(tzinfo=None)
    if isinstance(v, float) and math.isnan(v):
        return None
    return v
