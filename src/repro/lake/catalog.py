"""Data-lake catalog substrate.

Simulates the enterprise setting: a lake of Parquet tables (ADLS Gen2 in
the paper, local filesystem here) addressed by name, with the metadata
the pipeline is allowed to consult cheaply — flattened schema set,
row count, and byte size. Spark reads go through the catalog so every
stage operates on ``DataFrame``s exactly as the paper's Spark jobs do.
"""
from __future__ import annotations

import os
from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession

from ..core.schema_set import SchemaSet, flatten_schema


@dataclass
class TableMeta:
    """Catalog entry for one dataset in the lake."""

    name: str
    path: str | None
    schema_set: SchemaSet
    num_rows: int
    size_bytes: int
    #: provenance hint: (transform_name, source_table) when this table was
    #: derived by the lake generator; plays the role of the paper's §5.1
    #: "human expert" knowledge of the generating transformation.
    provenance: tuple[str, str] | None = None


@dataclass
class Catalog:
    """Name -> table registry backed by Parquet files or in-memory frames."""

    spark: SparkSession
    tables: dict[str, TableMeta] = field(default_factory=dict)
    _frames: dict[str, DataFrame] = field(default_factory=dict)

    def add_parquet(
        self,
        name: str,
        df: DataFrame,
        root: str,
        provenance: tuple[str, str] | None = None,
    ) -> TableMeta:
        """Write ``df`` to ``<root>/<name>`` as Parquet and register it."""
        path = os.path.join(root, name)
        # Spark's default INT96 timestamps carry no footer statistics;
        # TIMESTAMP_MICROS does, and partition-level min/max metadata is
        # exactly what §4.2's pruning relies on in the enterprise lake.
        self.spark.conf.set(
            "spark.sql.parquet.outputTimestampType", "TIMESTAMP_MICROS"
        )
        df.write.mode("overwrite").parquet(path)
        stored = self.spark.read.parquet(path)
        meta = TableMeta(
            name=name,
            path=path,
            schema_set=flatten_schema(stored.schema),
            num_rows=stored.count(),
            size_bytes=_dir_bytes(path),
            provenance=provenance,
        )
        self.tables[name] = meta
        self._frames[name] = stored
        return meta

    def add_frame(
        self,
        name: str,
        df: DataFrame,
        provenance: tuple[str, str] | None = None,
    ) -> TableMeta:
        """Register an in-memory DataFrame (no Parquet backing).

        Used by unit tests that don't need footer metadata; byte size is
        approximated from the row count so the optimizer still has a
        nonzero S_v.
        """
        n = df.count()
        meta = TableMeta(
            name=name,
            path=None,
            schema_set=flatten_schema(df.schema),
            num_rows=n,
            size_bytes=max(1, n * 64),
            provenance=provenance,
        )
        self.tables[name] = meta
        self._frames[name] = df
        return meta

    def df(self, name: str) -> DataFrame:
        return self._frames[name]

    def meta(self, name: str) -> TableMeta:
        return self.tables[name]

    def names(self) -> list[str]:
        return sorted(self.tables)

    def schemas(self) -> dict[str, SchemaSet]:
        return {n: m.schema_set for n, m in self.tables.items()}

    def total_bytes(self) -> int:
        return sum(m.size_bytes for m in self.tables.values())


def _dir_bytes(path: str) -> int:
    total = 0
    for dirpath, _dirs, files in os.walk(path):
        for f in files:
            if not f.startswith(("_", ".")):
                total += os.path.getsize(os.path.join(dirpath, f))
    return total
