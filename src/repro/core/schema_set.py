"""Schema sets: flattened column-token sets and schema containment.

The paper (§4.1, step 1) represents each dataset's schema as a *set* of
flattened column tokens. Flat schemas flatten to their column names; tree
schemas (nested structs, typical in enterprise event logs) flatten to
dotted paths, e.g. a struct ``product`` with fields ``price`` and ``id``
becomes ``{"product.price", "product.id"}``.

Containment fraction between schema sets follows §3:
``CM(A, B) = |A ∩ B| / |A|`` — the fraction of A's tokens present in B.
"""
from __future__ import annotations

from pyspark.sql.types import ArrayType, DataType, MapType, StructType

SchemaSet = frozenset[str]


def flatten_schema(schema: StructType, prefix: str = "") -> SchemaSet:
    """Flatten a (possibly nested) Spark schema into a set of dotted tokens.

    Struct fields recurse into ``parent.child`` tokens; arrays of structs
    recurse through the element type (the array itself adds no token);
    leaf fields contribute their dotted path. Tokens are distinct by
    construction of dotted paths.
    """
    out: set[str] = set()
    for field in schema.fields:
        path = f"{prefix}{field.name}"
        out |= _flatten_type(field.dataType, path)
    return frozenset(out)


def _flatten_type(dt: DataType, path: str) -> set[str]:
    if isinstance(dt, StructType):
        out: set[str] = set()
        for field in dt.fields:
            out |= _flatten_type(field.dataType, f"{path}.{field.name}")
        return out
    if isinstance(dt, ArrayType):
        return _flatten_type(dt.elementType, path)
    if isinstance(dt, MapType):
        # Map values are opaque at schema level; the map column is a leaf.
        return {path}
    return {path}


def schema_set_of(columns) -> SchemaSet:
    """Build a schema set from an iterable of (already flat) column names."""
    return frozenset(columns)


def schema_containment_fraction(a: SchemaSet, b: SchemaSet) -> float:
    """``CM(a, b) = |a ∩ b| / |a|`` — fraction of ``a``'s tokens in ``b``."""
    if not a:
        return 1.0
    return len(a & b) / len(a)


def schema_contained(a: SchemaSet, b: SchemaSet) -> bool:
    """Exact schema containment: every token of ``a`` appears in ``b``."""
    return a <= b
