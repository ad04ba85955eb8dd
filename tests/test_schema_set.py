"""Unit tests for schema-set flattening and schema containment (§4.1)."""
from __future__ import annotations

import pytest
from hypothesis import given, strategies as st
from pyspark.sql.types import (
    ArrayType,
    DoubleType,
    IntegerType,
    MapType,
    StringType,
    StructField,
    StructType,
)

from repro.core.schema_set import (
    flatten_schema,
    schema_containment_fraction,
    schema_contained,
    schema_set_of,
)


def _flat(*names: str) -> StructType:
    return StructType([StructField(n, StringType()) for n in names])


class TestFlattenFlat:
    def test_flat_columns(self):
        assert flatten_schema(_flat("a", "b", "c")) == {"a", "b", "c"}

    def test_empty_schema(self):
        assert flatten_schema(StructType([])) == frozenset()

    def test_single_column(self):
        assert flatten_schema(_flat("only")) == {"only"}

    def test_returns_frozenset(self):
        assert isinstance(flatten_schema(_flat("a")), frozenset)


class TestFlattenNested:
    def test_paper_example_product_tree(self):
        # §4.1 step 1: root `product` with children `price` and `id`.
        schema = StructType(
            [
                StructField(
                    "product",
                    StructType(
                        [
                            StructField("price", DoubleType()),
                            StructField("id", IntegerType()),
                        ]
                    ),
                )
            ]
        )
        assert flatten_schema(schema) == {"product.price", "product.id"}

    def test_two_level_nesting(self):
        schema = StructType(
            [
                StructField(
                    "a",
                    StructType(
                        [
                            StructField(
                                "b", StructType([StructField("c", StringType())])
                            )
                        ]
                    ),
                )
            ]
        )
        assert flatten_schema(schema) == {"a.b.c"}

    def test_mixed_flat_and_nested(self):
        schema = StructType(
            [
                StructField("x", IntegerType()),
                StructField(
                    "y", StructType([StructField("z", StringType())])
                ),
            ]
        )
        assert flatten_schema(schema) == {"x", "y.z"}

    def test_array_of_struct_recurses_through_element(self):
        schema = StructType(
            [
                StructField(
                    "events",
                    ArrayType(
                        StructType(
                            [
                                StructField("ts", StringType()),
                                StructField("kind", StringType()),
                            ]
                        )
                    ),
                )
            ]
        )
        assert flatten_schema(schema) == {"events.ts", "events.kind"}

    def test_array_of_scalar_is_leaf(self):
        schema = StructType([StructField("tags", ArrayType(StringType()))])
        assert flatten_schema(schema) == {"tags"}

    def test_map_is_leaf(self):
        schema = StructType(
            [StructField("attrs", MapType(StringType(), StringType()))]
        )
        assert flatten_schema(schema) == {"attrs"}

    def test_tokens_distinct_across_branches(self):
        # `a.v` from a struct and flat `a.v`-style names do not collide
        # with distinct branches.
        schema = StructType(
            [
                StructField("a", StructType([StructField("v", StringType())])),
                StructField("b", StructType([StructField("v", StringType())])),
            ]
        )
        assert flatten_schema(schema) == {"a.v", "b.v"}


class TestContainment:
    def test_subset_contained(self):
        assert schema_contained(schema_set_of("ab"), schema_set_of("abc"))

    def test_equal_contained(self):
        s = schema_set_of(["x", "y"])
        assert schema_contained(s, s)

    def test_superset_not_contained(self):
        assert not schema_contained(
            schema_set_of(["a", "b", "c"]), schema_set_of(["a", "b"])
        )

    def test_disjoint_not_contained(self):
        assert not schema_contained(
            schema_set_of(["a"]), schema_set_of(["b"])
        )

    def test_empty_contained_in_anything(self):
        assert schema_contained(frozenset(), schema_set_of(["a"]))


class TestContainmentFraction:
    @pytest.mark.parametrize(
        "a, b, expected",
        [
            ({"a", "b"}, {"a", "b", "c"}, 1.0),
            ({"a", "b"}, {"a"}, 0.5),
            ({"a", "b"}, {"c"}, 0.0),
            ({"a", "b", "c", "d"}, {"a", "b", "c"}, 0.75),
            (set(), {"a"}, 1.0),
        ],
    )
    def test_fraction_values(self, a, b, expected):
        assert schema_containment_fraction(
            frozenset(a), frozenset(b)
        ) == pytest.approx(expected)

    @given(
        a=st.frozensets(st.sampled_from("abcdefgh"), max_size=8),
        b=st.frozensets(st.sampled_from("abcdefgh"), max_size=8),
    )
    def test_fraction_in_unit_interval(self, a, b):
        frac = schema_containment_fraction(a, b)
        assert 0.0 <= frac <= 1.0

    @given(a=st.frozensets(st.sampled_from("abcdefgh"), max_size=8))
    def test_fraction_one_iff_contained_in_superset(self, a):
        b = a | {"zz"}
        assert schema_containment_fraction(a, b) == 1.0
        assert schema_contained(a, b)

    @given(
        a=st.frozensets(st.sampled_from("abcdefgh"), min_size=1, max_size=8),
        b=st.frozensets(st.sampled_from("abcdefgh"), max_size=8),
    )
    def test_fraction_one_equivalent_to_contained(self, a, b):
        assert (schema_containment_fraction(a, b) == 1.0) == schema_contained(a, b)


class TestSparkSchemaRoundTrip:
    def test_flatten_matches_dataframe_columns(self, spark):
        df = spark.createDataFrame([(1, "x", 2.0)], ["i", "s", "f"])
        assert flatten_schema(df.schema) == {"i", "s", "f"}

    def test_nested_dataframe(self, spark):
        df = spark.sql(
            "SELECT named_struct('price', 1.0, 'id', 2) AS product, 'a' AS tag"
        )
        assert flatten_schema(df.schema) == {
            "product.price",
            "product.id",
            "tag",
        }
