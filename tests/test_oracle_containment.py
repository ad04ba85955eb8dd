"""Oracle-checked containment queries over the TPC-H-lite generators.

Exercises the provided ``repro.synth_data`` tables through the same
Spark join machinery the pipeline uses, with every result validated
against DuckDB via ``repro.oracle.assert_equivalent``.
"""
from __future__ import annotations

import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.core.clp import _null_safe_eq
from repro.oracle import assert_equivalent

SF = 0.002


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=SF, seed=0)


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=SF, seed=1)


class TestSemiJoinContainment:
    def test_filtered_subset_fully_contained(self, spark, li):
        """SELECT...WHERE child of lineitem: semi-join count == child
        count, per DuckDB."""
        child = li.where(F.col("l_quantity") <= 10)
        common = li.columns
        c = child.alias("c")
        p = li.alias("p")
        got = c.join(p, on=_null_safe_eq(c, p, common), how="left_semi").agg(
            F.count(F.lit(1)).alias("matched")
        )
        li_pdf = li.toPandas()
        eqs = " AND ".join(f'p."{x}" = c."{x}"' for x in common)
        assert_equivalent(
            got,
            "SELECT count(*) AS matched FROM "
            "(SELECT * FROM li WHERE l_quantity <= 10) c "
            f"WHERE EXISTS (SELECT 1 FROM li p WHERE {eqs})",
            li=li_pdf,
        )

    def test_anti_join_counts_foreign_rows(self, spark, li):
        shifted = li.withColumn(
            "l_extendedprice", F.col("l_extendedprice") + F.lit(1e7)
        )
        common = li.columns
        c = shifted.alias("c")
        p = li.alias("p")
        got = c.join(p, on=_null_safe_eq(c, p, common), how="left_anti").agg(
            F.count(F.lit(1)).alias("n_foreign")
        )
        li_pdf = li.toPandas()
        eqs = " AND ".join(f'p."{x}" = c."{x}"' for x in common)
        assert_equivalent(
            got,
            "SELECT count(*) AS n_foreign FROM "
            "(SELECT * REPLACE (l_extendedprice + 10000000 AS l_extendedprice) "
            "FROM li) c "
            f"WHERE NOT EXISTS (SELECT 1 FROM li p WHERE {eqs})",
            li=li_pdf,
        )

    def test_projection_distinct_counts(self, spark, orders):
        got = (
            orders.select("o_orderpriority")
            .distinct()
            .agg(F.count(F.lit(1)).alias("n"))
        )
        assert_equivalent(
            got,
            "SELECT count(*) AS n FROM "
            "(SELECT DISTINCT o_orderpriority FROM o)",
            o=orders.toPandas(),
        )

    def test_join_key_containment_fraction(self, spark, li, orders):
        """Fraction of lineitem orderkeys present in orders, oracle-
        checked (the column-level signal JOSIE/LCJoin rely on)."""
        li_keys = li.select(F.col("l_orderkey").alias("k")).distinct()
        o_keys = orders.select(F.col("o_orderkey").alias("k")).distinct()
        got = (
            li_keys.join(o_keys, on="k", how="left_semi")
            .agg(F.count(F.lit(1)).alias("matched"))
        )
        assert_equivalent(
            got,
            "SELECT count(*) AS matched FROM "
            "(SELECT DISTINCT l_orderkey AS k FROM li) lk "
            "WHERE EXISTS (SELECT 1 FROM o WHERE o.o_orderkey = lk.k)",
            li=li.toPandas(),
            o=orders.toPandas(),
        )


class TestSynthDataShape:
    def test_lineitem_row_count_scales(self, spark):
        df = synth_data.lineitem(spark, sf=0.001, seed=0)
        assert df.count() == 6000

    def test_orders_keys_unique(self, orders):
        n = orders.count()
        assert orders.select("o_orderkey").distinct().count() == n

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, seed=3)
        top = (
            df.groupBy("k").count().orderBy(F.desc("count")).limit(1)
            .collect()[0]["count"]
        )
        assert top > 5000 / 100 * 3  # far above uniform share

    def test_generators_deterministic(self, spark):
        a = synth_data.customer(spark, sf=0.002, seed=2).toPandas()
        b = synth_data.customer(spark, sf=0.002, seed=2).toPandas()
        import pandas as pd

        pd.testing.assert_frame_equal(a, b)
