"""Integration tests: the per-table harnesses reproduce the paper's
table *structure and qualitative shape* at tiny scale.

These are the same functions the jobs and benchmarks call; absolute
numbers are laptop-scale, the assertions check the properties the paper
claims (Not-detected = 0 everywhere, monotone pruning, SGB fastest,
GT slowest, parameter monotonicity, positive savings).
"""
from __future__ import annotations

import pytest

from repro.experiments import tables as T

SCALE = 0.5
SEED = 0


@pytest.fixture(scope="module")
def t1(spark):
    return T.table1_rows(spark, scale=SCALE, seed=SEED)


@pytest.fixture(scope="module")
def t2(spark):
    return T.table2_rows(spark, scale=SCALE, seed=SEED)


class TestTable1:
    def test_three_customers_three_rows_each(self, t1):
        assert len(t1) == 9
        assert {r["Data"] for r in t1} == set(T.ENTERPRISE)

    def test_not_detected_always_zero(self, t1):
        for r in t1:
            if r["Number of edges"] == "Not detected":
                for stage in ("SGB", "MMP", "CLP"):
                    assert r[f"Graph after {stage}"] == 0

    def test_correct_edges_constant_across_stages(self, t1):
        for r in t1:
            if r["Number of edges"] == "Correct":
                assert (
                    r["Graph after SGB"]
                    == r["Graph after MMP"]
                    == r["Graph after CLP"]
                )

    def test_incorrect_edges_shrink(self, t1):
        for r in t1:
            if r["Number of edges"] == "Incorrect (<1)":
                assert (
                    r["Graph after SGB"]
                    >= r["Graph after MMP"]
                    >= r["Graph after CLP"]
                )

    def test_pipeline_finds_containment(self, t1):
        correct = [
            r["Graph after CLP"] for r in t1 if r["Number of edges"] == "Correct"
        ]
        assert sum(correct) > 0


class TestTable2:
    def test_two_lakes(self, t2):
        assert {r["Data"] for r in t2} == set(T.SYNTHETIC)

    def test_same_invariants_as_table1(self, t2):
        for r in t2:
            kind = r["Number of edges"]
            if kind == "Not detected":
                assert r["Graph after CLP"] == 0
            if kind == "Incorrect (<1)":
                assert r["Graph after SGB"] >= r["Graph after CLP"]


class TestTable3:
    @pytest.fixture(scope="class")
    def t3(self, spark):
        return T.table3_rows(
            spark, scale=SCALE, seed=SEED, lakes=("customer1", "table_union")
        )

    def test_five_methods(self, t3):
        assert [r["Method"] for r in t3] == [
            "Ground Truth Schema",
            "SGB (E1 edges)",
            "Ground Truth Content",
            "MMP (E2 edges)",
            "CLP",
        ]

    def test_gt_content_dominates_everything(self, t3):
        by = {r["Method"]: r for r in t3}
        for lake in ("customer1", "table_union"):
            assert (
                by["Ground Truth Content"][lake] > by["CLP"][lake]
            )
            assert by["CLP"][lake] > by["MMP (E2 edges)"][lake]

    def test_complexity_strings_present(self, t3):
        assert all(r["Complexity"] for r in t3)


class TestTable4:
    @pytest.fixture(scope="class")
    def t4(self, spark):
        return T.table4_rows(
            spark, scale=SCALE, seed=SEED, lakes=("customer1",)
        )

    def test_three_methods(self, t4):
        assert {r["Method"] for r in t4} == {"[3]", "KMeans", "SGB"}

    def test_sgb_perfect_recall(self, t4):
        sgb = next(r for r in t4 if r["Method"] == "SGB")
        assert sgb["Not Detected"] == 0

    def test_baselines_not_better_than_sgb(self, t4):
        sgb = next(r for r in t4 if r["Method"] == "SGB")
        for r in t4:
            assert r["Correctly Identified"] <= sgb["Correctly Identified"]
            assert r["Not Detected"] >= sgb["Not Detected"]


class TestTable5:
    @pytest.fixture(scope="class")
    def t5(self, spark):
        return T.table5_rows(
            spark, scale=SCALE, seed=SEED, lakes=("customer1",),
            ground_truth_mode="spark",
        )

    def test_methods_present(self, t5):
        assert [r["Method"] for r in t5] == [
            "Ground Truth", "SGB", "MMP", "CLP", "Ours (Total)"
        ]

    def test_sgb_fastest_gt_slowest(self, t5):
        by = {r["Method"]: r["customer1"] for r in t5}
        assert by["SGB"] < by["CLP"]
        assert by["Ground Truth"] > by["SGB"]
        # The headline: the pipeline beats brute force.
        assert by["Ours (Total)"] < by["Ground Truth"]

    def test_total_is_sum_of_stages(self, t5):
        by = {r["Method"]: r["customer1"] for r in t5}
        assert by["Ours (Total)"] == pytest.approx(
            by["SGB"] + by["MMP"] + by["CLP"], abs=0.01
        )


class TestTable6:
    @pytest.fixture(scope="class")
    def t6(self, spark):
        return T.table6_rows(
            spark, scale=SCALE, seed=SEED, lake_name="customer2",
            s_values=(1, 4), t_values=(5, 30),
        )

    def test_grid_shape(self, t6):
        assert [r["s/t"] for r in t6] == [1, 4]
        assert set(t6[0]) == {"s/t", "5", "30"}

    def test_more_rows_fewer_incorrect(self, t6):
        """The paper's Table 6 trend: t up -> incorrect edges down."""
        for r in t6:
            assert r["30"] <= r["5"]

    def test_more_cols_not_worse(self, t6):
        by_s = {r["s/t"]: r for r in t6}
        assert by_s[4]["30"] <= by_s[1]["30"] + 2


class TestTable7:
    @pytest.fixture(scope="class")
    def t7(self, spark):
        return T.table7_rows(
            spark, scale=SCALE, seed=SEED, lakes=("customer1", "customer2")
        )

    def test_rows_per_lake(self, t7):
        assert {r["Data"] for r in t7} == {"customer1", "customer2"}

    def test_nodes_partitioned(self, spark, t7):
        for r in t7:
            ev = T.eval_lake(spark, r["Data"], scale=SCALE, seed=SEED)
            assert (
                r["Deletion Nodes"] + r["Retention Nodes"]
                == len(ev.catalog.names())
            )

    def test_retention_edges_bounded_by_deleted_nodes(self, t7):
        for r in t7:
            assert r["Retention Edges"] <= r["Deletion Nodes"]

    def test_savings_positive_when_deleting(self, t7):
        for r in t7:
            if r["Deletion Nodes"] > 0:
                assert r["GDPR Savings (row scans/month)"] > 0


class TestFormatting:
    def test_format_rows_markdown(self):
        md = T.format_rows([{"a": 1, "b": "x"}])
        assert md.splitlines()[0] == "| a | b |"
        assert "| 1 | x |" in md

    def test_empty(self):
        assert T.format_rows([]) == "(no rows)"
