"""Tests for the modified JOSIE baseline (§6.4.2)."""
from __future__ import annotations

import pandas as pd
import pytest

from repro.baselines.josie import (
    build_index,
    josie_table_candidates,
    top_k_overlap,
)


@pytest.fixture()
def small_index(make_catalog):
    frames = {
        "t1": pd.DataFrame({"a": [1, 2, 3], "b": ["x", "y", "z"]}),
        "t2": pd.DataFrame({"a": [2, 3, 4], "c": ["p", "q", "r"]}),
        "t3": pd.DataFrame({"a": [1, 2, 3]}),
    }
    cat = make_catalog(frames)
    return build_index(cat), cat


class TestIndex:
    def test_all_columns_indexed(self, small_index):
        index, _ = small_index
        assert set(index.column_sets) == {
            ("t1", "a"), ("t1", "b"), ("t2", "a"), ("t2", "c"), ("t3", "a")
        }

    def test_postings_cover_values(self, small_index):
        index, _ = small_index
        assert ("t1", "a") in index.postings["2"]
        assert ("t2", "a") in index.postings["2"]

    def test_column_sets_are_distinct_values(self, make_catalog):
        cat = make_catalog({"t": pd.DataFrame({"a": [1, 1, 2]})})
        idx = build_index(cat)
        assert idx.column_sets[("t", "a")] == frozenset({"1", "2"})


class TestTopK:
    def test_overlap_ranking(self, small_index):
        index, _ = small_index
        ranked = top_k_overlap(
            index, frozenset({"1", "2", "3"}), k=5, exclude_table="t3"
        )
        by_key = dict(ranked)
        assert by_key[("t1", "a")] == 3
        assert by_key[("t2", "a")] == 2

    def test_k_truncates(self, small_index):
        index, _ = small_index
        ranked = top_k_overlap(index, frozenset({"1", "2", "3"}), k=1)
        assert len(ranked) == 1
        # Best overlap wins (t1.a or t3.a, both 3, tie by key order).
        assert ranked[0][1] == 3

    def test_exclude_table(self, small_index):
        index, _ = small_index
        ranked = top_k_overlap(
            index, frozenset({"1"}), k=10, exclude_table="t1"
        )
        assert all(key[0] != "t1" for key, _ in ranked)

    def test_disjoint_query_empty(self, small_index):
        index, _ = small_index
        assert top_k_overlap(index, frozenset({"zz"}), k=3) == []


class TestTableCandidates:
    def test_finds_column_contained_pair(self, make_catalog):
        parent = pd.DataFrame({"a": [1, 2, 3, 4], "b": ["w", "x", "y", "z"]})
        child = parent.iloc[:2]
        cat = make_catalog({"p": parent, "c": child})
        assert ("p", "c") in josie_table_candidates(cat)

    def test_footnote6_style_false_positive(self, make_catalog):
        """Column-level overlap cannot see row tuples: JOSIE's table
        modification wrongly accepts the swapped-values pair."""
        t1 = pd.DataFrame({"m": ["June", "May"], "d": [20, 12]})
        t2 = pd.DataFrame({"m": ["June", "May"], "d": [12, 20]})
        cat = make_catalog({"t1": t1, "t2": t2})
        cands = josie_table_candidates(cat)
        assert ("t1", "t2") in cands and ("t2", "t1") in cands

    def test_no_candidate_when_column_not_covered(self, make_catalog):
        a = pd.DataFrame({"x": [1, 2], "y": [9, 9]})
        b = pd.DataFrame({"x": [1, 2], "y": [7, 8]})
        cat = make_catalog({"a": a, "b": b})
        cands = josie_table_candidates(cat)
        assert ("b", "a") not in cands
        assert ("a", "b") not in cands
