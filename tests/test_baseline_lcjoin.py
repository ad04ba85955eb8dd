"""Tests for the modified LCJoin baseline and its documented failure
modes (§6.4.2, footnote 6)."""
from __future__ import annotations

import pandas as pd
import pytest
from hypothesis import given, settings, strategies as st

from repro.baselines.lcjoin import (
    lcjoin_columns_as_sets,
    lcjoin_rows_as_sets,
    set_containment_join,
)


class TestSetContainmentJoin:
    def test_simple_subset_found(self):
        r = {"r1": frozenset({1, 2})}
        s = {"s1": frozenset({1, 2, 3}), "s2": frozenset({4})}
        assert set_containment_join(r, s) == {("r1", "s1")}

    def test_equal_sets_found(self):
        r = {"r1": frozenset({1})}
        s = {"s1": frozenset({1})}
        assert set_containment_join(r, s) == {("r1", "s1")}

    def test_empty_r_set_contained_everywhere(self):
        r = {"r1": frozenset()}
        s = {"s1": frozenset({1}), "s2": frozenset()}
        assert set_containment_join(r, s) == {("r1", "s1"), ("r1", "s2")}

    def test_no_false_positives(self):
        r = {"r1": frozenset({1, 9})}
        s = {"s1": frozenset({1, 2, 3})}
        assert set_containment_join(r, s) == set()

    @given(
        r=st.dictionaries(
            st.text("rq", min_size=1, max_size=2),
            st.frozensets(st.integers(0, 12), max_size=8),
            max_size=6,
        ),
        s=st.dictionaries(
            st.text("sz", min_size=1, max_size=2),
            st.frozensets(st.integers(0, 12), max_size=8),
            max_size=6,
        ),
    )
    @settings(max_examples=100, deadline=None)
    def test_matches_brute_force(self, r, s):
        expected = {
            (rn, sn)
            for rn, rs in r.items()
            for sn, ss in s.items()
            if rs <= ss
        }
        assert set_containment_join(r, s) == expected


@pytest.fixture()
def june_may_catalog(make_catalog):
    """Footnote 6's counterexample: column-wise containment holds both
    ways but no row tuple is shared."""
    t1 = pd.DataFrame({"month": ["June", "May"], "day": [20, 12]})
    t2 = pd.DataFrame({"month": ["June", "May"], "day": [12, 20]})
    return make_catalog({"t1": t1, "t2": t2})


class TestColumnsAsSets:
    def test_footnote6_false_positive(self, june_may_catalog):
        """The columns-as-sets modification wrongly reports containment
        for the June/May tables — the paper's core criticism."""
        res = lcjoin_columns_as_sets(june_may_catalog)
        assert ("t1", "t2") in res.predicted_edges
        assert ("t2", "t1") in res.predicted_edges

    def test_r2d2_clp_correctly_rejects_footnote6(self, june_may_catalog):
        """R2D2's CLP, on the same pair, prunes both directions: row
        tuples are what matter."""
        from repro.core.clp import content_level_prune
        from repro.core.graph import ContainmentGraph

        g = ContainmentGraph()
        g.add_edge("t1", "t2")
        g.add_edge("t2", "t1")
        res = content_level_prune(g, june_may_catalog, s=2, t=10)
        assert res.graph.num_edges == 0

    def test_true_containment_also_reported(self, make_catalog):
        parent = pd.DataFrame({"a": [1, 2, 3], "b": ["x", "y", "z"]})
        child = parent.iloc[:2]
        cat = make_catalog({"p": parent, "c": child})
        res = lcjoin_columns_as_sets(cat)
        assert ("p", "c") in res.predicted_edges

    def test_mode_label(self, june_may_catalog):
        assert lcjoin_columns_as_sets(june_may_catalog).mode == "columns-as-sets"


class TestRowsAsSets:
    def test_misses_projection_containment(self, make_catalog):
        """A child that drops a column is truly contained, but tuples of
        different arity never match — the second failure the paper
        describes."""
        parent = pd.DataFrame(
            {"a": [1, 2, 3], "b": ["x", "y", "z"], "c": [7.0, 8.0, 9.0]}
        )
        child = parent[["a", "b"]]
        cat = make_catalog({"p": parent, "c": child})
        res = lcjoin_rows_as_sets(cat)
        assert ("p", "c") not in res.predicted_edges

    def test_detects_same_schema_row_subset(self, make_catalog):
        parent = pd.DataFrame({"a": [1, 2, 3], "b": ["x", "y", "z"]})
        child = parent.iloc[:2]
        cat = make_catalog({"p": parent, "c": child})
        res = lcjoin_rows_as_sets(cat)
        assert ("p", "c") in res.predicted_edges

    def test_rejects_footnote6(self, june_may_catalog):
        res = lcjoin_rows_as_sets(june_may_catalog)
        assert ("t1", "t2") not in res.predicted_edges
