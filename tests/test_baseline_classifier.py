"""Tests for the [3]-style related-tables classifier baseline (Table 4)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.baselines.related_classifier import (
    column_idf,
    pair_features,
    related_tables_baseline,
    train_logistic,
)
from repro.groundtruth.schema_gt import ground_truth_schema_graph


def _schemas(d):
    return {k: frozenset(v.split()) for k, v in d.items()}


class TestFeatures:
    def test_idf_rarer_columns_higher(self):
        schemas = _schemas({"a": "x y", "b": "x z", "c": "x w"})
        idf = column_idf(schemas)
        assert idf["x"] < idf["y"]
        assert idf["x"] == pytest.approx(0.0)

    def test_feature_vector_shape_and_bias(self):
        schemas = _schemas({"a": "x y", "b": "x y z"})
        idf = column_idf(schemas)
        f = pair_features(schemas["a"], schemas["b"], idf)
        assert f.shape == (5,)
        assert f[-1] == 1.0  # bias term

    def test_jaccard_feature(self):
        schemas = _schemas({"a": "x y", "b": "x y z w"})
        idf = column_idf(schemas)
        f = pair_features(schemas["a"], schemas["b"], idf)
        assert f[0] == pytest.approx(0.5)

    def test_identical_pair_max_similarity(self):
        schemas = _schemas({"a": "x y", "b": "x y"})
        idf = column_idf(schemas)
        f = pair_features(schemas["a"], schemas["b"], idf)
        assert f[0] == pytest.approx(1.0)


class TestLogistic:
    def test_learns_linearly_separable(self):
        g = np.random.default_rng(0)
        x = np.hstack([g.uniform(-1, 1, (200, 1)), np.ones((200, 1))])
        y = (x[:, 0] > 0).astype(float)
        model = train_logistic(x, y)
        acc = (model.predict(x) == y).mean()
        assert acc > 0.95

    def test_probabilities_in_unit_interval(self):
        g = np.random.default_rng(1)
        x = g.normal(0, 1, (50, 3))
        y = g.integers(0, 2, 50).astype(float)
        model = train_logistic(x, y)
        p = model.predict_proba(x)
        assert ((p >= 0) & (p <= 1)).all()


class TestBaselineEndToEnd:
    def test_on_small_lake(self, small_lake, small_lake_gt):
        """Classifier finds most edges but — unlike SGB — not all, and
        may emit false positives (Table 4's shape)."""
        schema_gt, _ = small_lake_gt
        schemas = small_lake.catalog.schemas()
        res = related_tables_baseline(schemas, schema_gt.edges, seed=0)
        correct = len(res.predicted_edges & schema_gt.edges)
        assert correct > 0
        # Candidate generation respects |child| <= |parent|.
        for parent, child in res.predicted_edges:
            assert len(schemas[child]) <= len(schemas[parent])

    def test_deterministic(self, small_lake, small_lake_gt):
        schema_gt, _ = small_lake_gt
        schemas = small_lake.catalog.schemas()
        r1 = related_tables_baseline(schemas, schema_gt.edges, seed=3)
        r2 = related_tables_baseline(schemas, schema_gt.edges, seed=3)
        assert r1.predicted_edges == r2.predicted_edges

    def test_candidates_respect_size_ordering(self):
        schemas = _schemas(
            {"big": "a b c d", "small": "a b", "other": "x y z"}
        )
        gt = ground_truth_schema_graph(schemas).edges
        res = related_tables_baseline(schemas, gt, seed=0)
        for parent, child in res.predicted_edges:
            assert len(schemas[child]) <= len(schemas[parent])
