"""Tests for the KMeans schema-clustering baseline (§6.4.1, Table 4)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.baselines.embeddings import DIM, embed_column, embed_schema
from repro.baselines.kmeans_schema import kmeans, kmeans_schema_graph
from repro.groundtruth.schema_gt import ground_truth_schema_graph


def _schemas(d):
    return {k: frozenset(v.split()) for k, v in d.items()}


class TestEmbeddings:
    def test_unit_norm(self):
        v = embed_column("customer_id")
        assert np.linalg.norm(v) == pytest.approx(1.0)

    def test_deterministic(self):
        assert np.allclose(embed_column("price"), embed_column("price"))

    def test_different_names_differ(self):
        assert not np.allclose(embed_column("price"), embed_column("region"))

    def test_similar_names_closer_than_dissimilar(self):
        base = embed_column("user_id")
        near = embed_column("userid")
        far = embed_column("timestamp")
        assert np.dot(base, near) > np.dot(base, far)

    def test_schema_embedding_is_mean(self):
        s = frozenset({"a_col", "b_col"})
        expected = (embed_column("a_col") + embed_column("b_col")) / 2
        assert np.allclose(embed_schema(s), expected)

    def test_empty_schema_zero_vector(self):
        assert np.allclose(embed_schema(frozenset()), np.zeros(DIM))


class TestKMeans:
    def test_separates_obvious_clusters(self):
        g = np.random.default_rng(0)
        a = g.normal(0, 0.1, (20, 2))
        b = g.normal(10, 0.1, (20, 2))
        labels = kmeans(np.vstack([a, b]), k=2, seed=1)
        assert len(set(labels[:20])) == 1
        assert len(set(labels[20:])) == 1
        assert labels[0] != labels[20]

    def test_k_clamped_to_n(self):
        pts = np.array([[0.0, 0.0], [1.0, 1.0]])
        labels = kmeans(pts, k=10, seed=0)
        assert len(labels) == 2

    def test_deterministic_given_seed(self):
        g = np.random.default_rng(2)
        pts = g.normal(0, 1, (30, 4))
        assert np.array_equal(
            kmeans(pts, 3, seed=5), kmeans(pts, 3, seed=5)
        )


class TestKMeansSchemaGraph:
    SCHEMAS = _schemas(
        {
            "orders_full": "order_id user_id amount ts status region",
            "orders_slim": "order_id user_id amount",
            "orders_tiny": "order_id amount",
            "events_full": "event_id session_id kind ts device country",
            "events_slim": "event_id session_id kind",
            "misc": "alpha beta",
        }
    )

    def test_within_cluster_edges_are_true_containments(self):
        res = kmeans_schema_graph(self.SCHEMAS, k=2, seed=0)
        for p, c in res.graph.edge_list():
            assert self.SCHEMAS[c] <= self.SCHEMAS[p]

    def test_predictions_subset_of_ground_truth(self):
        gt = ground_truth_schema_graph(self.SCHEMAS).edges
        res = kmeans_schema_graph(self.SCHEMAS, k=2, seed=0)
        assert set(res.graph.edge_list()) <= gt

    def test_labels_cover_all_tables(self):
        res = kmeans_schema_graph(self.SCHEMAS, k=2, seed=0)
        assert set(res.labels) == set(self.SCHEMAS)

    def test_empty_input(self):
        res = kmeans_schema_graph({})
        assert res.graph.num_edges == 0

    def test_misses_edges_on_lake(self, small_lake, small_lake_gt):
        """The Table 4 story: hard partitions lose cross-cluster edges,
        so KMeans recall <= SGB recall (SGB == 100%)."""
        schema_gt, _ = small_lake_gt
        schemas = small_lake.catalog.schemas()
        res = kmeans_schema_graph(schemas, seed=0)
        predicted = set(res.graph.edge_list())
        gt = schema_gt.edges
        assert predicted <= gt
        missed = len(gt - predicted)
        from repro.core.sgb import build_schema_graph

        sgb_missed = len(gt - set(build_schema_graph(schemas).graph.edge_list()))
        assert sgb_missed == 0
        assert missed >= sgb_missed
