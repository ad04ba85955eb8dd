"""Bharadwaj et al. [3]-style related-tables classifier (§6.4.1, Table 4).

The paper's baseline builds per-pair feature vectors from schema
metadata — column-name similarity and column-name uniqueness — and
trains a classifier to predict whether containment exists, using
ground-truth schema-containment pairs as positives and random
non-contained pairs as negatives. We follow that recipe with a
logistic-regression classifier implemented in numpy (sklearn is not
installed offline; [3] trains "multiple classifiers" and reports the
best, and logistic regression is in that family).

As in the paper, the learned model is lossy: it can miss true edges
(Not Detected > 0 in Table 4) because name similarity is an imperfect
proxy for set containment.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from ..core.schema_set import SchemaSet


def pair_features(a: SchemaSet, b: SchemaSet, idf: dict[str, float]) -> np.ndarray:
    """Feature vector for an ordered pair (a=smaller/child, b=larger).

    Features follow [3]'s metadata family — column-name similarity and
    column-name uniqueness only (Jaccard of names, mean inverse document
    frequency of shared/unshared columns, relative schema sizes). Note
    the *exact* containment fraction is deliberately not a feature: [3]
    never computes it (that is the quantity being predicted), and its
    absence is what makes this baseline lossy, as in Table 4.
    """
    inter = a & b
    union = a | b
    jacc = len(inter) / len(union) if union else 1.0
    mean_idf_shared = (
        float(np.mean([idf[c] for c in inter])) if inter else 0.0
    )
    only_a = a - b
    mean_idf_missing = (
        float(np.mean([idf[c] for c in only_a])) if only_a else 0.0
    )
    size_ratio = len(a) / len(b) if b else 1.0
    return np.array(
        [jacc, mean_idf_shared, mean_idf_missing, size_ratio, 1.0]
    )


def column_idf(schemas: dict[str, SchemaSet]) -> dict[str, float]:
    """Uniqueness of each column name across the lake (log-idf)."""
    n = max(1, len(schemas))
    counts: dict[str, int] = {}
    for s in schemas.values():
        for c in s:
            counts[c] = counts.get(c, 0) + 1
    return {c: float(np.log(n / k)) for c, k in counts.items()}


@dataclass
class LogisticModel:
    weights: np.ndarray

    def predict_proba(self, x: np.ndarray) -> np.ndarray:
        return 1.0 / (1.0 + np.exp(-(x @ self.weights)))

    def predict(self, x: np.ndarray) -> np.ndarray:
        return (self.predict_proba(x) >= 0.5).astype(int)


def train_logistic(
    x: np.ndarray, y: np.ndarray, *, lr: float = 0.5, epochs: int = 400
) -> LogisticModel:
    """Batch gradient descent on log loss with L2 regularisation."""
    w = np.zeros(x.shape[1])
    n = len(y)
    for _ in range(epochs):
        p = 1.0 / (1.0 + np.exp(-(x @ w)))
        grad = x.T @ (p - y) / n + 1e-3 * w
        w -= lr * grad
    return LogisticModel(weights=w)


@dataclass
class ClassifierResult:
    model: LogisticModel
    #: ordered (parent, child) pairs the classifier labels as contained.
    predicted_edges: set[tuple[str, str]]


def related_tables_baseline(
    schemas: dict[str, SchemaSet],
    gt_edges: set[tuple[str, str]],
    *,
    seed: int = 0,
    n_negatives: int | None = None,
) -> ClassifierResult:
    """Train on GT positives + random negatives, then label all pairs.

    Mirrors §6.4.1(2): positives are ground-truth schema-containment
    pairs; negatives are random pairs absent from the ground truth.
    Candidate edges at inference are all ordered pairs with
    ``|a| <= |b|`` (both directions when sizes tie), scored by the
    trained model.
    """
    g = np.random.default_rng(seed)
    idf = column_idf(schemas)
    names = sorted(schemas)

    positives = sorted(gt_edges)
    if n_negatives is None:
        n_negatives = max(len(positives), 10)
    negatives: list[tuple[str, str]] = []
    attempts = 0
    while len(negatives) < n_negatives and attempts < n_negatives * 50:
        attempts += 1
        a, b = g.choice(names, size=2, replace=False)
        pair = (str(a), str(b))
        if pair not in gt_edges and pair not in negatives:
            negatives.append(pair)

    def feats(parent: str, child: str) -> np.ndarray:
        return pair_features(schemas[child], schemas[parent], idf)

    x = np.stack(
        [feats(p, c) for p, c in positives] + [feats(p, c) for p, c in negatives]
    )
    y = np.concatenate(
        [np.ones(len(positives)), np.zeros(len(negatives))]
    )
    model = train_logistic(x, y)

    predicted: set[tuple[str, str]] = set()
    for i in range(len(names)):
        for j in range(len(names)):
            if i == j:
                continue
            parent, child = names[i], names[j]
            if len(schemas[child]) > len(schemas[parent]):
                continue
            if model.predict(feats(parent, child)[None, :])[0] == 1:
                predicted.add((parent, child))
    return ClassifierResult(model=model, predicted_edges=predicted)
