"""Column-name embeddings for the KMeans baseline (§6.4.1).

The paper's KMeans baseline averages per-column embedding vectors into a
table-schema embedding. No pretrained embedding model ships in this
offline environment, so columns are embedded by hashed character
trigrams — the standard feature-hashing trick: names sharing surface
form land near each other, which is exactly the (flawed) signal the
baseline relies on and the paper criticises.
"""
from __future__ import annotations

import hashlib

import numpy as np

from ..core.schema_set import SchemaSet

DIM = 64


def _token_trigrams(token: str) -> list[str]:
    padded = f"##{token.lower()}##"
    return [padded[i : i + 3] for i in range(len(padded) - 2)]


def embed_column(name: str, dim: int = DIM) -> np.ndarray:
    """Hashed-trigram embedding of one (dotted) column token."""
    v = np.zeros(dim)
    for tri in _token_trigrams(name):
        h = int(hashlib.md5(tri.encode()).hexdigest()[:8], 16)
        v[h % dim] += 1.0 if (h >> 8) % 2 == 0 else -1.0
    norm = np.linalg.norm(v)
    return v / norm if norm > 0 else v


def embed_schema(schema: SchemaSet, dim: int = DIM) -> np.ndarray:
    """Average of the column embeddings (the baseline's table vector)."""
    if not schema:
        return np.zeros(dim)
    mat = np.stack([embed_column(c, dim) for c in sorted(schema)])
    return mat.mean(axis=0)
