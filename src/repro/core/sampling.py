"""Sampling complexity bound (Theorem 4.2, §4.3).

Given a pair of datasets whose true containment fraction is at most
``1 - eps``, uniformly sampling ``n_s >= ln(1/delta) / ln(1/(1-eps))``
rows (with replacement) from the candidate child guarantees that at
least one sampled row falls outside the parent — and hence CLP prunes
the edge — with probability at least ``1 - delta``.

The paper's worked example: delta=0.05, eps=0.1 -> n_s >= 29.
"""
from __future__ import annotations

import math


def required_samples(eps: float, delta: float) -> int:
    """Smallest integer ``n_s`` satisfying Theorem 4.2.

    ``eps`` is the containment deficit (containment fraction <= 1-eps),
    ``delta`` the allowed failure probability. Both must lie in (0, 1).
    """
    if not (0.0 < eps < 1.0):
        raise ValueError(f"eps must be in (0,1), got {eps}")
    if not (0.0 < delta < 1.0):
        raise ValueError(f"delta must be in (0,1), got {delta}")
    return math.ceil(math.log(1.0 / delta) / math.log(1.0 / (1.0 - eps)))


def detection_probability(eps: float, n_s: int) -> float:
    """P(at least one of ``n_s`` uniform samples exposes the deficit).

    Equation (2) of the paper: ``1 - (1-eps)^n_s`` — the probability that
    CLP prunes an edge whose containment fraction is exactly ``1-eps``.
    """
    if not (0.0 <= eps <= 1.0):
        raise ValueError(f"eps must be in [0,1], got {eps}")
    if n_s < 0:
        raise ValueError(f"n_s must be >= 0, got {n_s}")
    return 1.0 - (1.0 - eps) ** n_s
