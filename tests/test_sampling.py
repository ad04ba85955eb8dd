"""Tests for the Theorem 4.2 sampling bound."""
from __future__ import annotations

import numpy as np
import pytest
from hypothesis import given, strategies as st

from repro.core.sampling import detection_probability, required_samples


class TestPaperExample:
    def test_worked_example_29_samples(self):
        """δ=0.05, ε=0.1 -> n_s >= 29 (the paper's §4.3 example)."""
        assert required_samples(eps=0.1, delta=0.05) == 29

    def test_bound_is_tight(self):
        # 28 samples are not enough; 29 are.
        assert detection_probability(0.1, 28) < 0.95
        assert detection_probability(0.1, 29) >= 0.95


class TestRequiredSamples:
    @pytest.mark.parametrize(
        "eps, delta",
        [(0.5, 0.05), (0.1, 0.01), (0.9, 0.1), (0.05, 0.05), (0.3, 0.001)],
    )
    def test_bound_achieves_confidence(self, eps, delta):
        n = required_samples(eps, delta)
        assert detection_probability(eps, n) >= 1 - delta
        # ...and one fewer sample would not.
        if n > 1:
            assert detection_probability(eps, n - 1) < 1 - delta

    def test_monotone_decreasing_in_eps(self):
        ns = [required_samples(e, 0.05) for e in (0.05, 0.1, 0.3, 0.6, 0.9)]
        assert ns == sorted(ns, reverse=True)

    def test_monotone_increasing_in_confidence(self):
        ns = [required_samples(0.1, d) for d in (0.2, 0.1, 0.05, 0.01)]
        assert ns == sorted(ns)

    @pytest.mark.parametrize("bad", [0.0, 1.0, -0.1, 1.5])
    def test_rejects_bad_eps(self, bad):
        with pytest.raises(ValueError):
            required_samples(bad, 0.05)

    @pytest.mark.parametrize("bad", [0.0, 1.0, -0.1])
    def test_rejects_bad_delta(self, bad):
        with pytest.raises(ValueError):
            required_samples(0.1, bad)

    @given(
        eps=st.floats(min_value=0.01, max_value=0.99),
        delta=st.floats(min_value=0.001, max_value=0.5),
    )
    def test_bound_always_sufficient(self, eps, delta):
        n = required_samples(eps, delta)
        assert n >= 1
        assert detection_probability(eps, n) >= 1 - delta - 1e-12


class TestDetectionProbability:
    def test_zero_samples_never_detect(self):
        assert detection_probability(0.5, 0) == 0.0

    def test_full_deficit_one_sample(self):
        assert detection_probability(1.0, 1) == 1.0

    def test_zero_deficit_never_detected(self):
        assert detection_probability(0.0, 1000) == 0.0

    def test_rejects_negative_samples(self):
        with pytest.raises(ValueError):
            detection_probability(0.1, -1)

    def test_monte_carlo_agreement(self):
        """Empirical check of Eq. 2: uniform sampling from a 90%-contained
        dataset detects the deficit at the predicted rate."""
        g = np.random.default_rng(0)
        eps, n_s, trials = 0.2, 10, 4000
        contained = np.zeros(800)
        contained[: int(800 * eps)] = 1  # 1 = non-contained row
        hits = 0
        for _ in range(trials):
            sample = g.choice(contained, size=n_s, replace=True)
            hits += sample.any()
        empirical = hits / trials
        predicted = detection_probability(eps, n_s)
        assert empirical == pytest.approx(predicted, abs=0.02)
