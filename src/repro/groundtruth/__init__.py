"""Brute-force ground-truth containment (the paper's §6.2 baselines)."""
