"""Evaluation-table harnesses shared by jobs/ and benchmarks/."""
