"""spark-submit entrypoint reproducing the paper's Table 3.

Usage: spark-submit jobs/table3_opcounts.py [--scale 1.0] [--seed 0]
"""
from _common import run_job

from repro.experiments.tables import table3_rows

if __name__ == "__main__":
    run_job("Table 3 - pairwise operation counts", table3_rows)
