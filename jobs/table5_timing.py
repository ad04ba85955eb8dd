"""spark-submit entrypoint reproducing the paper's Table 5.

Usage: spark-submit jobs/table5_timing.py [--scale 1.0] [--seed 0]
"""
from _common import run_job

from repro.experiments.tables import table5_rows

if __name__ == "__main__":
    run_job("Table 5 - stage timings vs ground truth", table5_rows)
