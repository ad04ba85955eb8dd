"""spark-submit entrypoint reproducing the paper's Table 2.

Usage: spark-submit jobs/table2_synthetic.py [--scale 1.0] [--seed 0]
"""
from _common import run_job

from repro.experiments.tables import table2_rows

if __name__ == "__main__":
    run_job("Table 2 - synthetic edge accounting", table2_rows)
