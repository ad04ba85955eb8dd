"""spark-submit entrypoint reproducing the paper's Table 1.

Usage: spark-submit jobs/table1_enterprise.py [--scale 1.0] [--seed 0]
"""
from _common import run_job

from repro.experiments.tables import table1_rows

if __name__ == "__main__":
    run_job("Table 1 - enterprise edge accounting", table1_rows)
