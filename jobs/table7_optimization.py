"""spark-submit entrypoint reproducing the paper's Table 7.

Usage: spark-submit jobs/table7_optimization.py [--scale 1.0] [--seed 0]
"""
from _common import run_job

from repro.experiments.tables import table7_rows

if __name__ == "__main__":
    run_job("Table 7 - OPT-RET results", table7_rows)
