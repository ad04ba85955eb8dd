"""spark-submit entrypoint reproducing the paper's Table 4.

Usage: spark-submit jobs/table4_schema_baselines.py [--scale 1.0] [--seed 0]
"""
from _common import run_job

from repro.experiments.tables import table4_rows

if __name__ == "__main__":
    run_job("Table 4 - schema containment baselines", table4_rows)
