"""spark-submit entrypoint reproducing the paper's Table 6.

Usage: spark-submit jobs/table6_clp_params.py [--scale 1.0] [--seed 0]
"""
from _common import run_job

from repro.experiments.tables import table6_rows

if __name__ == "__main__":
    run_job("Table 6 - CLP parameter sweep", table6_rows)
