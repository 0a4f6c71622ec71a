"""spark-submit entrypoint reproducing paper Table 1 (real_world).

Usage: python jobs/table1_real_world.py [--quick] [--only DATASET ...]
Writes results/table1_*.csv and prints the rows.
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _session import job_main  # noqa: E402

from repro.experiments import table1  # noqa: E402

if __name__ == "__main__":
    sys.exit(job_main("arda-table1", table1.run))
