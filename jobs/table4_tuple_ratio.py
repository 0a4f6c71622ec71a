"""spark-submit entrypoint reproducing paper Table 4 (tuple_ratio).

Usage: python jobs/table4_tuple_ratio.py [--quick] [--only DATASET ...]
Writes results/table4_*.csv and prints the rows.
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _session import job_main  # noqa: E402

from repro.experiments import table4  # noqa: E402

if __name__ == "__main__":
    sys.exit(job_main("arda-table4", table4.run))
