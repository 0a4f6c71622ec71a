"""spark-submit entrypoint reproducing paper Table 5 (grouping).

Usage: python jobs/table5_grouping.py [--quick] [--only DATASET ...]
Writes results/table5_*.csv and prints the rows.
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _session import job_main  # noqa: E402

from repro.experiments import table5  # noqa: E402

if __name__ == "__main__":
    sys.exit(job_main("arda-table5", table5.run))
