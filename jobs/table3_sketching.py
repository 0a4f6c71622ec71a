"""spark-submit entrypoint reproducing paper Table 3 (sketching).

Usage: python jobs/table3_sketching.py [--quick] [--only DATASET ...]
Writes results/table3_*.csv and prints the rows.
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _session import job_main  # noqa: E402

from repro.experiments import table3  # noqa: E402

if __name__ == "__main__":
    sys.exit(job_main("arda-table3", table3.run))
