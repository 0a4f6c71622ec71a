"""spark-submit entrypoint reproducing paper Table 2 (coresets).

Usage: python jobs/table2_coresets.py [--quick] [--only DATASET ...]
Writes results/table2_*.csv and prints the rows.
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _session import job_main  # noqa: E402

from repro.experiments import table2  # noqa: E402

if __name__ == "__main__":
    sys.exit(job_main("arda-table2", table2.run))
