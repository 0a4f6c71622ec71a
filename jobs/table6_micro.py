"""spark-submit entrypoint reproducing paper Table 6 (micro).

Usage: python jobs/table6_micro.py [--quick] [--only DATASET ...]
Writes results/table6_*.csv and prints the rows.
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _session import job_main  # noqa: E402

from repro.experiments import table6  # noqa: E402

if __name__ == "__main__":
    sys.exit(job_main("arda-table6", table6.run))
