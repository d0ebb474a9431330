"""Reproduce paper Table 1: accuracy of US/ST/AQP++/PASS variants at a
0.5% sample rate and 64 partitions over COUNT/SUM/AVG workloads.

    spark-submit jobs/table1.py --scale bench --out results/table1.md
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import run_job  # noqa: E402

from repro.experiments import run_table1  # noqa: E402

if __name__ == "__main__":
    run_job("Table 1", run_table1)
