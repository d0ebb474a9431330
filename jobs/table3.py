"""Reproduce paper Table 3: preprocessing cost, query latency and accuracy
of PASS on the NYC dataset as the partition count k sweeps 4 → 128.

    spark-submit jobs/table3.py --scale bench --out results/table3.md
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import run_job  # noqa: E402

from repro.experiments import run_table3  # noqa: E402

if __name__ == "__main__":
    run_job("Table 3", run_table3)
