"""Reproduce paper Table 2: PASS-BSS{1,2,10}x vs VerdictDB-lite-{10,100}%
vs DeepDB-lite-{10,100}% — latency, storage, construction time, median
relative error on 1-D and NYC multi-dimensional templates.

    spark-submit jobs/table2.py --scale bench --out results/table2.md
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import run_job  # noqa: E402

from repro.experiments import run_table2  # noqa: E402

if __name__ == "__main__":
    run_job("Table 2", run_table2)
