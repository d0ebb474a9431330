"""Benchmark: reproduce paper Table 1 at bench scale (~120–200K rows,
300 queries/workload, 64 partitions, 0.5% sample rate).

The benchmark measures the full table pipeline (builds + workloads); the
generated markdown is written to results/table1.md and the paper-shape
assertions (PASS most accurate, US least) are checked on the measured
numbers.
"""
import os

from repro.experiments import run_table1
from repro.harness import markdown_table


def test_table1(benchmark, spark, results_dir):
    md, rows = benchmark.pedantic(
        lambda: run_table1(spark, scale="bench"), rounds=1, iterations=1
    )
    with open(os.path.join(results_dir, "table1.md"), "w") as f:
        f.write(f"## Table 1 (scale=bench)\n\n{md}\n")
    print("\n" + md)
    # Paper shape: PASS-BSS10x strictly beats US on every workload.
    for key, st in rows["US"]["err"].items():
        assert rows["PASS-BSS10x"]["err"][key].median_rel_err <= st.median_rel_err, key
    # No hard-bound violations anywhere.
    for e in rows.values():
        for st in e["err"].values():
            assert st.hard_bound_violations == 0
