"""Benchmark: reproduce paper Table 3 at bench scale — the k-sweep on the
NYC dataset (cost, latency, accuracy as partitions grow 4 → 128)."""
import os

from repro.experiments import run_table3


def test_table3(benchmark, spark, results_dir):
    md, stats = benchmark.pedantic(
        lambda: run_table3(spark, scale="bench"), rounds=1, iterations=1
    )
    with open(os.path.join(results_dir, "table3.md"), "w") as f:
        f.write(f"## Table 3 (scale=bench)\n\n{md}\n")
    print("\n" + md)
    ks = sorted(stats)
    # Paper shape: accuracy improves with k and latency trends down
    # (more aggressive skipping with finer partitions).
    assert stats[ks[-1]].median_rel_err <= stats[ks[0]].median_rel_err
    for st in stats.values():
        assert st.hard_bound_violations == 0
