"""Benchmark: reproduce paper Table 2 at bench scale — PASS-BSS variants
vs VerdictDB-lite vs DeepDB-lite across 1-D and NYC multi-D templates."""
import os

from repro.experiments import TABLE2_WORKLOADS, run_table2


def _err(cell: str) -> float:
    return float(cell.rstrip("%")) if cell != "n/a" else float("nan")


def test_table2(benchmark, spark, results_dir):
    md, rows = benchmark.pedantic(
        lambda: run_table2(spark, scale="bench"), rounds=1, iterations=1
    )
    with open(os.path.join(results_dir, "table2.md"), "w") as f:
        f.write(f"## Table 2 (scale=bench)\n\n{md}\n")
    print("\n" + md)
    byname = {r[0]: r for r in rows}
    cols = {w: 4 + i for i, w in enumerate(TABLE2_WORKLOADS)}
    # Paper shapes: VerdictDB-100% is the storage heavyweight; DeepDB
    # degrades with dimension; PASS storage grows with the BSS multiplier.
    assert float(byname["VerdictDB-100%"][2]) > 5 * float(byname["PASS-BSS10x"][2])
    assert _err(byname["DeepDB-100%"][cols["NYC-3D"]]) > _err(byname["DeepDB-100%"][cols["NYC"]])
    assert float(byname["PASS-BSS1x"][2]) < float(byname["PASS-BSS10x"][2])
