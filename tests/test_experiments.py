"""Integration: the three table drivers run end-to-end at test scale and
produce the paper's comparison *shapes*."""
import numpy as np
import pytest

from repro.experiments import SCALES, TABLE2_WORKLOADS, run_table1, run_table2, run_table3


@pytest.fixture(scope="module")
def t1(spark):
    return run_table1(spark, scale="test")


@pytest.fixture(scope="module")
def t2(spark):
    return run_table2(spark, scale="test")


@pytest.fixture(scope="module")
def t3(spark):
    return run_table3(spark, scale="test", ks=(4, 8, 16))


def test_table1_structure(t1):
    md, rows = t1
    assert set(rows) == {"US", "ST", "AQP++", "PASS-ESS", "PASS-BSS2x", "PASS-BSS10x"}
    lines = md.splitlines()
    assert lines[0].startswith("| Approach | Mean Cost |")
    assert len(lines) == 2 + 6  # header + sep + 6 approaches


def test_table1_all_errors_finite(t1):
    _, rows = t1
    for name, e in rows.items():
        for (agg, ds), st in e["err"].items():
            assert np.isfinite(st.median_rel_err), (name, agg, ds)
            assert st.hard_bound_violations == 0, (name, agg, ds)


def test_table1_pass_beats_uniform(t1):
    """The headline claim: PASS-BSS10x is more accurate than US on every
    (agg, dataset) workload at test scale."""
    _, rows = t1
    wins = total = 0
    for key in rows["US"]["err"]:
        total += 1
        wins += rows["PASS-BSS10x"]["err"][key].median_rel_err < rows["US"]["err"][key].median_rel_err
    assert wins / total >= 0.8


def test_table1_pass_beats_stratified_on_sum(t1):
    _, rows = t1
    for ds in ("Intel", "Insta", "NYC"):
        key = ("sum", ds)
        assert (
            rows["PASS-BSS10x"]["err"][key].median_rel_err
            < rows["ST"]["err"][key].median_rel_err
        )


def test_table1_ess_processes_about_k(t1):
    """ESS calibration: average tuples processed per query should be in the
    same ballpark as the uniform baseline's K (not orders of magnitude
    more)."""
    _, rows = t1
    us_proc = np.mean([st.mean_processed for st in rows["US"]["err"].values()])
    ess_proc = np.mean([st.mean_processed for st in rows["PASS-ESS"]["err"].values()])
    assert ess_proc < 5 * us_proc


def test_table2_structure(t2):
    md, rows = t2
    names = [r[0] for r in rows]
    assert names == [
        "PASS-BSS1x",
        "PASS-BSS2x",
        "PASS-BSS10x",
        "VerdictDB-10%",
        "VerdictDB-100%",
        "DeepDB-10%",
        "DeepDB-100%",
    ]
    assert md.splitlines()[0].count("|") == 4 + len(TABLE2_WORKLOADS) + 1


def test_table2_verdict100_storage_dominates(t2):
    _, rows = t2
    byname = {r[0]: r for r in rows}
    assert float(byname["VerdictDB-100%"][2]) > float(byname["PASS-BSS2x"][2])
    assert float(byname["VerdictDB-100%"][2]) > float(byname["VerdictDB-10%"][2])


def test_table2_pass_storage_monotone(t2):
    _, rows = t2
    byname = {r[0]: r for r in rows}
    assert (
        float(byname["PASS-BSS1x"][2])
        <= float(byname["PASS-BSS2x"][2])
        <= float(byname["PASS-BSS10x"][2])
    )


def _err(cell: str) -> float:
    return float(cell.rstrip("%")) if cell != "n/a" else float("nan")


def test_table2_deepdb_degrades_in_high_d(t2):
    """Paper shape: DeepDB's error on NYC-3D..5D is much worse than its
    1-D NYC error."""
    _, rows = t2
    byname = {r[0]: r for r in rows}
    cols = {w: 4 + i for i, w in enumerate(TABLE2_WORKLOADS)}
    row = byname["DeepDB-100%"]
    assert _err(row[cols["NYC-3D"]]) > _err(row[cols["NYC"]])


def test_table2_pass_accuracy_improves_with_budget(t2):
    _, rows = t2
    byname = {r[0]: r for r in rows}
    cols = {w: 4 + i for i, w in enumerate(TABLE2_WORKLOADS)}
    # On 1-D workloads BSS10x should beat BSS1x in the large majority.
    wins = sum(
        _err(byname["PASS-BSS10x"][cols[w]]) <= _err(byname["PASS-BSS1x"][cols[w]])
        for w in ("Intel", "Insta", "NYC")
    )
    assert wins >= 2


def test_table3_structure_and_trend(t3):
    md, stats = t3
    assert set(stats) == {4, 8, 16}
    # Accuracy improves (or holds) as k grows; latency does not explode.
    errs = [stats[k].median_rel_err for k in (4, 8, 16)]
    assert errs[2] <= errs[0]
    for st in stats.values():
        assert st.hard_bound_violations == 0
        assert st.max_latency_ms >= st.mean_latency_ms


def test_scales_defined():
    assert set(SCALES) == {"test", "bench"}
    assert SCALES["bench"].n_rows["NYC"] > SCALES["test"].n_rows["NYC"]
