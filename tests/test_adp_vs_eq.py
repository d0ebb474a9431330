"""§5.3: ADP vs equal partitioning on the adversarial dataset — the
experiment behind Figures 6–7, asserted as a shape (ADP's challenging-
query CI ratio beats EQ's)."""
import numpy as np
import pytest

from repro.core.synopsis import PassSynopsis
from repro.harness import evaluate
from repro.synth_data import adversarial_pdf
from repro.workload import challenging_queries, random_queries


@pytest.fixture(scope="module")
def adv(spark):
    pdf = adversarial_pdf(n=8000)
    df = spark.createDataFrame(pdf).cache()
    df.count()
    return pdf, df


def build(df, partitioner):
    return PassSynopsis.build_1d(
        df, "c", "a", k_partitions=16, sample_total=400,
        partitioner=partitioner, m_opt=800, seed=1,
    )


@pytest.fixture(scope="module")
def adp_syn(adv):
    return build(adv[1], "adp")


@pytest.fixture(scope="module")
def eq_syn(adv):
    return build(adv[1], "eq")


def test_adp_concentrates_partitions_in_tail(adp_syn, eq_syn):
    """ADP must spend most partitions on the high-variance last 12.5%."""
    tail_start = 8000 * 0.875

    def tail_partitions(syn):
        return sum(1 for l in syn.leaves if l.stats.count > 0 and l.pred_min[0] >= tail_start - 200)

    assert tail_partitions(adp_syn) > tail_partitions(eq_syn) + 4


def test_adp_beats_eq_on_challenging_queries(adv, adp_syn, eq_syn):
    pdf, _ = adv
    qs = challenging_queries(pdf, "c", "a", "sum", 40, delta=0.01, seed=2, min_count=20)
    st_adp = evaluate(adp_syn, qs, pdf, "a", name="ADP")
    st_eq = evaluate(eq_syn, qs, pdf, "a", name="EQ")
    assert st_adp.median_rel_err <= st_eq.median_rel_err
    assert st_adp.median_ci_ratio <= st_eq.median_ci_ratio


def test_adp_similar_to_eq_on_trivial_queries(adv, adp_syn, eq_syn):
    """Figure 6 left: on random whole-dataset queries the two are close
    (most random queries are dominated by exactly-covered partitions)."""
    pdf, _ = adv
    qs = random_queries(pdf, ["c"], "sum", 40, seed=3, min_count=1000)
    st_adp = evaluate(adp_syn, qs, pdf, "a", name="ADP")
    st_eq = evaluate(eq_syn, qs, pdf, "a", name="EQ")
    assert st_adp.median_rel_err < 10 * max(st_eq.median_rel_err, 1e-6) + 0.05


def test_no_bound_violations_on_adversarial(adv, adp_syn):
    pdf, _ = adv
    qs = random_queries(pdf, ["c"], "sum", 30, seed=4, min_count=100)
    st = evaluate(adp_syn, qs, pdf, "a")
    assert st.hard_bound_violations == 0
