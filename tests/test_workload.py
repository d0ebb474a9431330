"""Workload generation: grounding, selectivity floors, challenging region."""
import numpy as np
import pytest

from repro.synth_data import NYC_PREDICATES, adversarial_pdf
from repro.workload import challenging_queries, max_variance_interval, random_queries


def test_random_queries_count_and_floor(intel_pdf):
    qs = random_queries(intel_pdf, ["time"], "sum", 30, seed=1, min_count=50)
    assert len(qs) == 30
    for q in qs:
        assert q.agg == "sum"
        assert int(q.mask(intel_pdf).sum()) >= 50


def test_random_queries_deterministic(intel_pdf):
    a = random_queries(intel_pdf, ["time"], "sum", 10, seed=5)
    b = random_queries(intel_pdf, ["time"], "sum", 10, seed=5)
    assert [(q.lo, q.hi) for q in a] == [(q.lo, q.hi) for q in b]


def test_random_queries_multidim(nyc_pdf):
    cols = NYC_PREDICATES[:3]
    qs = random_queries(nyc_pdf, cols, "avg", 15, seed=2, min_count=20)
    for q in qs:
        assert q.cols == tuple(cols)
        assert all(l <= h for l, h in zip(q.lo, q.hi))


def test_random_queries_endpoints_are_data_values(intel_pdf):
    vals = set(intel_pdf["time"].tolist())
    qs = random_queries(intel_pdf, ["time"], "count", 10, seed=3)
    for q in qs:
        assert q.lo[0] in vals and q.hi[0] in vals


def test_max_variance_interval_finds_tail():
    pdf = adversarial_pdf(n=4000)
    lo, hi = max_variance_interval(pdf, "c", "a", delta=0.01)
    # The high-variance region is the last 12.5% of the predicate domain.
    assert lo >= 4000 * 0.875 - 50


def test_challenging_queries_land_in_region():
    pdf = adversarial_pdf(n=4000)
    qs = challenging_queries(pdf, "c", "a", "sum", 10, delta=0.01, seed=4)
    assert len(qs) == 10
    for q in qs:
        assert q.lo[0] >= 4000 * 0.8  # inside the widened tail region


def test_challenging_queries_fallback_to_full(intel_pdf):
    # Tiny widen + huge min_count forces the fallback path.
    qs = challenging_queries(
        intel_pdf, "time", "light", "sum", 5, delta=0.001, widen=0.01, seed=5, min_count=2000
    )
    assert len(qs) == 5
