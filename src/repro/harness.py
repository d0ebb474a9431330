"""Evaluation harness: runs an AQP approach over a workload and collects
the paper's metrics (§5.1.2): median relative error, median confidence
interval ratio, mean/max per-query latency, mean skip rate, tuples
processed, synopsis storage, and construction cost.

Ground truth is computed driver-side from the pandas copy of the dataset
(its equality with the Spark/DuckDB answer is asserted in the test
suite via :mod:`repro.oracle`).
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from .core.query import Query


@dataclass
class EvalStats:
    """Aggregated workload metrics for one (approach, workload) pair."""

    name: str
    n_queries: int
    median_rel_err: float
    median_ci_ratio: float
    mean_latency_ms: float
    max_latency_ms: float
    mean_processed: float
    mean_skip_rate: float
    storage_mb: float = float("nan")
    build_seconds: float = float("nan")
    hard_bound_violations: int = 0
    rel_errs: list[float] = field(default_factory=list, repr=False)


def evaluate(
    approach,
    queries: list[Query],
    pdf: pd.DataFrame,
    value_col: str,
    *,
    name: str = "",
) -> EvalStats:
    """Run every query, compare against exact ground truth."""
    rel_errs: list[float] = []
    ci_ratios: list[float] = []
    lats: list[float] = []
    processed: list[float] = []
    skips: list[float] = []
    bound_violations = 0
    for q in queries:
        truth = q.truth(pdf, value_col)
        t0 = time.perf_counter()
        res = approach.answer(q)
        lats.append((time.perf_counter() - t0) * 1e3)
        processed.append(res.processed)
        skips.append(res.skipped_frac)
        if np.isfinite(res.lb) and np.isfinite(res.ub) and np.isfinite(truth):
            # Deterministic bounds must always contain the truth (§2.3).
            if not (res.lb - 1e-6 <= truth <= res.ub + 1e-6):
                bound_violations += 1
        if not np.isfinite(truth) or truth == 0:
            continue
        if not np.isfinite(res.est):
            # The approach could not answer (e.g. AVG with no matching
            # sampled tuples — the selective-query pathology of §2.1).
            # Score it as a total miss rather than silently dropping it.
            rel_errs.append(1.0)
            continue
        rel_errs.append(abs(res.est - truth) / abs(truth))
        if np.isfinite(res.ci_half):
            ci_ratios.append(res.ci_half / abs(truth))
    storage = getattr(approach, "storage_bytes", float("nan"))
    return EvalStats(
        name=name or type(approach).__name__,
        n_queries=len(queries),
        median_rel_err=float(np.median(rel_errs)) if rel_errs else float("nan"),
        median_ci_ratio=float(np.median(ci_ratios)) if ci_ratios else float("nan"),
        mean_latency_ms=float(np.mean(lats)) if lats else float("nan"),
        max_latency_ms=float(np.max(lats)) if lats else float("nan"),
        mean_processed=float(np.mean(processed)) if processed else float("nan"),
        mean_skip_rate=float(np.mean(skips)) if skips else float("nan"),
        storage_mb=float(storage) / 1e6 if np.isfinite(storage) else float("nan"),
        build_seconds=getattr(approach, "build_seconds", float("nan")),
        hard_bound_violations=bound_violations,
        rel_errs=rel_errs,
    )


def pct(x: float) -> str:
    """Format a ratio the way the paper prints errors: '0.07%'."""
    if not np.isfinite(x):
        return "n/a"
    return f"{100 * x:.3g}%"


def markdown_table(header: list[str], rows: list[list[str]]) -> str:
    """Render a GitHub-flavoured markdown table."""
    lines = ["| " + " | ".join(header) + " |", "|" + "---|" * len(header)]
    for r in rows:
        lines.append("| " + " | ".join(str(c) for c in r) + " |")
    return "\n".join(lines)
