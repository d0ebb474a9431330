"""Rectangular subpopulation-aggregate queries (§3.1).

A query is ``AGG(A) WHERE x_i <= C_i <= y_i for 1 <= i <= d`` over the
predicate columns ``cols``; both endpoints are inclusive, matching the
paper's rectangular partitioning conditions.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

AGGS = ("sum", "count", "avg", "min", "max")


@dataclass(frozen=True)
class Query:
    """One rectangular aggregate query.

    Attributes:
        agg:  one of :data:`AGGS`.
        cols: predicate column names (length d).
        lo:   lower bounds, inclusive, aligned with ``cols``.
        hi:   upper bounds, inclusive, aligned with ``cols``.
    """

    agg: str
    cols: tuple[str, ...]
    lo: tuple[float, ...]
    hi: tuple[float, ...]

    def __post_init__(self) -> None:
        if self.agg not in AGGS:
            raise ValueError(f"unsupported aggregate {self.agg!r}")
        if not (len(self.cols) == len(self.lo) == len(self.hi)):
            raise ValueError("cols/lo/hi length mismatch")

    def mask(self, pdf: pd.DataFrame) -> np.ndarray:
        """Boolean match vector of this query's predicate over ``pdf``."""
        m = np.ones(len(pdf), dtype=bool)
        for c, lo, hi in zip(self.cols, self.lo, self.hi):
            v = pdf[c].to_numpy()
            m &= (v >= lo) & (v <= hi)
        return m

    def truth(self, pdf: pd.DataFrame, value_col: str) -> float:
        """Exact answer over the full data (ground truth for the harness)."""
        v = pdf[value_col].to_numpy()[self.mask(pdf)]
        if self.agg == "count":
            return float(v.size)
        if v.size == 0:
            return float("nan")
        if self.agg == "sum":
            return float(v.sum())
        if self.agg == "avg":
            return float(v.mean())
        if self.agg == "min":
            return float(v.min())
        return float(v.max())

    def sql(self, table: str, value_col: str) -> str:
        """The equivalent SQL text (used with the DuckDB oracle)."""
        pred = " AND ".join(
            f"({c} >= {lo!r} AND {c} <= {hi!r})"
            for c, lo, hi in zip(self.cols, self.lo, self.hi)
        )
        fn = {"sum": "SUM", "count": "COUNT", "avg": "AVG", "min": "MIN", "max": "MAX"}[self.agg]
        arg = "*" if self.agg == "count" else value_col
        return f"SELECT {fn}({arg}) AS result FROM {table} WHERE {pred}"
