"""Delta encoding of leaf samples (§3.4).

Every sampled tuple's aggregate value can be stored as a *delta* from its
partition's average, which the partition tree already knows exactly.
When the partitioner has done its job the within-partition variance is
far below the global variance, so the deltas are small numbers that
quantise/compress well. This module provides the lossless round-trip and
a simple fixed-point size estimate used in storage accounting tests.
"""
from __future__ import annotations

import numpy as np

from .tree import Node


def delta_encode(
    samples: dict[int, tuple[np.ndarray, np.ndarray]], leaves: list[Node]
) -> dict[int, tuple[np.ndarray, np.ndarray, float]]:
    """Per-leaf ``(pred_matrix, value_deltas, leaf_avg)``."""
    out = {}
    by_id = {l.leaf_id: l for l in leaves}
    for lid, (x, v) in samples.items():
        avg = by_id[lid].stats.avg if by_id[lid].stats.count else 0.0
        out[lid] = (x, v - avg, float(avg))
    return out


def delta_decode(
    encoded: dict[int, tuple[np.ndarray, np.ndarray, float]]
) -> dict[int, tuple[np.ndarray, np.ndarray]]:
    """Inverse of :func:`delta_encode` (exact round-trip)."""
    return {lid: (x, d + avg) for lid, (x, d, avg) in encoded.items()}


def delta_bits(
    encoded: dict[int, tuple[np.ndarray, np.ndarray, float]], resolution: float
) -> int:
    """Bits needed to store every delta at fixed-point ``resolution``
    (quantised magnitude coding; the compression-rationale metric)."""
    total = 0
    for _, d, _ in encoded.values():
        q = np.ceil(np.abs(d) / resolution).astype(np.int64)
        # 1 sign bit + magnitude bits per value.
        total += int(np.sum(np.ceil(np.log2(q + 2))) + len(q))
    return total
