"""k-d tree partitionings for multi-dimensional PASS (§4.4, §5.4).

Two construction policies over an m-row optimisation sample:

* ``policy='pass'`` (KD-PASS): repeatedly expand the leaf containing the
  (approximate) maximum-variance query, subject to the §5.4 balance rule
  that leaf depths differ by at most ``balance_limit``;
* ``policy='us'`` (KD-US baseline): expand the shallowest leaf, ties
  broken randomly.

Each expansion splits a node at the per-dimension medians of its sample,
giving fanout 2^d. Leaf ids are dense ints; :meth:`KDTree.assign` runs a
vectorised descent suitable for the Arrow bucketing UDF in
``spark_build.with_leaf_fn``.

The per-leaf maximum-variance query is approximated with the same
discretisations as 1-D (Appendix A.3/A.4): median-split halves for
SUM/COUNT, best length-δm run (sorted along each dimension) for AVG —
each a constant-factor approximation of the true leaf maximum.
"""
from __future__ import annotations

import heapq
from dataclasses import dataclass, field

import numpy as np

from .variance import cal_v


@dataclass
class KDNode:
    """One k-d tree node; ``split`` is the per-dimension median vector of
    the node's sample (None for leaves)."""

    idx: np.ndarray  # optimisation-sample row indices inside this node
    depth: int
    split: np.ndarray | None = None
    children: list["KDNode"] = field(default_factory=list)
    leaf_id: int = -1

    @property
    def is_leaf(self) -> bool:
        return not self.children


def _leaf_max_variance(a: np.ndarray, x: np.ndarray, agg: str, delta_len: int) -> float:
    """Approximate max query variance among a leaf's sample rows.

    ``a`` are the aggregate values, ``x`` the (n, d) predicate matrix.
    SUM/COUNT: the better half of a median split along each dimension
    (Lemma A.3 generalised). AVG: the best contiguous length-``delta_len``
    run when sorted along each dimension (Appendix A.4 style).
    """
    n = int(a.size)
    if n < 2:
        return 0.0
    best = 0.0
    for j in range(x.shape[1]):
        order = np.argsort(x[:, j], kind="stable")
        v = a[order]
        if agg in ("sum", "count"):
            mid = n // 2
            for seg in (v[:mid], v[mid:]):
                best = max(best, cal_v(n, float(np.square(seg).sum()), float(seg.sum())))
        else:
            L = min(max(2, delta_len), n)
            csq = np.concatenate([[0.0], np.cumsum(v * v)])
            cs = np.concatenate([[0.0], np.cumsum(v)])
            wq = csq[L:] - csq[:-L]
            ws = cs[L:] - cs[:-L]
            g = int(np.argmax(wq))
            best = max(best, cal_v(n, float(wq[g]), float(ws[g])) / (L * L))
    return best


class KDTree:
    """Balanced-expansion k-d tree over an optimisation sample.

    Args:
        x: (m, d) predicate matrix of the optimisation sample.
        a: (m,) aggregate values of the optimisation sample.
        k_leaves: stop expanding once this many leaves exist.
        policy: 'pass' (max-variance expansion) or 'us' (shallowest).
        agg: query type whose variance drives 'pass' expansion.
        delta: AVG discretised query length as a fraction of m.
        balance_limit: max allowed difference between leaf depths ('pass').
    """

    def __init__(
        self,
        x: np.ndarray,
        a: np.ndarray,
        k_leaves: int,
        *,
        policy: str = "pass",
        agg: str = "sum",
        delta: float = 0.01,
        balance_limit: int = 2,
        seed: int = 0,
    ) -> None:
        self.x = np.asarray(x, dtype=np.float64)
        self.a = np.asarray(a, dtype=np.float64)
        self.d = self.x.shape[1]
        self.policy = policy
        self.agg = agg
        self.delta_len = max(2, int(round(delta * len(self.a))))
        self.balance_limit = balance_limit
        self.root = KDNode(idx=np.arange(len(self.a)), depth=0)
        self._grow(k_leaves, np.random.default_rng(seed))
        self.leaves = [n for n in self._iter(self.root) if n.is_leaf]
        for i, leaf in enumerate(self.leaves):
            leaf.leaf_id = i

    # ------------------------------------------------------------------

    def _iter(self, node: KDNode):
        yield node
        for c in node.children:
            yield from self._iter(c)

    def _priority(self, node: KDNode, rng: np.random.Generator) -> float:
        if self.policy == "us":
            # Shallowest first; random tiebreak. Heap pops the minimum.
            return node.depth + rng.random() * 1e-6
        # Max variance first → negate for the min-heap.
        return -_leaf_max_variance(self.a[node.idx], self.x[node.idx], self.agg, self.delta_len)

    def _split(self, node: KDNode) -> bool:
        """Median-split ``node`` into 2^d children; False if unsplittable."""
        pts = self.x[node.idx]
        med = np.median(pts, axis=0)
        bits = (pts > med).astype(np.int64)
        codes = bits @ (1 << np.arange(self.d))
        if np.all(codes == codes[0]):
            return False  # all points identical w.r.t. the medians
        node.split = med
        node.children = [
            KDNode(idx=node.idx[codes == c], depth=node.depth + 1) for c in range(1 << self.d)
        ]
        return True

    def _grow(self, k_leaves: int, rng: np.random.Generator) -> None:
        heap: list[tuple[float, int, KDNode]] = []
        counter = 0

        def push(n: KDNode) -> None:
            nonlocal counter
            if len(n.idx) >= 2:
                heapq.heappush(heap, (self._priority(n, rng), counter, n))
                counter += 1

        push(self.root)
        n_leaves = 1
        deferred: list[tuple[float, int, KDNode]] = []
        while heap and n_leaves + (1 << self.d) - 1 <= k_leaves:
            prio, cnt, node = heapq.heappop(heap)
            if self.policy == "pass" and self.balance_limit is not None:
                min_depth = min(
                    min((n.depth for _, _, n in heap), default=node.depth),
                    min((n.depth for _, _, n in deferred), default=node.depth),
                )
                if node.depth - min_depth >= self.balance_limit:
                    deferred.append((prio, cnt, node))
                    continue
            if not self._split(node):
                continue
            n_leaves += len(node.children) - 1
            for c in node.children:
                push(c)
            for item in deferred:
                heapq.heappush(heap, item)
            deferred.clear()

    # ------------------------------------------------------------------

    def assign(self, x: np.ndarray) -> np.ndarray:
        """Vectorised descent: leaf id of every row of ``x`` (n, d)."""
        x = np.asarray(x, dtype=np.float64)
        out = np.empty(len(x), dtype=np.int64)
        weights = 1 << np.arange(self.d)

        def rec(node: KDNode, rows: np.ndarray) -> None:
            if node.is_leaf:
                out[rows] = node.leaf_id
                return
            codes = (x[rows] > node.split).astype(np.int64) @ weights
            for c, child in enumerate(node.children):
                sub = rows[codes == c]
                if sub.size:
                    rec(child, sub)

        rec(self.root, np.arange(len(x)))
        return out

    @property
    def n_leaves(self) -> int:
        return len(self.leaves)

    def leaf_depths(self) -> list[int]:
        return [n.depth for n in self.leaves]
