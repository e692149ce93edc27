"""VP-tree substrate (Yianilos [35], as described in paper §3 / §5.1).

Three roles in the reproduction:

1. Baseline DOD algorithm: per-object range *counting* with early
   termination at ``k`` (paper Table 5, column "VP-tree").
2. Verification index for ``Exact-Counting`` in Algorithm 1 (used on the
   low-intrinsic-dimensionality datasets, paper §4).
3. The ball-based partitioner of ``NNDescent+`` (paper Algorithm 3):
   left-leaf buckets seed initial AKNNs, and vantage points whose left
   child is a leaf become **pivots**.

The build follows §5.1 exactly: a node holding more than ``c`` objects
picks a random vantage object ``p``, computes the distances to all other
objects, splits at the *mean* distance (``<= mu`` goes left, ``> mu``
goes right), and recurses. Every node additionally records the maximum
distance from its vantage to any object in its subtree, giving the
triangle-inequality lower bound used for range pruning.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.metrics.distances import Metric


@dataclass
class _Node:
    vantage: int                      # index of the vantage object
    mu: float = 0.0                   # mean split distance (internal only)
    max_dist: float = 0.0             # max distance vantage -> subtree object
    bucket: np.ndarray | None = None  # leaf: member indices (excl. vantage)
    left: "_Node | None" = None
    right: "_Node | None" = None
    is_pivot: bool = field(default=False)


class VPTree:
    """VP-tree over ``X`` (ndarray rows, or object array of strings)."""

    def __init__(self, X, metric: Metric, *, capacity: int = 32, seed: int = 0):
        self.X = X
        self.metric = metric
        self.capacity = max(2, capacity)
        self._rng = np.random.default_rng(seed)
        self.pivots: list[int] = []        # vantage points with a leaf left child
        self.leaf_buckets: list[np.ndarray] = []  # left-leaf member index sets
        idx = np.arange(len(X))
        self.root = self._build(idx, is_left=True)

    # -- construction ---------------------------------------------------
    def _build(self, idx: np.ndarray, *, is_left: bool) -> _Node | None:
        if len(idx) == 0:
            return None
        vi = int(idx[self._rng.integers(len(idx))])
        rest = idx[idx != vi]
        if len(rest) == 0:
            node = _Node(vantage=vi, bucket=rest)
            if is_left:
                self.leaf_buckets.append(idx.copy())
            return node
        d = self.metric.one_to_many(self.X[vi], self.X[rest])
        node = _Node(vantage=vi, max_dist=float(d.max()))
        if len(idx) <= self.capacity:
            node.bucket = rest
            # Paper Alg. 3: AKNN init uses the buckets that are *left*
            # children — their members are mutually close (inside a ball).
            if is_left:
                self.leaf_buckets.append(idx.copy())
            return node
        node.mu = float(d.mean())
        lmask = d <= node.mu
        L, R = rest[lmask], rest[~lmask]
        node.left = self._build(L, is_left=True)
        node.right = self._build(R, is_left=False)
        # Paper Alg. 3 line 13-14: vantage of a node whose left child fits
        # in a leaf becomes a pivot (one per ball-shaped subspace).
        if len(L) <= self.capacity:
            node.is_pivot = True
            self.pivots.append(vi)
        return node

    # -- queries --------------------------------------------------------
    def range_count(self, q, r: float, *, cap: int | None = None,
                    exclude: int = -1) -> int:
        """Number of objects within distance ``r`` of ``q``.

        ``cap`` enables the paper's early termination: traversal stops as
        soon as the count reaches ``cap`` (the ``k`` threshold — an object
        with ``>= k`` neighbors is already known to be an inlier).
        ``exclude`` removes one index (the query object itself) from the
        count when the query is a member of the tree.
        """
        self._count = 0
        self._cap = np.inf if cap is None else cap
        self._range(self.root, q, r, exclude)
        return self._count

    def _range(self, node: _Node | None, q, r: float, exclude: int) -> None:
        if node is None or self._count >= self._cap:
            return
        dv = self.metric.pair(q, self.X[node.vantage])
        # Ball pruning: every subtree object x has dist(v, x) <= max_dist,
        # so dist(q, x) >= dv - max_dist by the triangle inequality.
        if dv - node.max_dist > r:
            return
        if dv <= r and node.vantage != exclude:
            self._count += 1
        if node.bucket is not None:
            b = node.bucket
            if len(b):
                d = self.metric.one_to_many(q, self.X[b])
                hits = d <= r
                if exclude >= 0:
                    hits &= b != exclude
                self._count += int(hits.sum())
            return
        # Mean-split pruning: left holds dist(v,x) <= mu, right > mu.
        if dv <= node.mu:
            self._range(node.left, q, r, exclude)
            if dv + r > node.mu:
                self._range(node.right, q, r, exclude)
        else:
            self._range(node.right, q, r, exclude)
            if dv - r <= node.mu:
                self._range(node.left, q, r, exclude)

    def range_search(self, q, r: float, *, exclude: int = -1) -> list[int]:
        """Indices of all objects within ``r`` of ``q`` (no early stop)."""
        out: list[int] = []
        self._range_collect(self.root, q, r, exclude, out)
        return out

    def _range_collect(self, node, q, r, exclude, out) -> None:
        if node is None:
            return
        dv = self.metric.pair(q, self.X[node.vantage])
        if dv - node.max_dist > r:
            return
        if dv <= r and node.vantage != exclude:
            out.append(node.vantage)
        if node.bucket is not None:
            b = node.bucket
            if len(b):
                d = self.metric.one_to_many(q, self.X[b])
                for i in b[d <= r]:
                    if i != exclude:
                        out.append(int(i))
            return
        if dv <= node.mu:
            self._range_collect(node.left, q, r, exclude, out)
            if dv + r > node.mu:
                self._range_collect(node.right, q, r, exclude, out)
        else:
            self._range_collect(node.right, q, r, exclude, out)
            if dv - r <= node.mu:
                self._range_collect(node.left, q, r, exclude, out)

    # -- size accounting ------------------------------------------------
    def index_bytes(self) -> int:
        """Approximate in-memory index size (Table 6 accounting).

        Counts per-node metadata (vantage id, mu, max_dist ~ 4+8+8 bytes)
        and leaf bucket entries (4 bytes per index), not the raw data.
        """
        total = 0
        stack = [self.root]
        while stack:
            n = stack.pop()
            if n is None:
                continue
            total += 20
            if n.bucket is not None:
                total += 4 * len(n.bucket)
            stack.extend((n.left, n.right))
        return total


def vp_partition(X, metric: Metric, *, capacity: int, seed: int = 0,
                 repeats: int = 3) -> tuple[list[np.ndarray], list[int]]:
    """Ball-based partitioning for NNDescent+ initialization (Alg. 3).

    Runs the recursive mean-split partitioning ``repeats`` times (the
    paper repeats it "a constant number of times" because the random
    vantage choices leave some objects outside any left-leaf bucket) and
    returns ``(buckets, pivots)``: left-leaf index buckets from all
    rounds, and the union of pivot indices.
    """
    buckets: list[np.ndarray] = []
    pivots: set[int] = set()
    for rep in range(repeats):
        t = VPTree(X, metric, capacity=capacity, seed=seed + 7919 * rep)
        buckets.extend(t.leaf_buckets)
        pivots.update(t.pivots)
    return buckets, sorted(pivots)
