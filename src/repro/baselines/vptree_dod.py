"""VP-tree DOD baseline (paper §3): build the tree offline, then run one
capped range count per object — the strongest non-graph baseline the
paper evaluates (chosen because VP-tree is the best metric range-search
index per [13])."""
from __future__ import annotations

import numpy as np

from repro.metrics.distances import Metric
from repro.vptree.vptree import VPTree


def vptree_outliers(X, metric: Metric, r: float, k: int, *,
                    tree: VPTree | None = None, capacity: int = 32,
                    seed: int = 0) -> np.ndarray:
    """Exact outliers: range_count(p, r) capped at k, for every p."""
    if tree is None:
        tree = VPTree(X, metric, capacity=capacity, seed=seed)
    out = [
        i for i in range(len(X))
        if tree.range_count(X[i], r, cap=k, exclude=i) < k
    ]
    return np.asarray(out, dtype=np.int64)
