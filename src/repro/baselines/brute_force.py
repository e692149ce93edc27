"""Fully-vectorized brute-force DOD — the in-repo ground truth.

Not one of the paper's evaluated algorithms (those live in the sibling
modules); this exists so every algorithm can be asserted exactly equal
to an O(n^2) reference, and to measure true outlier ratios for Table 2.
Distances here are *not* routed through the Metric counter — it is an
oracle, not a contestant.
"""
from __future__ import annotations

import numpy as np

from repro.metrics.distances import Metric, get_metric


def neighbor_counts(X, metric: Metric | str, r: float, *,
                    chunk: int = 512) -> np.ndarray:
    """Exact number of neighbors (distance <= r, excluding self) per object."""
    if isinstance(metric, str):
        metric = get_metric(metric)
    n = len(X)
    counts = np.zeros(n, dtype=np.int64)
    for i in range(n):
        c = 0
        for s in range(0, n, chunk):
            blk = slice(s, min(s + chunk, n))
            d = metric._one_to_many(X[i], X[blk])
            c += int((d <= r).sum())
        counts[i] = c - 1  # self distance is 0 <= r
    return counts


def brute_force_outliers(X, metric: Metric | str, r: float, k: int) -> np.ndarray:
    """Sorted indices of all distance-based outliers (Definition 2)."""
    return np.flatnonzero(neighbor_counts(X, metric, r) < k).astype(np.int64)
