"""Nested-loop DOD baseline (Knorr & Ng [21] with the randomized-order
early termination of Bay & Schwabacher [8], the variant the paper's
experiments cite for "Nested-loop").

For each object the scan runs over the dataset in a random order and
stops as soon as ``k`` neighbors are found; outliers necessarily scan
everything, giving the O(n^2) worst case the paper highlights. Distances
are evaluated in small chunks through the shared Metric interface, the
same granularity every scan-style algorithm in this repo uses.
"""
from __future__ import annotations

import numpy as np

from repro.metrics.distances import Metric


def nested_loop_outliers(X, metric: Metric, r: float, k: int, *,
                         chunk: int = 16, seed: int = 0) -> np.ndarray:
    """Sorted outlier indices, exactly (Definition 2)."""
    n = len(X)
    order = np.random.default_rng(seed).permutation(n)
    out: list[int] = []
    for i in range(n):
        count = 0
        for s in range(0, n, chunk):
            blk = order[s: s + chunk]
            d = metric.one_to_many(X[i], X[blk])
            hits = (d <= r) & (blk != i)
            count += int(hits.sum())
            if count >= k:
                break
        if count < k:
            out.append(i)
    return np.asarray(sorted(out), dtype=np.int64)
