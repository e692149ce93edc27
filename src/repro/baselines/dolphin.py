"""DOLPHIN baseline (Angiulli & Fassetti [4]), as described in paper §3.

DOLPHIN scans the dataset while maintaining an index of already-seen
objects ("DBO-index"). Each arriving object counts its neighbors among
the indexed ones; an indexed object that has accumulated ``k`` neighbors
is a proven inlier and is evicted from the index with high probability,
keeping the index small. Because the first scan only sees *earlier*
objects, counts are partial — a second scan verifies the remaining
candidates exactly (early-terminating), which is exactly the two-scan
structure of the original algorithm.
"""
from __future__ import annotations

import numpy as np

from repro.metrics.distances import Metric


def dolphin_outliers(X, metric: Metric, r: float, k: int, *,
                     seed: int = 0, keep_inlier_prob: float = 0.1,
                     chunk: int = 16, stats: dict | None = None) -> np.ndarray:
    """Exact outliers via DOLPHIN's index-and-prune scan.

    If ``stats`` is given, records ``index_bytes`` — the peak DBO-index
    footprint (ids + per-entry neighbor counter), for Table 6.
    """
    n = len(X)
    peak_index = 0
    rng = np.random.default_rng(seed)
    order = rng.permutation(n)
    index: list[int] = []           # currently indexed object ids
    count = np.zeros(n, dtype=np.int64)
    for i in order:
        i = int(i)
        # Count neighbors of i among indexed objects; neighbor hits also
        # credit the indexed object (the relation is symmetric).
        evict: list[int] = []
        for s in range(0, len(index), chunk):
            blk = index[s: s + chunk]
            d = metric.one_to_many(X[i], X[blk])
            for j, dj in zip(blk, d):
                if dj <= r:
                    count[i] += 1
                    count[j] += 1
                    if count[j] >= k and rng.random() > keep_inlier_prob:
                        evict.append(j)
            if count[i] >= k:
                break
        if evict:
            ev = set(evict)
            index = [j for j in index if j not in ev]
        # Proven inliers enter the index only with small probability
        # (DOLPHIN's pruning rule); unresolved objects always enter.
        if count[i] >= k:
            if rng.random() < keep_inlier_prob:
                index.append(i)
        else:
            index.append(i)
        peak_index = max(peak_index, len(index))
    if stats is not None:
        stats["index_bytes"] = peak_index * 12
    # Second scan: exact verification of unresolved objects. First-scan
    # counts are partial (early objects saw few index entries).
    out: list[int] = []
    for i in range(n):
        if count[i] >= k:
            continue
        c = 0
        for s in range(0, n, chunk):
            blk = np.arange(s, min(s + chunk, n))
            d = metric.one_to_many(X[i], X[blk])
            c += int(((d <= r) & (blk != i)).sum())
            if c >= k:
                break
        if c < k:
            out.append(i)
    return np.asarray(sorted(out), dtype=np.int64)
