"""The paper's DOD algorithm: Algorithm 1 (filter + verify) and
Algorithm 2 (Greedy-Counting).

``greedy_counting`` is a faithful Alg. 2: BFS from the query vertex,
counting visited vertices within ``r`` and enqueueing them, stopping at
``k``; out-of-range *pivots* are still enqueued (lines 13–14) because
Remove-Links deleted links whose endpoints share a pivot.

``detect_outliers`` is Alg. 1 plus the §5.5 refinement: a vertex whose
links are its exact K'-NNs (K' >= k) is decided — inlier or *outlier* —
in the filtering phase by traversing only its own links, skipping
verification entirely. Verification uses a VP-tree range count for
low-intrinsic-dimensionality datasets and an early-terminating linear
scan otherwise (paper §4).

Filtering never yields false negatives (Lemma 1): an object is declared
inlier only after ``k`` real distances ``<= r`` were observed, so every
outlier survives to verification (or is exactly decided).
"""
from __future__ import annotations

import time
from collections import deque
from dataclasses import dataclass, field

import numpy as np

from repro.core.graph import ProximityGraph
from repro.metrics.distances import Metric
from repro.vptree.vptree import VPTree


def greedy_counting(
    i: int,
    X,
    metric: Metric,
    graph: ProximityGraph,
    r: float,
    k: int,
    *,
    visited: np.ndarray,
    stamp: int,
) -> int:
    """Alg. 2: count neighbors of object ``i`` reachable on the graph.

    ``visited``/``stamp`` implement generation-stamped visited marks so
    the caller can reuse one array across all n source objects.
    Returns min(true reachable count, k).
    """
    pivots = graph.pivot_mask
    adj = graph.adj
    count = 0
    visited[i] = stamp
    q: deque[int] = deque((i,))
    while q:
        v = q.popleft()
        nbrs = adj[v]
        fresh = [int(j) for j in nbrs if visited[j] != stamp]
        if not fresh:
            continue
        for j in fresh:
            visited[j] = stamp
        # One adjacency list is the natural batch granularity (the C++
        # implementation computes these distances one loop apiece).
        d = metric.one_to_many(X[i], X[fresh])
        for j, dj in zip(fresh, d):
            if dj <= r:
                count += 1
                if count >= k:
                    return count
                q.append(j)
            elif pivots is not None and pivots[j]:
                q.append(j)  # Alg. 2 lines 13-14: expand far pivots
    return count


@dataclass
class DODResult:
    """Output of Algorithm 1 plus the bookkeeping the tables need."""

    outliers: np.ndarray                  # sorted outlier indices
    n_candidates: int = 0                 # |P'| entering verification
    n_false_positives: int = 0            # f: inliers that survived filtering
    n_decided_outliers: int = 0           # outliers decided by the K'-NN path
    filter_seconds: float = 0.0
    verify_seconds: float = 0.0
    filter_n_dist: int = 0
    verify_n_dist: int = 0
    candidates: np.ndarray = field(default_factory=lambda: np.array([], int))


def filter_phase(
    X, metric: Metric, graph: ProximityGraph, r: float, k: int
) -> tuple[np.ndarray, np.ndarray, int]:
    """Alg. 1 filtering. Returns (candidate ids, decided-outlier ids,
    number of Greedy-Counting distance computations)."""
    n = len(X)
    visited = np.zeros(n, dtype=np.int64)
    before = metric.n_dist
    candidates: list[int] = []
    decided: list[int] = []
    exact = graph.exact_mask
    use_exact = exact is not None and graph.K_prime >= k
    for i in range(n):
        if use_exact and exact[i]:
            # §5.5: links are the exact K'-NNs with K' >= k, so counting
            # over the links alone decides outlier-ness exactly in O(K').
            nbrs = graph.adj[i]
            d = metric.one_to_many(X[i], X[nbrs])
            if int((d <= r).sum()) < k:
                decided.append(i)
            continue
        c = greedy_counting(i, X, metric, graph, r, k,
                            visited=visited, stamp=i + 1)
        if c < k:
            candidates.append(i)
    return (
        np.asarray(candidates, dtype=np.int64),
        np.asarray(decided, dtype=np.int64),
        metric.n_dist - before,
    )


def verify_candidates(
    X,
    metric: Metric,
    candidates: np.ndarray,
    r: float,
    k: int,
    *,
    method: str = "scan",
    vptree: VPTree | None = None,
    chunk: int = 16,
) -> np.ndarray:
    """Exact-Counting over the candidate set.

    ``method='vptree'`` runs a capped range count on a VP-tree (paper:
    HEPMASS, PAMAP2, Words); ``'scan'`` runs an early-terminating linear
    scan in small chunks (the batch granularity all scan-style
    algorithms in this repo share).
    """
    out: list[int] = []
    if method == "vptree":
        if vptree is None:
            vptree = VPTree(X, metric, capacity=32, seed=0)
        for i in candidates:
            i = int(i)
            if vptree.range_count(X[i], r, cap=k, exclude=i) < k:
                out.append(i)
        return np.asarray(sorted(out), dtype=np.int64)
    n = len(X)
    for i in candidates:
        i = int(i)
        count = 0
        for s in range(0, n, chunk):
            blk = np.arange(s, min(s + chunk, n))
            d = metric.one_to_many(X[i], X[blk])
            hits = (d <= r) & (blk != i)
            count += int(hits.sum())
            if count >= k:
                break
        if count < k:
            out.append(i)
    return np.asarray(sorted(out), dtype=np.int64)


def detect_outliers(
    X,
    metric: Metric,
    graph: ProximityGraph,
    r: float,
    k: int,
    *,
    verify_method: str = "scan",
    vptree: VPTree | None = None,
) -> DODResult:
    """Algorithm 1 end to end, with per-phase timers and distance
    counters (Tables 5, 7, 8)."""
    t0 = time.perf_counter()
    before = metric.n_dist
    candidates, decided, filt_dist = filter_phase(X, metric, graph, r, k)
    t1 = time.perf_counter()
    verified = verify_candidates(
        X, metric, candidates, r, k, method=verify_method, vptree=vptree
    )
    t2 = time.perf_counter()
    outliers = np.union1d(verified, decided)
    return DODResult(
        outliers=outliers,
        n_candidates=len(candidates),
        n_false_positives=len(candidates) - len(verified),
        n_decided_outliers=len(decided),
        filter_seconds=t1 - t0,
        verify_seconds=t2 - t1,
        filter_n_dist=filt_dist,
        verify_n_dist=metric.n_dist - before - filt_dist,
        candidates=candidates,
    )
