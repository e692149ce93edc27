"""SNIF baseline (Tao, Xiao, Zhou [30]), as described in paper §3.

SNIF forms clusters of radius r/2 around randomly-encountered centers.
By the triangle inequality any two members of one cluster are within r
of each other, so a cluster with more than ``k`` members consists of
inliers only. Objects in small clusters still prune with cluster-level
distance bounds: a whole cluster C with center c is

- all neighbors of p   if dist(p, c) + r/2 <= r  (count |C| at once),
- no neighbors of p    if dist(p, c) - r/2 > r   (skip C entirely),
- otherwise scanned member by member with early termination at k.

This is the in-memory essence of SNIF (the original is an I/O-conscious
external algorithm; we are memory-resident like every algorithm here).
"""
from __future__ import annotations

import numpy as np

from repro.metrics.distances import Metric


class SnifIndex:
    """Leader clustering with radius r/2 (built online once r is known)."""

    def __init__(self, X, metric: Metric, r: float, *, seed: int = 0,
                 chunk: int = 16):
        self.X = X
        self.metric = metric
        self.r = r
        n = len(X)
        order = np.random.default_rng(seed).permutation(n)
        self.centers: list[int] = []
        self.members: list[list[int]] = []
        assign = np.full(n, -1, dtype=np.int64)
        half = r / 2.0
        for i in order:
            i = int(i)
            # Scan existing centers in small chunks (the shared batch
            # granularity of every scan in this repo), stopping at the
            # first center whose ball contains i.
            placed = False
            for s in range(0, len(self.centers), chunk):
                blk = self.centers[s: s + chunk]
                d = metric.one_to_many(X[i], X[blk])
                j = int(np.argmin(d))
                if d[j] <= half:
                    cj = s + j
                    assign[i] = cj
                    self.members[cj].append(i)
                    placed = True
                    break
            if not placed:
                assign[i] = len(self.centers)
                self.members.append([i])
                self.centers.append(i)
        self.assign = assign

    def index_bytes(self) -> int:
        """Cluster table: one 4-byte id per member + center entries."""
        return 4 * len(self.X) + 12 * len(self.centers)


def snif_outliers(X, metric: Metric, r: float, k: int, *,
                  seed: int = 0, chunk: int = 16,
                  stats: dict | None = None) -> np.ndarray:
    """Exact outliers via SNIF's cluster pruning. ``stats`` (optional)
    receives ``index_bytes`` of the cluster table (Table 6)."""
    idx = SnifIndex(X, metric, r, seed=seed)
    if stats is not None:
        stats["index_bytes"] = idx.index_bytes()
    half = r / 2.0
    out: list[int] = []
    centers = idx.centers
    sizes = np.array([len(m) for m in idx.members])
    for ci, mem in enumerate(idx.members):
        if sizes[ci] > k:
            continue  # each member already has |C|-1 >= k neighbors
        for i in mem:
            # Members of p's own cluster are guaranteed neighbors.
            count = sizes[ci] - 1
            # Scan the other clusters' centers chunk-wise, applying the
            # triangle-inequality bounds per cluster and stopping at k.
            for s in range(0, len(centers), chunk):
                blk = centers[s: s + chunk]
                dc = metric.one_to_many(X[i], X[blk])
                for off, dcj in enumerate(dc):
                    cj = s + off
                    if cj == ci or dcj - half > r:
                        continue  # own cluster / no member can be close
                    if dcj + half <= r:
                        count += int(sizes[cj])  # whole cluster in range
                    else:
                        others = idx.members[cj]
                        for ss in range(0, len(others), chunk):
                            bb = others[ss: ss + chunk]
                            d = metric.one_to_many(X[i], X[bb])
                            count += int((d <= r).sum())
                            if count >= k:
                                break
                    if count >= k:
                        break
                if count >= k:
                    break
            if count < k:
                out.append(int(i))
    return np.asarray(sorted(out), dtype=np.int64)
