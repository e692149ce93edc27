"""NSW proximity graph (Malkov et al. [26]), the paper's third
proximity-graph competitor.

Built by incremental insertion: each new object runs a handful of
greedy searches from random entry points over the current graph, and is
linked bidirectionally to the ``f`` closest objects found. The paper
sets NSW's link count so its memory matches KGraph's (nK directed
links), hence ``f = K/2`` (each insertion adds 2f link endpoints).
Insertion is inherently sequential — the reason NSW's build is the
slowest in the paper's Table 3 (it cannot be multi-threaded).
"""
from __future__ import annotations

import time

import numpy as np

from repro.core.graph import ProximityGraph
from repro.metrics.distances import Metric


def greedy_search(X, metric: Metric, adj: list[list[int]], q, start: int,
                  *, max_hops: int = 10, evaluated: dict | None = None) -> int:
    """Greedy ANN descent from ``start`` toward query ``q`` (paper §5.2
    uses the same routine inside Connect-SubGraphs). Returns the local
    minimum vertex; ``evaluated`` collects every (id, dist) touched."""
    if evaluated is None:
        evaluated = {}
    cur = start
    if cur not in evaluated:
        evaluated[cur] = metric.pair(q, X[cur])
    cur_d = evaluated[cur]
    for _ in range(max_hops):
        nbrs = [j for j in adj[cur] if j not in evaluated]
        if nbrs:
            d = metric.one_to_many(q, X[nbrs])
            for j, dj in zip(nbrs, d):
                evaluated[j] = float(dj)
        best, best_d = cur, cur_d
        for j in adj[cur]:
            dj = evaluated.get(j)
            if dj is not None and dj < best_d:
                best, best_d = j, dj
        if best == cur:
            break
        cur, cur_d = best, best_d
    return cur


def build_nsw(X, metric: Metric, *, K: int, attempts: int = 3,
              seed: int = 0) -> ProximityGraph:
    """NSW with per-insert link budget f=K/2 (memory-matched to KGraph)."""
    t0 = time.perf_counter()
    before = metric.n_dist
    n = len(X)
    f = max(2, K // 2)
    rng = np.random.default_rng(seed)
    order = rng.permutation(n)
    adj: list[list[int]] = [[] for _ in range(n)]
    inserted: list[int] = []
    for i in order:
        i = int(i)
        if inserted:
            evaluated: dict[int, float] = {}
            for _ in range(min(attempts, len(inserted))):
                start = int(inserted[rng.integers(len(inserted))])
                greedy_search(X, metric, adj, X[i], start,
                              evaluated=evaluated)
            cand = sorted(evaluated.items(), key=lambda kv: kv[1])[:f]
            for j, _ in cand:
                adj[i].append(j)
                adj[j].append(i)
        inserted.append(i)
    g = ProximityGraph(
        adj=[np.asarray(sorted(set(a)), dtype=np.int64) for a in adj],
        K=K, kind="nsw",
    )
    g.build_seconds = {"NSW-insertions": time.perf_counter() - t0}
    g.build_n_dist = metric.n_dist - before
    return g
