"""AKNN-graph construction: NNDescent [15] (-> KGraph) and the paper's
NNDescent+ (§5.1).

We implement the *basic* NNDescent the paper builds on ("parallel-
friendly, almost no synchronization"): each object keeps a sorted list
of its K current approximate NNs; each iteration, for every object p,
the candidate set is the union of the similar-object lists (AKNNs +
reverse AKNNs) of p's similar objects, and p's AKNN list is updated from
the batched distances to those candidates. Iterate until the update
count collapses (or a fixed cap).

NNDescent+ adds the paper's three refinements:

1. **VP-tree initialization** (Alg. 3): initial AKNNs come from the
   mutually-close members of left-leaf buckets of repeated ball-based
   partitionings, instead of random objects; vantage points whose left
   child is a leaf become the **pivots** reused by every later MRPG step.
2. **Skip-flags**: an object's list enters someone's candidate pool only
   if it changed in the previous iteration (hash-table update status).
3. **Exact K'-NN retrieval**: after convergence, the ``m`` objects with
   the largest sum of AKNN distances — the probable outliers — get their
   *exact* K'-NNs (K' = 4K for MRPG; K' = K for MRPG-basic).
"""
from __future__ import annotations

import time

import numpy as np

from repro.core.graph import ProximityGraph
from repro.metrics.distances import Metric
from repro.vptree.vptree import vp_partition


class _KnnState:
    """Per-object sorted AKNN lists with dedup-and-truncate updates."""

    def __init__(self, n: int, K: int):
        self.n, self.K = n, K
        self.ids = [np.empty(0, dtype=np.int64) for _ in range(n)]
        self.dist = [np.empty(0, dtype=np.float64) for _ in range(n)]
        self.changed = np.ones(n, dtype=bool)

    def offer(self, i: int, cand_ids: np.ndarray, cand_d: np.ndarray) -> bool:
        """Merge candidates into i's list; True if the list changed."""
        ids = np.concatenate([self.ids[i], cand_ids])
        d = np.concatenate([self.dist[i], cand_d])
        # Dedup keeping the first (already-sorted current entries first).
        _, first = np.unique(ids, return_index=True)
        ids, d = ids[np.sort(first)], d[np.sort(first)]
        order = np.argsort(d, kind="stable")[: self.K]
        new_ids = ids[order]
        changed = (
            len(new_ids) != len(self.ids[i]) or
            not np.array_equal(np.sort(new_ids), np.sort(self.ids[i]))
        )
        self.ids[i], self.dist[i] = new_ids, d[order]
        return changed

    def worst_sum(self) -> np.ndarray:
        """Sum of AKNN distances per object (outlier-ness proxy, §5.1).
        Objects with short lists rank worst (they are padded with inf)."""
        out = np.empty(self.n)
        for i in range(self.n):
            d = self.dist[i]
            pad = (self.K - len(d)) * 1e18
            out[i] = d.sum() + pad
        return out


def _random_init(state: _KnnState, X, metric: Metric, rng,
                 only: np.ndarray | None = None) -> None:
    n = state.n
    targets = range(n) if only is None else only
    for i in targets:
        i = int(i)
        cand = rng.choice(n - 1, size=min(state.K, n - 1), replace=False)
        cand = np.where(cand >= i, cand + 1, cand).astype(np.int64)
        d = metric.one_to_many(X[i], X[cand])
        state.offer(i, cand, d)


def _iterate(state: _KnnState, X, metric: Metric, *, max_iters: int,
             use_skip: bool, sample: int, rng) -> int:
    """The NNDescent local-join loop; returns iterations executed."""
    n = state.n
    for it in range(max_iters):
        # Reverse AKNN lists for this round.
        rev: list[list[int]] = [[] for _ in range(n)]
        for i in range(n):
            for j in state.ids[i]:
                rev[int(j)].append(i)
        prev_changed = state.changed.copy()
        new_changed = np.zeros(n, dtype=bool)
        n_updates = 0
        for i in range(n):
            # Similar-object list of i: AKNNs + reverse AKNNs. With
            # skip-flags, only members whose own lists changed last
            # iteration contribute their lists (paper §5.1).
            similar = np.concatenate([
                state.ids[i],
                np.asarray(rev[i][: state.K], dtype=np.int64),
            ])
            cand: set[int] = set()
            for j in similar:
                j = int(j)
                if use_skip and not prev_changed[j]:
                    continue
                cand.update(int(x) for x in state.ids[j])
                cand.update(rev[j][: sample])
            cand.discard(i)
            cand.difference_update(int(x) for x in state.ids[i])
            if not cand:
                continue
            cl = np.fromiter(cand, dtype=np.int64)
            if len(cl) > 4 * state.K:
                cl = rng.choice(cl, size=4 * state.K, replace=False)
            d = metric.one_to_many(X[i], X[cl])
            if state.offer(i, cl, d):
                new_changed[i] = True
                n_updates += 1
        state.changed = new_changed
        if n_updates <= max(1, n // 1000):
            return it + 1
    return max_iters


def _exact_knn_for(state: _KnnState, X, metric: Metric, targets, Kp: int):
    """Replace targets' lists by exact Kp-NN via a full scan."""
    n = state.n
    exact = np.zeros(n, dtype=bool)
    for i in targets:
        i = int(i)
        d = metric.one_to_many(X[i], X)
        d[i] = np.inf
        kk = min(Kp, n - 1)
        order = np.argpartition(d, kk - 1)[:kk]
        order = order[np.argsort(d[order])]
        state.ids[i] = order.astype(np.int64)
        state.dist[i] = d[order]
        exact[i] = True
    return exact


def build_kgraph(X, metric: Metric, *, K: int, max_iters: int = 10,
                 seed: int = 0) -> ProximityGraph:
    """KGraph: the AKNN graph of plain NNDescent (random init, no
    skip-flags, no exact pass). Directed, degree K."""
    t0 = time.perf_counter()
    before = metric.n_dist
    rng = np.random.default_rng(seed)
    state = _KnnState(len(X), K)
    _random_init(state, X, metric, rng)
    _iterate(state, X, metric, max_iters=max_iters, use_skip=False,
             sample=K, rng=rng)
    g = ProximityGraph(adj=state.ids, K=K, kind="kgraph")
    g.build_seconds = {"NNDescent(+)": time.perf_counter() - t0}
    g.build_n_dist = metric.n_dist - before
    return g


def build_nndescent_plus(
    X, metric: Metric, *, K: int, K_prime: int | None = None,
    m: int | None = None, max_iters: int = 10, capacity: int | None = None,
    repeats: int = 3, seed: int = 0,
) -> tuple[ProximityGraph, list[int]]:
    """NNDescent+ (§5.1): returns (directed AKNN graph, pivot ids).

    ``K_prime=None`` means the MRPG default 4K; pass ``K_prime=K`` for
    MRPG-basic ("exact K-NNs for some objects instead of K'-NNs").
    ``m`` objects (default max(32, ~3% of n), sized to cover every
    probable outlier at the outlier ratios of the paper's Table 2) get
    the exact pass.
    """
    t0 = time.perf_counter()
    before = metric.n_dist
    n = len(X)
    rng = np.random.default_rng(seed)
    Kp = 4 * K if K_prime is None else K_prime
    Kp = min(Kp, n - 1)
    m = max(32, n // 33) if m is None else m
    m = min(m, n)
    c = capacity or max(K + 1, 2 * K)

    # Step 1 (Alg. 3): ball-partition init + pivot extraction.
    buckets, pivots = vp_partition(X, metric, capacity=c, seed=seed,
                                   repeats=repeats)
    state = _KnnState(n, K)
    covered = np.zeros(n, dtype=bool)
    for b in buckets:
        members = b.astype(np.int64)
        covered[members] = True
        for i in members:
            i = int(i)
            others = members[members != i]
            if len(others) == 0:
                continue
            d = metric.one_to_many(X[i], X[others])
            state.offer(i, others, d)
    missed = np.flatnonzero(~covered)
    if len(missed):
        _random_init(state, X, metric, rng, only=missed)

    # Steps 2-3: iterate with skip-flags.
    _iterate(state, X, metric, max_iters=max_iters, use_skip=True,
             sample=K, rng=rng)

    # Exact K'-NN pass for the m worst objects (probable outliers).
    worst = np.argsort(-state.worst_sum())[:m]
    exact = _exact_knn_for(state, X, metric, worst, Kp)

    g = ProximityGraph(adj=state.ids, K=K, exact_mask=exact, K_prime=Kp,
                       kind="nndescent+")
    g.pivot_mask = np.zeros(n, dtype=bool)
    g.pivot_mask[pivots] = True
    g.build_seconds = {"NNDescent(+)": time.perf_counter() - t0}
    g.build_n_dist = metric.n_dist - before
    return g, pivots
