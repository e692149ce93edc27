"""MRPG construction (paper §5): NNDescent+ -> Connect-SubGraphs ->
Remove-Detours -> Remove-Links.

The output graph carries pivot and exact-K'-NN annotations; build time
is recorded per step (paper Table 4) along with the number of distance
computations.
"""
from __future__ import annotations

import time
from collections import deque

import numpy as np

from repro.core.graph import ProximityGraph
from repro.core.nndescent import build_nndescent_plus
from repro.core.nsw import greedy_search
from repro.metrics.distances import Metric


def _to_sets(adj) -> list[set[int]]:
    return [set(int(j) for j in a) for a in adj]


def _to_arrays(adj_sets: list[set[int]]) -> list[np.ndarray]:
    return [np.asarray(sorted(s), dtype=np.int64) for s in adj_sets]


def connect_subgraphs(X, metric: Metric, adj: list[set[int]],
                      pivots: list[int], *, seed: int = 0,
                      n_entry_pivots: int = 5, max_hops: int = 10) -> None:
    """Alg. 4 in place: undirect (done by caller making sets symmetric),
    then BFS + pivot-ANN links until one connected component.

    The reverse-AKNN phase is realized by symmetrizing ``adj`` before the
    call (``undirect_in_place``); this function performs the BFS-with-ANN
    phase: whenever BFS leaves objects untraversed, a random pivot of the
    untraversed part is linked to its approximate NN in the traversed
    part, found by greedy search from a handful of traversed pivots.
    """
    n = len(adj)
    rng = np.random.default_rng(seed)
    pivot_set = set(pivots)
    visited = np.zeros(n, dtype=bool)
    adj_list = [list(s) for s in adj]  # greedy_search view (kept in sync)

    def bfs_from(s: int) -> None:
        q = deque((s,))
        visited[s] = True
        while q:
            v = q.popleft()
            for j in adj[v]:
                if not visited[j]:
                    visited[j] = True
                    q.append(j)

    bfs_from(int(rng.integers(n)))
    while not visited.all():
        unvisited = np.flatnonzero(~visited)
        # v'_piv: a random untraversed pivot (fallback: any untraversed).
        up = [i for i in unvisited if i in pivot_set]
        vp = int(rng.choice(up)) if up else int(rng.choice(unvisited))
        # V_piv: random traversed pivots (fallback: traversed objects).
        tv = np.flatnonzero(visited)
        tp = [i for i in tv if i in pivot_set]
        pool = tp if tp else tv.tolist()
        starts = rng.choice(len(pool), size=min(n_entry_pivots, len(pool)),
                            replace=False)
        best, best_d = None, np.inf
        for si in starts:
            evaluated: dict[int, float] = {}
            cand = greedy_search(X, metric, adj_list, X[vp], int(pool[si]),
                                 max_hops=max_hops, evaluated=evaluated)
            # The greedy walk stays inside the traversed component.
            d = evaluated[cand]
            if d < best_d:
                best, best_d = cand, d
        adj[vp].add(best)
        adj[best].add(vp)
        adj_list[vp].append(best)
        adj_list[best].append(vp)
        bfs_from(vp)


def undirect_in_place(adj: list[set[int]]) -> None:
    """Reverse-AKNN phase of Alg. 4: add every reverse link."""
    for i, s in enumerate(adj):
        for j in list(s):
            adj[j].add(i)
    for i, s in enumerate(adj):
        s.discard(i)


def _bfs_non_monotonic(X, metric: Metric, adj: list[set[int]], src: int,
                       start: int, hops: int, flagged: dict[int, float],
                       *, max_visits: int) -> None:
    """Get-Non-Monotonic with a hop bound (paper §5.3): BFS from
    ``start``, measuring distances *to src*; a traversed object whose
    distance to src is smaller than its BFS-parent's is on a detour, so
    no monotonic path from src was confirmed — flag it."""
    dist_to_src: dict[int, float] = {start: metric.pair(X[src], X[start])}
    visited = {start, src}
    frontier = [start]
    for _ in range(hops):
        if not frontier or len(visited) > max_visits:
            break
        nxt: list[int] = []
        for v in frontier:
            fresh = [j for j in adj[v] if j not in visited]
            if not fresh:
                continue
            visited.update(fresh)
            d = metric.one_to_many(X[src], X[fresh])
            pd = dist_to_src[v]
            for j, dj in zip(fresh, d):
                dist_to_src[j] = float(dj)
                if dj < pd:  # path went away from src then back: detour
                    prev = flagged.get(j)
                    if prev is None or dj < prev:
                        flagged[j] = float(dj)
                nxt.append(j)
            if len(visited) > max_visits:
                break
        frontier = nxt


def remove_detours(X, metric: Metric, adj: list[set[int]],
                   pivot_mask: np.ndarray, exact_mask: np.ndarray,
                   K: int, *, seed: int = 0) -> None:
    """Alg. 5 in place: heuristic monotonic-path creation.

    Samples |P'| = O(n/K) source objects (pivots weighted up, exact-K'NN
    objects excluded), runs 3-hop BFS from each source and 2-hop BFS from
    O(K) nearby pivots, collects objects with no confirmed monotonic
    path, and chain-links them to the source in ascending distance order
    (which *is* a monotonic path from the source).
    """
    n = len(adj)
    rng = np.random.default_rng(seed)
    eligible = np.flatnonzero(~exact_mask)
    if len(eligible) == 0:
        return
    n_src = max(1, n // K)
    w = np.where(pivot_mask[eligible], 3.0, 1.0)
    w /= w.sum()
    srcs = rng.choice(eligible, size=min(n_src, len(eligible)),
                      replace=False, p=w)
    a_cap = K * K
    for src in srcs:
        src = int(src)
        flagged: dict[int, float] = {}
        _bfs_non_monotonic(X, metric, adj, src, src, 3, flagged,
                           max_visits=4 * K * K)
        # Nearby pivots: seen in the 3-hop BFS, beyond one hop, no exact
        # K'-NNs (paper §5.3); 2-hop BFS from each w.r.t. distance-to-src.
        seen = list(flagged)
        near_piv = [
            j for j in seen
            if pivot_mask[j] and not exact_mask[j] and j not in adj[src]
        ]
        if near_piv:
            take = rng.choice(len(near_piv), size=min(K, len(near_piv)),
                              replace=False)
            for t in take:
                _bfs_non_monotonic(X, metric, adj, src, int(near_piv[t]), 2,
                                   flagged, max_visits=2 * K * K)
        flagged.pop(src, None)
        if not flagged:
            continue
        order = sorted(flagged.items(), key=lambda kv: kv[1])[:a_cap]
        # Chain: src -> A[0] -> A[1] -> ... (ascending distance to src).
        prev = src
        for j, _ in order:
            adj[prev].add(j)
            adj[j].add(prev)
            prev = j


def remove_links(adj: list[set[int]], pivot_mask: np.ndarray,
                 exact_mask: np.ndarray | None = None) -> int:
    """Alg. §5.4 in place: for every non-pivot p linked to a pivot q,
    drop p's links to non-pivot objects that q also links (Greedy-
    Counting reaches them through q, which is always expanded). Returns
    the number of removed undirected links.

    Links incident to exact-K'-NN-flagged vertices are never removed:
    the §5.5 O(k) outlier decision requires their link sets to remain
    supersets of their exact K'-NNs.
    """
    n = len(adj)
    removed = 0
    for p in range(n):
        if pivot_mask[p] or (exact_mask is not None and exact_mask[p]):
            continue
        piv_nbrs = [q for q in adj[p] if pivot_mask[q]]
        for q in piv_nbrs:
            common = [
                u for u in adj[p] & adj[q]
                if not pivot_mask[u] and u != q
                and (exact_mask is None or not exact_mask[u])
            ]
            for u in common:
                adj[p].discard(u)
                adj[u].discard(p)
                removed += 1
    return removed


def build_mrpg(X, metric: Metric, *, K: int, basic: bool = False,
               m: int | None = None, seed: int = 0,
               max_iters: int = 10) -> ProximityGraph:
    """Full MRPG build (Theorem 4 pipeline). ``basic=True`` builds
    MRPG-basic: the exact pass retrieves K-NNs instead of K'-NNs=4K-NNs
    (its filter cannot decide outliers unless k <= K)."""
    g, pivots = build_nndescent_plus(
        X, metric, K=K, K_prime=(K if basic else None), m=m, seed=seed,
        max_iters=max_iters,
    )
    times = dict(g.build_seconds)
    n_dist0 = g.build_n_dist

    adj = _to_sets(g.adj)
    t0 = time.perf_counter()
    b0 = metric.n_dist
    undirect_in_place(adj)
    connect_subgraphs(X, metric, adj, pivots, seed=seed + 1)
    times["Connect-SubGraphs"] = time.perf_counter() - t0

    t0 = time.perf_counter()
    remove_detours(X, metric, adj, g.pivot_mask, g.exact_mask, K,
                   seed=seed + 2)
    times["Remove-Detours"] = time.perf_counter() - t0

    t0 = time.perf_counter()
    remove_links(adj, g.pivot_mask, g.exact_mask)
    times["Remove-Links"] = time.perf_counter() - t0

    out = ProximityGraph(
        adj=_to_arrays(adj), K=K, pivot_mask=g.pivot_mask,
        exact_mask=g.exact_mask, K_prime=g.K_prime,
        kind="mrpg-basic" if basic else "mrpg",
        build_seconds=times,
        build_n_dist=n_dist0 + (metric.n_dist - b0),
    )
    return out
