"""Proximity-graph container shared by KGraph / NSW / MRPG.

A graph over ``n`` objects is an adjacency list (undirected or directed
depending on the builder), plus the two per-vertex annotations MRPG
adds: the *pivot* flag (Greedy-Counting expands pivots even when they
are out of range — Alg. 2 lines 13–14) and the *exact-K'-NN* flag
(vertices whose links are their exact K'-nearest neighbors, enabling
the O(k) outlier decision of paper §5.5).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


@dataclass
class ProximityGraph:
    """Adjacency-list proximity graph with MRPG annotations."""

    adj: list[np.ndarray]                 # adj[i]: neighbor ids of vertex i
    K: int                                # nominal degree parameter
    pivot_mask: np.ndarray | None = None  # bool (n,): MRPG pivots
    exact_mask: np.ndarray | None = None  # bool (n,): links are exact K'-NN
    K_prime: int = 0                      # K' for exact-flagged vertices
    kind: str = "generic"                 # "kgraph" | "nsw" | "mrpg" | ...
    build_seconds: dict = field(default_factory=dict)   # per build step
    build_n_dist: int = 0                 # distance computations at build

    @property
    def n(self) -> int:
        return len(self.adj)

    def n_links(self) -> int:
        return sum(len(a) for a in self.adj)

    def index_bytes(self) -> int:
        """Index size accounting for Table 6: 4 bytes per link id plus
        per-vertex list header + flag bytes."""
        return self.n_links() * 4 + self.n * 10

    def undirected(self) -> "ProximityGraph":
        """Symmetrized copy (adds every reverse link)."""
        rev: list[list[int]] = [[] for _ in range(self.n)]
        for i, nbrs in enumerate(self.adj):
            for j in nbrs:
                rev[int(j)].append(i)
        adj = [
            np.union1d(self.adj[i], np.asarray(rev[i], dtype=np.int64))
            for i in range(self.n)
        ]
        adj = [a[a != i] for i, a in enumerate(adj)]
        return ProximityGraph(
            adj=adj, K=self.K, pivot_mask=self.pivot_mask,
            exact_mask=self.exact_mask, K_prime=self.K_prime, kind=self.kind,
            build_seconds=dict(self.build_seconds),
            build_n_dist=self.build_n_dist,
        )

    def connected_components(self) -> np.ndarray:
        """Component label per vertex, treating links as undirected
        (used by Connect-SubGraphs tests and the BFS phase)."""
        label = np.full(self.n, -1, dtype=np.int64)
        rev: list[list[int]] = [[] for _ in range(self.n)]
        for i, nbrs in enumerate(self.adj):
            for j in nbrs:
                rev[int(j)].append(i)
        cur = 0
        for s in range(self.n):
            if label[s] >= 0:
                continue
            stack = [s]
            label[s] = cur
            while stack:
                v = stack.pop()
                for j in list(self.adj[v]) + rev[v]:
                    j = int(j)
                    if label[j] < 0:
                        label[j] = cur
                        stack.append(j)
            cur += 1
        return label
