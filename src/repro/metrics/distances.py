"""Metric distance functions used by the paper's seven datasets.

The paper (Table 1) evaluates on five distance functions: L2 (Deep,
PAMAP2, SIFT), L1 (HEPMASS), L4 (MNIST), angular distance (Glove), and
edit distance (Words). All satisfy the metric axioms, which the
algorithms rely on (triangle-inequality pruning in SNIF/DOLPHIN/VP-tree).

Every metric exposes two granularities:

- ``pair(a, b)`` — one distance.
- ``one_to_many(q, X)`` — distances from ``q`` to a small batch ``X``.

All algorithms in this repo consume distances exclusively through these
two calls, at the batch granularity the paper's C++ implementation
naturally has (a graph step evaluates one adjacency list, a scan
evaluates one small chunk). A per-metric counter tracks the number of
distance computations — the hardware-independent cost reported next to
wall-clock time in EXPERIMENTS.md.

Vector metrics take ``np.ndarray`` rows; the edit metric takes Python
strings (``X`` is a list/array of strings).
"""
from __future__ import annotations

import numpy as np


class Metric:
    """Base class: distance counting + the two evaluation granularities."""

    name = "abstract"

    def __init__(self) -> None:
        self.n_dist = 0  # number of pairwise distance computations so far

    def reset_counter(self) -> None:
        self.n_dist = 0

    def pair(self, a, b) -> float:
        """Distance between two objects."""
        self.n_dist += 1
        return float(self._pair(a, b))

    def one_to_many(self, q, X) -> np.ndarray:
        """Distances from ``q`` to each object in the batch ``X``."""
        d = self._one_to_many(q, X)
        self.n_dist += len(d)
        return d

    def _pair(self, a, b) -> float:  # pragma: no cover - abstract
        raise NotImplementedError

    def _one_to_many(self, q, X) -> np.ndarray:  # pragma: no cover - abstract
        raise NotImplementedError


class L2(Metric):
    """Euclidean distance (Deep, PAMAP2, SIFT in the paper)."""

    name = "l2"

    def _pair(self, a, b):
        d = a - b
        return np.sqrt(np.dot(d, d))

    def _one_to_many(self, q, X):
        d = X - q
        return np.sqrt(np.einsum("ij,ij->i", d, d))


class L1(Metric):
    """Manhattan distance (HEPMASS in the paper)."""

    name = "l1"

    def _pair(self, a, b):
        return np.abs(a - b).sum()

    def _one_to_many(self, q, X):
        return np.abs(X - q).sum(axis=1)


class L4(Metric):
    """Minkowski distance with p=4 (MNIST in the paper)."""

    name = "l4"

    def _pair(self, a, b):
        d = a - b
        d *= d
        return float(np.dot(d, d)) ** 0.25

    def _one_to_many(self, q, X):
        d = X - q
        d = d * d
        return np.einsum("ij,ij->i", d, d) ** 0.25


class Angular(Metric):
    """Angular distance: arccos of cosine similarity, scaled to [0, 1].

    Glove embeddings live in an angular space (paper §1). We use
    ``arccos(cos_sim) / pi``, which is a proper metric on the unit
    sphere. Inputs need not be pre-normalized.
    """

    name = "angular"

    @staticmethod
    def _cos_to_dist(c):
        return np.arccos(np.clip(c, -1.0, 1.0)) / np.pi

    def _pair(self, a, b):
        na = np.sqrt(np.dot(a, a))
        nb = np.sqrt(np.dot(b, b))
        if na == 0.0 or nb == 0.0:
            return 0.0 if na == nb else 0.5
        return self._cos_to_dist(np.dot(a, b) / (na * nb))

    def _one_to_many(self, q, X):
        nq = np.sqrt(np.dot(q, q))
        nX = np.sqrt(np.einsum("ij,ij->i", X, X))
        denom = nq * nX
        # Zero-norm objects: distance 0 to other zero-norm, 0.5 otherwise.
        safe = np.where(denom == 0.0, 1.0, denom)
        c = X @ q / safe
        d = self._cos_to_dist(c)
        if nq == 0.0:
            return np.where(nX == 0.0, 0.0, 0.5)
        return np.where(denom == 0.0, 0.5, d)


def _levenshtein(a: str, b: str) -> int:
    """Classic O(|a||b|) DP with two rows (Words dataset uses this)."""
    if a == b:
        return 0
    if len(a) < len(b):
        a, b = b, a
    if not b:
        return len(a)
    prev = list(range(len(b) + 1))
    for i, ca in enumerate(a, 1):
        cur = [i] + [0] * len(b)
        for j, cb in enumerate(b, 1):
            cur[j] = min(prev[j] + 1, cur[j - 1] + 1, prev[j - 1] + (ca != cb))
        prev = cur
    return prev[-1]


class Edit(Metric):
    """Levenshtein edit distance over strings (Words in the paper)."""

    name = "edit"

    def _pair(self, a, b):
        return float(_levenshtein(a, b))

    def _one_to_many(self, q, X):
        return np.array([_levenshtein(q, x) for x in X], dtype=np.float64)


_REGISTRY = {m.name: m for m in (L1, L2, L4, Angular, Edit)}


def get_metric(name: str) -> Metric:
    """Fresh metric instance (with a zeroed distance counter) by name."""
    try:
        return _REGISTRY[name]()
    except KeyError:
        raise ValueError(f"unknown metric {name!r}; known: {sorted(_REGISTRY)}")
