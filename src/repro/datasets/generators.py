"""Synthetic analogs of the paper's seven evaluation datasets.

The paper (Table 1) evaluates on Deep, Glove, HEPMASS, MNIST, PAMAP2,
SIFT (vectors under L2/L1/L4/angular) and Words (strings under edit
distance) — 0.46M to 10M objects. Those datasets are not available
offline and exceed container scale, so each is substituted by a
deterministic generator that preserves the properties the paper's
analysis depends on (DESIGN.md §4):

- the same distance function per dataset;
- a clustered (Gaussian-mixture-like) distance distribution, with
  power-law-ish cluster sizes so the number of neighbors follows a
  power law ("most objects have many neighbors", paper §6);
- a small planted fraction of isolated objects, tuned so the default
  ``(r, k)`` produce outlier ratios in the band of the paper's Table 2
  (0.34%–4.16%);
- dataset-specific quirks the paper calls out: Deep is comparatively
  *sparse* (borderline inliers -> larger ``f``); SIFT's distance
  distribution is a Gaussian *mixture* (two cluster scales); PAMAP2 is
  skewed; Words outliers have large length (expensive edit distances).

``r`` defaults are auto-calibrated per instance (``calibrate_r``): the
median k-NN distance over a sample of objects, times a margin — the
paper likewise picked ``r`` "so that the outlier ratio is small or clear
outliers are identified".
"""
from __future__ import annotations

import string
from dataclasses import dataclass, field

import numpy as np

from repro.metrics.distances import Metric, get_metric


@dataclass
class MetricDataset:
    """One dataset analog: objects + metric + calibrated default params."""

    name: str
    X: np.ndarray               # (n, d) float64, or object array of strings
    metric_name: str
    r_default: float
    k_default: int
    paper: dict = field(default_factory=dict)  # paper-side stats for tables

    @property
    def n(self) -> int:
        return len(self.X)

    @property
    def dim(self):
        if self.X.dtype == object:
            lens = [len(s) for s in self.X]
            return f"{min(lens)}-{max(lens)}"
        return self.X.shape[1]

    def metric(self) -> Metric:
        return get_metric(self.metric_name)


def calibrate_r(X, metric: Metric, k: int, *, target_ratio: float = 0.01,
                sample: int = 768, seed: int = 0) -> float:
    """Pick ``r`` so the outlier ratio lands near ``target_ratio``.

    An object is an outlier iff its k-th NN distance exceeds ``r``, so
    the ``(1 - target_ratio)`` quantile of exact k-th-NN distances over a
    sample of objects is (up to sampling error) the ``r`` that yields the
    target ratio — reproducing how the paper chose Table 2's defaults
    ("so that the outlier ratio is small or clear outliers are
    identified").
    """
    rng = np.random.default_rng(seed)
    idx = rng.choice(len(X), size=min(sample, len(X)), replace=False)
    kth = []
    for i in idx:
        d = metric.one_to_many(X[i], X)
        d[i] = np.inf
        kk = min(k, len(d) - 1)
        kth.append(np.partition(d, kk - 1)[kk - 1])
    r = float(np.quantile(kth, 1.0 - target_ratio))
    if metric.name == "edit":
        return float(max(1.0, np.round(r)))
    # Nudge r off the quantile sample point: the quantile can equal some
    # object's exact k-th-NN distance, and different engines (numpy vs
    # Spark/DuckDB SQL) round the last ulp differently, flipping that
    # object's outlier status. A relative margin keeps all engines on
    # the same side of the threshold.
    return r * (1.0 + 1e-6)


def _power_law_sizes(n: int, n_clusters: int, rng, alpha: float = 1.2):
    w = 1.0 / np.arange(1, n_clusters + 1) ** alpha
    w /= w.sum()
    sizes = np.maximum(1, np.round(w * n).astype(int))
    while sizes.sum() > n:
        sizes[np.argmax(sizes)] -= 1
    while sizes.sum() < n:
        sizes[np.argmin(sizes)] += 1
    return sizes


def _mixture(n: int, dim: int, n_clusters: int, stds, rng, *,
             center_scale: float = 100.0, skew_alpha: float | None = None,
             aniso: float = 1.0, t_df: float | None = 5.0):
    """Clustered inliers with given per-cluster scales.

    Real high-dimensional data is not a mixture of isotropic balls:
    clusters are elongated (per-dimension scales spread by ``aniso``
    octaves) and heavy-tailed (Student-t noise, ``t_df`` degrees of
    freedom). Both matter for reproducing the paper's shapes: isotropic
    compact balls make r/2 leader clustering (SNIF) and early-terminated
    scans unrealistically effective, and leave proximity graphs with no
    detours to remove.
    """
    centers = rng.uniform(0.0, center_scale, size=(n_clusters, dim))
    if skew_alpha is not None:
        sizes = _power_law_sizes(n, n_clusters, rng, skew_alpha)
    else:
        sizes = _power_law_sizes(n, n_clusters, rng)
    rows = []
    for c, s, m in zip(centers, stds, sizes):
        dim_scale = s * np.exp(rng.uniform(-aniso, aniso, size=dim))
        if t_df is None:
            noise = rng.normal(size=(m, dim))
        else:
            noise = rng.standard_t(t_df, size=(m, dim))
        rows.append(c + noise * dim_scale)
    X = np.vstack(rows)
    return X[rng.permutation(len(X))]


def _plant_outliers(X: np.ndarray, frac: float, rng, *, spread: float = 2.0):
    """Replace a ``frac`` fraction of rows with isolated uniform points.

    Points are drawn uniformly from a box ``spread`` times wider than the
    data's bounding box; in >=25 dimensions such points are far from
    every cluster with overwhelming probability.
    """
    n = len(X)
    n_out = max(1, int(round(frac * n)))
    lo, hi = X.min(axis=0), X.max(axis=0)
    mid, half = (lo + hi) / 2, (hi - lo) / 2
    out = rng.uniform(mid - spread * half, mid + spread * half,
                      size=(n_out, X.shape[1]))
    idx = rng.choice(n, size=n_out, replace=False)
    X = X.copy()
    X[idx] = out
    return X


def _vector_dataset(name, metric_name, n, dim, n_clusters, std_lo, std_hi,
                    out_frac, seed, paper, *, normalize=False,
                    skew_alpha=None, k_div=64, ratio_scale=1.0,
                    aniso=1.0, t_df=5.0):
    rng = np.random.default_rng(seed)
    stds = rng.uniform(std_lo, std_hi, size=n_clusters)
    X = _mixture(n, dim, n_clusters, stds, rng, skew_alpha=skew_alpha,
                 aniso=aniso, t_df=t_df)
    X = _plant_outliers(X, out_frac, rng)
    if normalize:
        norms = np.linalg.norm(X, axis=1, keepdims=True)
        X = X / np.where(norms == 0, 1.0, norms)
    k = max(4, n // k_div)
    target = paper["outlier_ratio"] / 100.0 * ratio_scale
    r = calibrate_r(X, get_metric(metric_name), k, target_ratio=target,
                    seed=seed)
    return MetricDataset(name, X, metric_name, r, k, paper)


def deep_like(n: int = 3000, seed: int = 11) -> MetricDataset:
    """Deep analog: L2, sparse/overlapping clusters -> many borderline
    inliers, reproducing the paper's observation that Deep's ``f`` is the
    largest (its reasonable ``r`` sits far from the distance-distribution
    mean)."""
    return _vector_dataset(
        "Deep", "l2", n, 32, 12, 6.0, 22.0, 0.005, seed,
        paper={"cardinality": 10_000_000, "dim": 96, "distance": "L2-norm",
               "r": 0.93, "k": 50, "outlier_ratio": 0.62})


def glove_like(n: int = 3000, seed: int = 12) -> MetricDataset:
    """Glove analog: unit-norm vectors under angular distance, 25-d."""
    return _vector_dataset(
        "Glove", "angular", n, 25, 14, 4.0, 9.0, 0.004, seed,
        normalize=True,
        paper={"cardinality": 1_193_514, "dim": 25, "distance": "Angular",
               "r": 0.25, "k": 20, "outlier_ratio": 0.55})


def hepmass_like(n: int = 3000, seed: int = 13) -> MetricDataset:
    """HEPMASS analog: L1 metric, 27-d Gaussian mixture."""
    return _vector_dataset(
        "HEPMASS", "l1", n, 27, 14, 4.0, 9.0, 0.005, seed,
        paper={"cardinality": 7_000_000, "dim": 27, "distance": "L1-norm",
               "r": 15, "k": 50, "outlier_ratio": 0.65})


def mnist_like(n: int = 3000, seed: int = 14) -> MetricDataset:
    """MNIST analog: L4 metric. 64-d instead of 784-d (cost; DESIGN §7).

    Heavier cluster overlap than the others: the paper found MNIST false
    positives have nearly ``k`` neighbors (early termination struggles).
    """
    return _vector_dataset(
        "MNIST", "l4", n, 64, 10, 6.0, 14.0, 0.0025, seed,
        paper={"cardinality": 3_000_000, "dim": 784, "distance": "L4-norm",
               "r": 600, "k": 50, "outlier_ratio": 0.34})


def pamap2_like(n: int = 3000, seed: int = 15) -> MetricDataset:
    """PAMAP2 analog: L2, 51-d, strongly skewed cluster sizes."""
    return _vector_dataset(
        "PAMAP2", "l2", n, 51, 16, 3.0, 8.0, 0.005, seed, skew_alpha=1.8,
        aniso=1.5,
        paper={"cardinality": 2_844_868, "dim": 51, "distance": "L2-norm",
               "r": 50_000, "k": 100, "outlier_ratio": 0.61},
        k_div=32)


def sift_like(n: int = 3000, seed: int = 16) -> MetricDataset:
    """SIFT analog: L2, two distinct cluster scales so the pairwise
    distance distribution is a Gaussian *mixture* (paper §6)."""
    rng = np.random.default_rng(seed)
    stds = np.where(np.arange(12) % 2 == 0,
                    rng.uniform(3.0, 5.0, 12), rng.uniform(9.0, 12.0, 12))
    X = _mixture(n, 32, 12, stds, rng)
    X = _plant_outliers(X, 0.008, rng)
    k = max(4, n // 64)
    r = calibrate_r(X, get_metric("l2"), k, target_ratio=0.0104, seed=seed)
    return MetricDataset(
        "SIFT", X, "l2", r, k,
        paper={"cardinality": 1_000_000, "dim": 128, "distance": "L2-norm",
               "r": 320, "k": 40, "outlier_ratio": 1.04})


_ALPHABET = np.array(list(string.ascii_lowercase))


def words_like(n: int = 2000, seed: int = 17) -> MetricDataset:
    """Words analog: strings under edit distance.

    Inliers are 0–2-edit mutations of ~n/40 stem words (length 4–9), so
    they form tight edit-distance clusters; outliers (~3%) are long
    random strings (length 10–14) — matching the paper's observation that
    Words outliers have large dimensionality, making their verification
    (quadratic-cost edit distance) dominate.
    """
    rng = np.random.default_rng(seed)
    n_stems = max(8, n // 40)
    stems = []
    for _ in range(n_stems):
        L = int(rng.integers(4, 10))
        stems.append("".join(rng.choice(_ALPHABET, L)))

    def mutate(w: str, edits: int) -> str:
        s = list(w)
        for _ in range(edits):
            op = rng.integers(3)
            pos = int(rng.integers(len(s))) if s else 0
            ch = str(rng.choice(_ALPHABET))
            if op == 0 and len(s) > 2:
                del s[pos]
            elif op == 1:
                s.insert(pos, ch)
            else:
                s[pos] = ch
        return "".join(s)

    n_out = max(1, int(round(0.03 * n)))
    words = []
    sizes = _power_law_sizes(n - n_out, n_stems, rng)
    for stem, m in zip(stems, sizes):
        for _ in range(m):
            words.append(mutate(stem, int(rng.integers(0, 3))))
    for _ in range(n_out):
        L = int(rng.integers(10, 15))
        words.append("".join(rng.choice(_ALPHABET, L)))
    X = np.array(words, dtype=object)
    X = X[rng.permutation(len(X))]
    k = max(4, n // 128)
    r = calibrate_r(X, get_metric("edit"), k, target_ratio=0.0416,
                    sample=256, seed=seed)
    return MetricDataset(
        "Words", X, "edit", r, k,
        paper={"cardinality": 466_551, "dim": "1-45", "distance": "Edit",
               "r": 5, "k": 15, "outlier_ratio": 4.16})


GENERATORS = {
    "Deep": deep_like,
    "Glove": glove_like,
    "HEPMASS": hepmass_like,
    "MNIST": mnist_like,
    "PAMAP2": pamap2_like,
    "SIFT": sift_like,
    "Words": words_like,
}

DATASET_ORDER = list(GENERATORS)


def make(name: str, n: int | None = None, seed: int | None = None) -> MetricDataset:
    """Build the named dataset analog (paper Table 1 row)."""
    gen = GENERATORS[name]
    kwargs = {}
    if n is not None:
        kwargs["n"] = n
    if seed is not None:
        kwargs["seed"] = seed
    return gen(**kwargs)
