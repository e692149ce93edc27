"""NNDescent / NNDescent+ tests: degrees, recall, pivots, exact pass."""
import numpy as np
import pytest

from repro.core.nndescent import build_kgraph, build_nndescent_plus
from repro.datasets.generators import make
from repro.metrics.distances import get_metric

K = 8


@pytest.fixture(scope="module")
def data():
    ds = make("SIFT", n=400)
    return ds.X


def _exact_knn(X, metric_name, i, K):
    m = get_metric(metric_name)
    d = m._one_to_many(X[i], X)
    d[i] = np.inf
    return set(np.argpartition(d, K - 1)[:K].tolist())


def _recall(X, metric_name, g, K, stride=7):
    """Tie-aware recall: a found neighbor counts if its distance is <=
    the exact K-th NN distance (integer metrics have heavy ties)."""
    m = get_metric(metric_name)
    hits = tot = 0
    for i in range(0, len(X), stride):
        d = m._one_to_many(X[i], X)
        d[i] = np.inf
        kth = np.partition(d, K - 1)[K - 1]
        found = g.adj[i][:K]
        hits += int((d[found] <= kth + 1e-12).sum())
        tot += K
    return hits / tot


def test_kgraph_degree(data):
    g = build_kgraph(data, get_metric("l2"), K=K)
    assert all(len(a) == K for a in g.adj)
    assert all(i not in a for i, a in enumerate(g.adj))


def test_kgraph_recall(data):
    g = build_kgraph(data, get_metric("l2"), K=K)
    assert _recall(data, "l2", g, K) > 0.85


def test_nndescent_plus_recall_and_pivots(data):
    g, pivots = build_nndescent_plus(data, get_metric("l2"), K=K)
    assert _recall(data, "l2", g, K) > 0.85
    assert 0 < len(pivots) < len(data) / 2   # o(n) pivots
    assert g.pivot_mask is not None and g.pivot_mask.sum() == len(pivots)


def test_nndescent_plus_counts_distances(data):
    m = get_metric("l2")
    g, _ = build_nndescent_plus(data, m, K=K)
    assert g.build_n_dist > 0
    assert g.build_n_dist == m.n_dist
    # Far fewer than the O(n^2) brute-force pair count.
    assert g.build_n_dist < 0.8 * len(data) ** 2


def test_exact_pass_flags_and_correctness(data):
    g, _ = build_nndescent_plus(data, get_metric("l2"), K=K, m=20)
    exact_ids = np.flatnonzero(g.exact_mask)
    assert len(exact_ids) == 20
    assert g.K_prime == 4 * K
    for i in exact_ids[:5]:
        kk = min(g.K_prime, len(data) - 1)
        want = _exact_knn(data, "l2", int(i), kk)
        assert set(int(j) for j in g.adj[i]) == want
        d = get_metric("l2")._one_to_many(data[i], data)[g.adj[i]]
        assert (np.diff(d) >= -1e-12).all()  # sorted ascending


def test_mrpg_basic_exact_pass_uses_K(data):
    g, _ = build_nndescent_plus(data, get_metric("l2"), K=K, K_prime=K, m=10)
    assert g.K_prime == K
    for i in np.flatnonzero(g.exact_mask)[:3]:
        assert len(g.adj[i]) == K


def test_exact_pass_targets_worst_objects(data):
    """The exact pass must hit the planted isolates (probable outliers)."""
    from repro.baselines.brute_force import neighbor_counts
    ds = make("SIFT", n=400)
    g, _ = build_nndescent_plus(ds.X, get_metric("l2"), K=K, m=40)
    counts = neighbor_counts(ds.X, "l2", ds.r_default)
    outliers = set(np.flatnonzero(counts < ds.k_default).tolist())
    flagged = set(np.flatnonzero(g.exact_mask).tolist())
    if outliers:
        assert len(outliers & flagged) / len(outliers) > 0.7


def test_nndescent_plus_on_strings():
    ds = make("Words", n=250)
    g, pivots = build_nndescent_plus(ds.X, get_metric("edit"), K=6)
    assert _recall(ds.X, "edit", g, 6) > 0.6
    assert len(pivots) > 0


@pytest.mark.parametrize("metric_name,ds_name", [
    ("l1", "HEPMASS"), ("l4", "MNIST"), ("angular", "Glove"),
])
def test_builders_work_on_all_metrics(metric_name, ds_name):
    ds = make(ds_name, n=250)
    g = build_kgraph(ds.X, get_metric(metric_name), K=6)
    assert g.n == 250
    g2, _ = build_nndescent_plus(ds.X, get_metric(metric_name), K=6)
    assert g2.n == 250


def test_tiny_dataset():
    X = np.random.default_rng(0).normal(size=(12, 4))
    g = build_kgraph(X, get_metric("l2"), K=5)
    assert all(len(a) == 5 for a in g.adj)
    g2, _ = build_nndescent_plus(X, get_metric("l2"), K=5, m=3)
    assert all(1 <= len(a) for a in g2.adj)
