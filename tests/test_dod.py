"""Core DOD algorithm tests: Greedy-Counting on crafted graphs, Lemma 1
(no false negatives), and exactness of Algorithm 1 against brute force
for every proximity graph on every dataset analog."""
import numpy as np
import pytest

from repro.baselines.brute_force import brute_force_outliers
from repro.core.dod import (detect_outliers, filter_phase, greedy_counting,
                            verify_candidates)
from repro.core.graph import ProximityGraph
from repro.core.spark_dod import build_graph
from repro.datasets.generators import DATASET_ORDER, make
from repro.metrics.distances import get_metric

K = 8
N = 350


def _line_graph():
    """Points on a line at 0,1,2,3,100; chain adjacency."""
    X = np.array([[0.0], [1.0], [2.0], [3.0], [100.0]])
    adj = [np.array([1]), np.array([0, 2]), np.array([1, 3]),
           np.array([2, 4]), np.array([3])]
    return X, ProximityGraph(adj=[a.astype(np.int64) for a in adj], K=2)


def _count(X, g, i, r, k, metric_name="l2"):
    m = get_metric(metric_name)
    visited = np.zeros(len(X), dtype=np.int64)
    return greedy_counting(i, X, m, g, r, k, visited=visited, stamp=1)


def test_greedy_counting_chain():
    X, g = _line_graph()
    # From 0 with r=2.5: reaches 1 (d=1), 2 (d=2); 3 is at 3 > r, stop.
    assert _count(X, g, 0, 2.5, 10) == 2
    # Early termination at k.
    assert _count(X, g, 0, 2.5, 1) == 1


def test_greedy_counting_blocked_without_pivot():
    X, g = _line_graph()
    # From 0, r=3: vertex 3 is within r but only reachable through 1,2.
    assert _count(X, g, 0, 3.0, 10) == 3
    # From 4, r=98: nothing is within... 100-3=97<=98 -> vertex 3 yes,
    # then 2 at 98 yes, 1 at 99 no -> traversal stops; 0 unreachable.
    assert _count(X, g, 4, 98.0, 10) == 2


def test_greedy_counting_pivot_expansion():
    """An out-of-range pivot must still be expanded (Alg. 2 l.13-14)."""
    # 0 -- far pivot 1 -- 2 close to 0.
    X = np.array([[0.0], [10.0], [0.5]])
    adj = [np.array([1]), np.array([0, 2]), np.array([1])]
    g = ProximityGraph(adj=[a.astype(np.int64) for a in adj], K=2)
    assert _count(X, g, 0, 1.0, 10) == 0  # 1 out of range, not expanded
    g.pivot_mask = np.array([False, True, False])
    assert _count(X, g, 0, 1.0, 10) == 1  # pivot expanded, 2 found


def test_greedy_counting_never_overcounts():
    X, g = _line_graph()
    for i in range(5):
        for r in (0.5, 1.5, 2.5, 99.0):
            d = np.abs(X - X[i]).ravel()
            true = int((d <= r).sum()) - 1
            assert _count(X, g, i, r, 10) <= true


@pytest.mark.parametrize("graph_kind", ["random", "empty"])
def test_filter_no_false_negatives_any_graph(graph_kind):
    """Lemma 1 holds for arbitrary (even terrible) graphs."""
    ds = make("SIFT", n=200)
    rng = np.random.default_rng(0)
    if graph_kind == "random":
        adj = [rng.choice(200, 4, replace=False).astype(np.int64)
               for _ in range(200)]
    else:
        adj = [np.empty(0, dtype=np.int64) for _ in range(200)]
    g = ProximityGraph(adj=adj, K=4)
    cand, decided, _ = filter_phase(ds.X, get_metric("l2"), g,
                                    ds.r_default, ds.k_default)
    truth = brute_force_outliers(ds.X, "l2", ds.r_default, ds.k_default)
    assert set(truth.tolist()) <= set(cand.tolist()) | set(decided.tolist())


@pytest.mark.parametrize("method", ["scan", "vptree"])
def test_verify_candidates_exact(method):
    ds = make("HEPMASS", n=250)
    truth = brute_force_outliers(ds.X, "l1", ds.r_default, ds.k_default)
    all_ids = np.arange(ds.n)
    got = verify_candidates(ds.X, get_metric("l1"), all_ids, ds.r_default,
                            ds.k_default, method=method)
    np.testing.assert_array_equal(got, truth)


@pytest.mark.parametrize("ds_name", DATASET_ORDER)
@pytest.mark.parametrize("algo", ["KGraph", "NSW", "MRPG-basic", "MRPG"])
def test_dod_exact_all_graphs_all_datasets(ds_name, algo):
    """Alg. 1 returns the exact outlier set for every graph x dataset."""
    ds = make(ds_name, n=N)
    m = ds.metric()
    g = build_graph(ds.X, m, algo, K=K, seed=1)
    res = detect_outliers(ds.X, ds.metric(), g, ds.r_default, ds.k_default)
    truth = brute_force_outliers(ds.X, ds.metric_name, ds.r_default,
                                 ds.k_default)
    np.testing.assert_array_equal(res.outliers, truth)


@pytest.mark.parametrize("r_scale,k_scale", [
    (0.5, 1.0), (2.0, 1.0), (1.0, 0.3), (1.0, 3.0),
])
def test_dod_exact_across_parameters(r_scale, k_scale):
    """Exactness holds when r / k move around the default (Figs. 8-9)."""
    ds = make("Glove", n=N)
    r = ds.r_default * r_scale
    k = max(1, int(ds.k_default * k_scale))
    g = build_graph(ds.X, ds.metric(), "MRPG", K=K, seed=2)
    res = detect_outliers(ds.X, ds.metric(), g, r, k)
    truth = brute_force_outliers(ds.X, "angular", r, k)
    np.testing.assert_array_equal(res.outliers, truth)


def test_dod_k_larger_than_K_prime_falls_back():
    """If k > K', MRPG must not use the exact-links shortcut (§5.5)."""
    ds = make("SIFT", n=200)
    g = build_graph(ds.X, ds.metric(), "MRPG", K=4, seed=0)
    k = g.K_prime + 5
    res = detect_outliers(ds.X, ds.metric(), g, ds.r_default, k)
    truth = brute_force_outliers(ds.X, "l2", ds.r_default, k)
    np.testing.assert_array_equal(res.outliers, truth)
    assert res.n_decided_outliers == 0


def test_dod_extreme_parameters():
    ds = make("SIFT", n=120)
    g = build_graph(ds.X, ds.metric(), "MRPG", K=6, seed=0)
    # k >= n: every object is an outlier.
    res = detect_outliers(ds.X, ds.metric(), g, ds.r_default, ds.n + 1)
    assert len(res.outliers) == ds.n
    # r huge: no outliers for small k.
    res = detect_outliers(ds.X, ds.metric(), g, 1e12, 5)
    assert len(res.outliers) == 0


def test_mrpg_reduces_false_positives_vs_kgraph():
    """Table 7's shape: f(MRPG) <= f(KGraph) on a clustered dataset."""
    ds = make("Glove", n=500)
    f = {}
    for algo in ("KGraph", "MRPG"):
        g = build_graph(ds.X, ds.metric(), algo, K=K, seed=3)
        res = detect_outliers(ds.X, ds.metric(), g, ds.r_default,
                              ds.k_default)
        f[algo] = res.n_false_positives
    assert f["MRPG"] <= f["KGraph"]


def test_decided_outliers_counted(monkeypatch=None):
    ds = make("SIFT", n=N)
    g = build_graph(ds.X, ds.metric(), "MRPG", K=K, seed=1)
    res = detect_outliers(ds.X, ds.metric(), g, ds.r_default, ds.k_default)
    truth = brute_force_outliers(ds.X, "l2", ds.r_default, ds.k_default)
    # MRPG's exact pass targets probable outliers, so with K' >= k most
    # true outliers should be decided in the filtering phase (§5.5).
    if len(truth):
        assert res.n_decided_outliers > 0


def test_result_bookkeeping_consistent():
    ds = make("HEPMASS", n=N)
    g = build_graph(ds.X, ds.metric(), "MRPG-basic", K=K, seed=1)
    res = detect_outliers(ds.X, ds.metric(), g, ds.r_default, ds.k_default,
                          verify_method="vptree")
    assert res.n_candidates == res.n_false_positives + (
        len(res.outliers) - res.n_decided_outliers)
    assert res.filter_n_dist > 0 and res.filter_seconds >= 0
