"""VP-tree substrate tests: range counts/searches vs brute force, early
termination, pivots/buckets for NNDescent+ init."""
import numpy as np
import pytest

from repro.metrics.distances import get_metric
from repro.vptree.vptree import VPTree, vp_partition

METRICS = ["l1", "l2", "l4", "angular"]


def _data(n=200, d=6, seed=0):
    rng = np.random.default_rng(seed)
    centers = rng.uniform(0, 50, size=(4, d))
    X = np.vstack([c + rng.normal(0, 2.0, size=(n // 4, d)) for c in centers])
    return X


@pytest.mark.parametrize("metric_name", METRICS)
@pytest.mark.parametrize("r", [1.0, 5.0, 20.0])
def test_range_count_matches_brute_force(metric_name, r):
    X = _data()
    m = get_metric(metric_name)
    t = VPTree(X, m, capacity=16, seed=1)
    rng = np.random.default_rng(2)
    for i in rng.choice(len(X), 15, replace=False):
        i = int(i)
        d = m._one_to_many(X[i], X)
        expect = int((d <= r).sum()) - 1
        assert t.range_count(X[i], r, exclude=i) == expect


@pytest.mark.parametrize("metric_name", ["l2", "l1"])
def test_range_count_cap_early_stop(metric_name):
    X = _data()
    m = get_metric(metric_name)
    t = VPTree(X, m, capacity=16, seed=1)
    for i in [0, 10, 99]:
        full = t.range_count(X[i], 10.0, exclude=i)
        capped = t.range_count(X[i], 10.0, cap=5, exclude=i)
        assert capped == min(full, 5) or capped >= 5  # may overshoot inside a bucket
        if full >= 5:
            assert capped >= 5


def test_range_count_external_query():
    X = _data()
    m = get_metric("l2")
    t = VPTree(X, m, capacity=8, seed=0)
    q = X.mean(axis=0) + 100.0  # far away
    assert t.range_count(q, 1.0) == 0
    d = m._one_to_many(q, X)
    assert t.range_count(q, 150.0) == int((d <= 150.0).sum())


@pytest.mark.parametrize("r", [2.0, 8.0])
def test_range_search_matches_brute_force(r):
    X = _data(n=120)
    m = get_metric("l2")
    t = VPTree(X, m, capacity=10, seed=3)
    for i in [0, 5, 60, 119]:
        d = m._one_to_many(X[i], X)
        expect = set(np.flatnonzero(d <= r)) - {i}
        got = set(t.range_search(X[i], r, exclude=i))
        assert got == expect


def test_range_count_on_strings():
    words = np.array(
        ["cat", "bat", "hat", "cart", "dog", "dig", "zzzzzzzzzz"], dtype=object
    )
    m = get_metric("edit")
    t = VPTree(words, m, capacity=3, seed=0)
    d = m._one_to_many(words[0], words)
    for r in [1.0, 2.0, 4.0]:
        assert t.range_count(words[0], r, exclude=0) == int((d <= r).sum()) - 1


def test_tree_covers_all_points():
    X = _data(n=157)
    t = VPTree(X, get_metric("l2"), capacity=12, seed=5)
    seen = set()
    stack = [t.root]
    while stack:
        node = stack.pop()
        if node is None:
            continue
        assert node.vantage not in seen
        seen.add(node.vantage)
        if node.bucket is not None:
            for i in node.bucket:
                assert int(i) not in seen
                seen.add(int(i))
        stack.extend([node.left, node.right])
    assert seen == set(range(len(X)))


def test_pivots_are_recorded():
    X = _data(n=300)
    t = VPTree(X, get_metric("l2"), capacity=16, seed=7)
    assert len(t.pivots) > 0
    assert len(set(t.pivots)) == len(t.pivots)
    assert all(0 <= p < len(X) for p in t.pivots)
    # o(n) pivots (paper §5.1)
    assert len(t.pivots) < len(X) / 2


def test_leaf_buckets_are_small_and_disjoint_per_tree():
    X = _data(n=300)
    t = VPTree(X, get_metric("l2"), capacity=16, seed=9)
    all_ids = [int(i) for b in t.leaf_buckets for i in b]
    assert len(all_ids) == len(set(all_ids))  # one tree: disjoint buckets
    assert all(len(b) <= 16 for b in t.leaf_buckets)


def test_vp_partition_returns_buckets_and_pivots():
    X = _data(n=400)
    buckets, pivots = vp_partition(X, get_metric("l2"), capacity=20,
                                   seed=0, repeats=3)
    covered = set(int(i) for b in buckets for i in b)
    # Only *left* leaves seed AKNNs (paper Alg. 3), so full coverage is
    # not expected — the paper falls back to random AKNNs for the rest.
    assert len(covered) > 0.75 * len(X)
    assert len(pivots) > 0


def test_index_bytes_positive_and_reasonable():
    X = _data(n=200)
    t = VPTree(X, get_metric("l2"), capacity=16, seed=0)
    b = t.index_bytes()
    assert 0 < b < 200 * 100


def test_single_point_tree():
    X = np.zeros((1, 3))
    t = VPTree(X, get_metric("l2"), capacity=4, seed=0)
    assert t.range_count(X[0], 1.0, exclude=0) == 0
    assert t.range_count(np.ones(3) * 0.5, 1.0) == 1
