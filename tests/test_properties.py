"""Property-based tests (hypothesis): metric axioms, Greedy-Counting
soundness on random graphs, capped-merge exactness — the invariants the
whole pipeline's exactness proof rests on."""
import numpy as np
import pytest
from hypothesis import given, settings, strategies as st

from repro.core.dod import greedy_counting
from repro.core.graph import ProximityGraph
from repro.metrics.distances import _levenshtein, get_metric

VEC = st.lists(st.floats(-50, 50, allow_nan=False), min_size=3, max_size=3)
WORD = st.text(alphabet="abcd", max_size=8)


@settings(max_examples=60, deadline=None)
@given(VEC, VEC, VEC, st.sampled_from(["l1", "l2", "l4", "angular"]))
def test_vector_metric_axioms(a, b, c, name):
    m = get_metric(name)
    a, b, c = map(np.asarray, (a, b, c))
    dab, dba = m.pair(a, b), m.pair(b, a)
    assert dab >= 0 and dab == pytest.approx(dba, abs=1e-9)
    assert m.pair(a, c) <= m.pair(a, b) + m.pair(b, c) + 1e-7


@settings(max_examples=60, deadline=None)
@given(WORD, WORD, WORD)
def test_edit_metric_axioms(a, b, c):
    assert _levenshtein(a, b) == _levenshtein(b, a)
    assert _levenshtein(a, a) == 0
    assert _levenshtein(a, c) <= _levenshtein(a, b) + _levenshtein(b, c)
    assert _levenshtein(a, b) >= abs(len(a) - len(b))
    assert _levenshtein(a, b) <= max(len(a), len(b))


@settings(max_examples=30, deadline=None)
@given(st.integers(0, 2**31 - 1), st.floats(0.1, 5.0), st.integers(1, 12))
def test_greedy_counting_sound_on_random_graphs(seed, r, k):
    """On ANY graph, Greedy-Counting (a) never exceeds the true neighbor
    count, and (b) never exceeds k — the two facts behind Lemma 1."""
    rng = np.random.default_rng(seed)
    n = 25
    X = rng.normal(size=(n, 2))
    adj = [rng.choice(n, size=rng.integers(0, 5), replace=False).astype(np.int64)
           for _ in range(n)]
    g = ProximityGraph(adj=adj, K=4)
    m = get_metric("l2")
    visited = np.zeros(n, dtype=np.int64)
    for i in range(0, n, 5):
        c = greedy_counting(i, X, m, g, r, k, visited=visited, stamp=i + 1)
        d = m._one_to_many(X[i], X)
        true = int((d <= r).sum()) - 1
        assert c <= min(true, k)


@settings(max_examples=40, deadline=None)
@given(st.lists(st.lists(st.integers(0, 30), min_size=1, max_size=6),
                min_size=1, max_size=6), st.integers(1, 20))
def test_capped_partition_merge_exact(parts, k):
    """sum(min(c_i, k)) >= k  <=>  sum(c_i) >= k — the identity that
    makes the Spark verification stage exact (spark_dod docstring)."""
    counts = [sum(p) for p in parts]
    capped = sum(min(c, k) for c in counts)
    assert (capped >= k) == (sum(counts) >= k)


@settings(max_examples=25, deadline=None)
@given(st.integers(0, 2**31 - 1))
def test_vptree_range_count_random(seed):
    from repro.vptree.vptree import VPTree
    rng = np.random.default_rng(seed)
    X = rng.normal(size=(60, 3))
    m = get_metric("l2")
    t = VPTree(X, m, capacity=7, seed=seed % 97)
    q = rng.normal(size=3) * 2
    r = float(rng.uniform(0.1, 3.0))
    exact = int((m._one_to_many(q, X) <= r).sum())
    assert t.range_count(q, r) == exact
