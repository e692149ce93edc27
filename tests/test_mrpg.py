"""MRPG construction tests: Connect-SubGraphs connectivity, Remove-
Detours monotonic paths, Remove-Links invariants, NSW properties."""
import numpy as np
import pytest

from repro.core.graph import ProximityGraph
from repro.core.mrpg import (build_mrpg, connect_subgraphs, remove_links,
                             undirect_in_place, _to_sets, _to_arrays)
from repro.core.nndescent import build_nndescent_plus
from repro.core.nsw import build_nsw, greedy_search
from repro.datasets.generators import make
from repro.metrics.distances import get_metric

K = 8


@pytest.fixture(scope="module")
def sift():
    return make("SIFT", n=400)


@pytest.fixture(scope="module")
def mrpg(sift):
    return build_mrpg(sift.X, get_metric("l2"), K=K, seed=0)


def test_mrpg_is_connected(mrpg):
    labels = mrpg.connected_components()
    assert len(set(labels.tolist())) == 1


def test_mrpg_is_undirected(mrpg):
    for i, nbrs in enumerate(mrpg.adj):
        for j in nbrs:
            assert i in mrpg.adj[int(j)]


def test_mrpg_build_steps_recorded(mrpg):
    for step in ("NNDescent(+)", "Connect-SubGraphs", "Remove-Detours",
                 "Remove-Links"):
        assert step in mrpg.build_seconds
        assert mrpg.build_seconds[step] >= 0.0


def test_mrpg_space_linear(mrpg, sift):
    # Theorem 5: O(nK) links.
    assert mrpg.n_links() < 8 * K * sift.n
    assert mrpg.index_bytes() > 0


def test_mrpg_has_pivots_and_exact(mrpg):
    assert mrpg.pivot_mask.any()
    assert mrpg.exact_mask.any()
    assert mrpg.K_prime == 4 * K


def test_exact_vertices_keep_their_knn_links(mrpg, sift):
    """Every later build step may only ADD links to exact-flagged
    vertices — the §5.5 decision requires adj ⊇ exact K'-NN."""
    m = get_metric("l2")
    for i in np.flatnonzero(mrpg.exact_mask)[:5]:
        i = int(i)
        d = m._one_to_many(sift.X[i], sift.X)
        d[i] = np.inf
        kk = min(mrpg.K_prime, sift.n - 1)
        knn = set(np.argpartition(d, kk - 1)[:kk].tolist())
        assert knn <= set(int(j) for j in mrpg.adj[i])


def test_connect_subgraphs_fixes_disjoint_graph(sift):
    """Start from an artificially split graph and check one component."""
    g, pivots = build_nndescent_plus(sift.X, get_metric("l2"), K=K)
    adj = _to_sets(g.adj)
    undirect_in_place(adj)
    # Cut the graph: remove every link crossing the median of dim 0.
    med = np.median(sift.X[:, 0])
    side = sift.X[:, 0] <= med
    for i, s in enumerate(adj):
        for j in list(s):
            if side[i] != side[j]:
                s.discard(j)
                adj[j].discard(i)
    connect_subgraphs(sift.X, get_metric("l2"), adj, pivots, seed=3)
    cut = ProximityGraph(adj=_to_arrays(adj), K=K)
    assert len(set(cut.connected_components().tolist())) == 1


def test_remove_links_only_removes_pivot_covered(sift, mrpg):
    """Removed links must be between two non-pivots sharing a pivot, and
    the pivot link itself must survive."""
    g, pivots = build_nndescent_plus(sift.X, get_metric("l2"), K=K)
    adj = _to_sets(g.adj)
    undirect_in_place(adj)
    before = [set(s) for s in adj]
    removed = remove_links(adj, g.pivot_mask, g.exact_mask)
    assert removed >= 0
    for p, (b, a) in enumerate(zip(before, adj)):
        gone = b - a
        for u in gone:
            assert not g.pivot_mask[p] and not g.pivot_mask[u]
            # some shared pivot existed in the pre-removal graph
            assert any(g.pivot_mask[q] for q in (b & before[u]))


def test_undirect_in_place():
    adj = [{1}, {2}, set()]
    undirect_in_place(adj)
    assert adj == [{1}, {0, 2}, {1}]


def test_mrpg_basic_differs_only_in_K_prime(sift):
    basic = build_mrpg(sift.X, get_metric("l2"), K=K, basic=True, seed=0)
    assert basic.K_prime == K
    assert basic.kind == "mrpg-basic"


def test_mrpg_on_strings():
    ds = make("Words", n=250)
    g = build_mrpg(ds.X, get_metric("edit"), K=6, seed=1)
    assert len(set(g.connected_components().tolist())) == 1


# ---- NSW -----------------------------------------------------------------

def test_nsw_memory_matches_kgraph(sift):
    nsw = build_nsw(sift.X, get_metric("l2"), K=K)
    # paper: NSW link count ~ KGraph memory (nK directed links), +-50%.
    assert 0.5 * K * sift.n <= nsw.n_links() <= 1.5 * K * sift.n


def test_nsw_connected(sift):
    nsw = build_nsw(sift.X, get_metric("l2"), K=K)
    assert len(set(nsw.connected_components().tolist())) == 1


def test_nsw_is_undirected(sift):
    nsw = build_nsw(sift.X, get_metric("l2"), K=K)
    for i, nbrs in enumerate(nsw.adj):
        for j in nbrs:
            assert i in nsw.adj[int(j)]


def test_greedy_search_descends(sift):
    nsw = build_nsw(sift.X, get_metric("l2"), K=K)
    m = get_metric("l2")
    adj = [list(a) for a in nsw.adj]
    rng = np.random.default_rng(0)
    for q in rng.choice(sift.n, 5, replace=False):
        q = int(q)
        start = int(rng.integers(sift.n))
        ev: dict[int, float] = {}
        res = greedy_search(sift.X, m, adj, sift.X[q], start, evaluated=ev)
        assert ev[res] <= ev[start]  # never worse than the entry point
