"""Baseline-algorithm exactness tests: Nested-loop, SNIF, DOLPHIN and
VP-tree DOD all equal brute force on every dataset analog."""
import numpy as np
import pytest

from repro.baselines.brute_force import brute_force_outliers, neighbor_counts
from repro.baselines.dolphin import dolphin_outliers
from repro.baselines.nested_loop import nested_loop_outliers
from repro.baselines.snif import SnifIndex, snif_outliers
from repro.baselines.vptree_dod import vptree_outliers
from repro.datasets.generators import DATASET_ORDER, make

N = 300

BASELINES = {
    "Nested-loop": nested_loop_outliers,
    "SNIF": snif_outliers,
    "DOLPHIN": dolphin_outliers,
    "VP-tree": vptree_outliers,
}


@pytest.fixture(scope="module")
def cases():
    out = {}
    for name in DATASET_ORDER:
        ds = make(name, n=N)
        truth = brute_force_outliers(ds.X, ds.metric_name, ds.r_default,
                                     ds.k_default)
        out[name] = (ds, truth)
    return out


@pytest.mark.parametrize("ds_name", DATASET_ORDER)
@pytest.mark.parametrize("algo", list(BASELINES))
def test_baseline_exact(ds_name, algo, cases):
    ds, truth = cases[ds_name]
    got = BASELINES[algo](ds.X, ds.metric(), ds.r_default, ds.k_default)
    np.testing.assert_array_equal(got, truth)


@pytest.mark.parametrize("algo", list(BASELINES))
@pytest.mark.parametrize("r_scale,k", [(0.6, 3), (1.5, 40)])
def test_baseline_exact_other_params(algo, r_scale, k, cases):
    ds, _ = cases["SIFT"]
    r = ds.r_default * r_scale
    truth = brute_force_outliers(ds.X, "l2", r, k)
    got = BASELINES[algo](ds.X, ds.metric(), r, k)
    np.testing.assert_array_equal(got, truth)


@pytest.mark.parametrize("algo", list(BASELINES))
def test_baseline_seed_invariance(algo, cases):
    """Random scan orders / center choices must not change the answer."""
    ds, truth = cases["Glove"]
    for seed in (1, 7):
        got = BASELINES[algo](ds.X, ds.metric(), ds.r_default,
                              ds.k_default, seed=seed)
        np.testing.assert_array_equal(got, truth)


def test_nested_loop_early_termination_saves_distances(cases):
    ds, _ = cases["SIFT"]
    m = ds.metric()
    nested_loop_outliers(ds.X, m, ds.r_default, ds.k_default)
    assert m.n_dist < 0.9 * ds.n * ds.n  # early termination bites


def test_snif_cluster_invariants(cases):
    ds, _ = cases["SIFT"]
    idx = SnifIndex(ds.X, ds.metric(), ds.r_default, seed=0)
    m = ds.metric()
    # Every member is within r/2 of its center -> pairwise within r.
    for ci, mem in enumerate(idx.members):
        c = idx.centers[ci]
        for i in mem[:10]:
            assert m._pair(ds.X[i], ds.X[c]) <= ds.r_default / 2 + 1e-9
    assert sum(len(mm) for mm in idx.members) == ds.n
    assert idx.index_bytes() > 0


def test_snif_stats(cases):
    ds, _ = cases["SIFT"]
    stats = {}
    snif_outliers(ds.X, ds.metric(), ds.r_default, ds.k_default, stats=stats)
    assert stats["index_bytes"] > 0


def test_dolphin_stats(cases):
    ds, _ = cases["SIFT"]
    stats = {}
    dolphin_outliers(ds.X, ds.metric(), ds.r_default, ds.k_default,
                     stats=stats)
    assert 0 < stats["index_bytes"] <= ds.n * 12


def test_dolphin_index_stays_small_when_r_large(cases):
    """With huge r everyone is an inlier fast; pruning should keep the
    peak index well under n."""
    ds, _ = cases["SIFT"]
    stats = {}
    out = dolphin_outliers(ds.X, ds.metric(), 1e9, 5, stats=stats)
    assert len(out) == 0
    assert stats["index_bytes"] < ds.n * 12


def test_brute_force_counts_match_naive():
    ds = make("SIFT", n=80)
    m = ds.metric()
    counts = neighbor_counts(ds.X, "l2", ds.r_default)
    for i in range(0, 80, 13):
        d = np.array([m._pair(ds.X[i], x) for x in ds.X])
        assert counts[i] == int((d <= ds.r_default).sum()) - 1


def test_all_baselines_handle_duplicates():
    X = np.zeros((30, 4))
    truth = brute_force_outliers(X, "l2", 0.5, 10)
    assert len(truth) == 0  # 29 neighbors each at distance 0
    for algo, fn in BASELINES.items():
        ds = make("SIFT", n=10)
        got = fn(X, ds.metric(), 0.5, 10)
        assert len(got) == 0, algo
    # k = 30 > 29 neighbors -> all outliers.
    for algo, fn in BASELINES.items():
        ds = make("SIFT", n=10)
        got = fn(X, ds.metric(), 0.5, 30)
        assert len(got) == 30, algo
