"""Dataset-analog tests: determinism, shapes, calibrated outlier ratios
in the band of the paper's Table 2."""
import numpy as np
import pytest

from repro.baselines.brute_force import brute_force_outliers, neighbor_counts
from repro.datasets.generators import (DATASET_ORDER, MetricDataset,
                                       calibrate_r, make)
from repro.metrics.distances import get_metric

N_TEST = 600


@pytest.fixture(scope="module")
def datasets():
    return {name: make(name, n=N_TEST) for name in DATASET_ORDER}


@pytest.mark.parametrize("name", DATASET_ORDER)
def test_deterministic(name):
    a, b = make(name, n=200), make(name, n=200)
    if a.X.dtype == object:
        assert list(a.X) == list(b.X)
    else:
        np.testing.assert_array_equal(a.X, b.X)
    assert a.r_default == b.r_default and a.k_default == b.k_default


@pytest.mark.parametrize("name", DATASET_ORDER)
def test_shapes_and_types(name, datasets):
    ds = datasets[name]
    assert ds.n == N_TEST
    assert isinstance(ds, MetricDataset)
    if name == "Words":
        assert ds.X.dtype == object
        assert all(isinstance(w, str) for w in ds.X[:20])
    else:
        assert ds.X.shape == (N_TEST, ds.dim)
        assert np.isfinite(ds.X).all()


@pytest.mark.parametrize("name", DATASET_ORDER)
def test_metric_matches_paper(name, datasets):
    paper_metric = {
        "Deep": "l2", "Glove": "angular", "HEPMASS": "l1", "MNIST": "l4",
        "PAMAP2": "l2", "SIFT": "l2", "Words": "edit",
    }
    assert datasets[name].metric_name == paper_metric[name]


@pytest.mark.parametrize("name", DATASET_ORDER)
def test_outlier_ratio_in_band(name, datasets):
    """Calibration targets the paper's Table 2 ratio; allow generous
    sampling slack but insist on 'small' (< 8%) and non-degenerate."""
    ds = datasets[name]
    out = brute_force_outliers(ds.X, ds.metric_name, ds.r_default,
                               ds.k_default)
    ratio = 100.0 * len(out) / ds.n
    assert 0.0 < ratio < 8.0
    assert ratio < 5.0 * max(1.0, ds.paper["outlier_ratio"])


@pytest.mark.parametrize("name", DATASET_ORDER)
def test_most_objects_have_many_neighbors(name, datasets):
    """Paper §6: most objects have many (>= k) neighbors."""
    ds = datasets[name]
    counts = neighbor_counts(ds.X, ds.metric_name, ds.r_default)
    assert (counts >= ds.k_default).mean() > 0.9


def test_glove_is_unit_norm(datasets):
    norms = np.linalg.norm(datasets["Glove"].X, axis=1)
    np.testing.assert_allclose(norms, 1.0, rtol=1e-9)


def test_words_outliers_are_long(datasets):
    ds = datasets["Words"]
    out = brute_force_outliers(ds.X, "edit", ds.r_default, ds.k_default)
    if len(out):
        out_len = np.mean([len(ds.X[i]) for i in out])
        in_len = np.mean([len(w) for w in ds.X])
        assert out_len > in_len  # paper: Words outliers have large dim.


def test_calibrate_r_monotone_in_target():
    ds = make("SIFT", n=400)
    m = get_metric("l2")
    r_small = calibrate_r(ds.X, m, 10, target_ratio=0.10)
    r_big = calibrate_r(ds.X, m, 10, target_ratio=0.005)
    assert r_big >= r_small


def test_calibrate_r_edit_is_integer():
    ds = make("Words", n=300)
    assert float(ds.r_default).is_integer()


def test_make_respects_n_and_seed():
    a = make("Deep", n=150, seed=99)
    b = make("Deep", n=150, seed=100)
    assert a.n == 150
    assert not np.array_equal(a.X, b.X)


def test_dim_property(datasets):
    assert datasets["Deep"].dim == 32
    assert datasets["MNIST"].dim == 64
    assert isinstance(datasets["Words"].dim, str)


def test_paper_stats_present(datasets):
    for ds in datasets.values():
        for key in ("cardinality", "dim", "distance", "r", "k",
                    "outlier_ratio"):
            assert key in ds.paper
