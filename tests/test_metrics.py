"""Metric-axiom and consistency tests for repro.metrics.distances."""
import numpy as np
import pytest

from repro.metrics.distances import (L1, L2, L4, Angular, Edit, _levenshtein,
                                     get_metric)

VEC_METRICS = ["l1", "l2", "l4", "angular"]
ALL_METRICS = VEC_METRICS + ["edit"]


def _sample(metric_name, n, seed=0):
    rng = np.random.default_rng(seed)
    if metric_name == "edit":
        alpha = list("abcdef")
        return np.array(
            ["".join(rng.choice(alpha, rng.integers(1, 9))) for _ in range(n)],
            dtype=object,
        )
    return rng.normal(size=(n, 8)) * 3.0


@pytest.mark.parametrize("name", ALL_METRICS)
def test_identity(name):
    m = get_metric(name)
    X = _sample(name, 10)
    # arccos loses ~sqrt(eps) precision near cos=1, hence the looser tol.
    tol = 1e-6 if name == "angular" else 1e-12
    for x in X:
        assert m.pair(x, x) == pytest.approx(0.0, abs=tol)


@pytest.mark.parametrize("name", ALL_METRICS)
def test_symmetry(name):
    m = get_metric(name)
    X = _sample(name, 12)
    for a in X[:6]:
        for b in X[6:]:
            assert m.pair(a, b) == pytest.approx(m.pair(b, a), rel=1e-9)


@pytest.mark.parametrize("name", ALL_METRICS)
@pytest.mark.parametrize("seed", [0, 1, 2])
def test_triangle_inequality(name, seed):
    m = get_metric(name)
    X = _sample(name, 30, seed)
    rng = np.random.default_rng(seed)
    for _ in range(200):
        a, b, c = X[rng.choice(len(X), 3)]
        assert m.pair(a, c) <= m.pair(a, b) + m.pair(b, c) + 1e-9


@pytest.mark.parametrize("name", ALL_METRICS)
def test_one_to_many_matches_pair(name):
    m = get_metric(name)
    X = _sample(name, 20)
    q = X[0]
    batch = m.one_to_many(q, X)
    singles = np.array([m.pair(q, x) for x in X])
    np.testing.assert_allclose(batch, singles, rtol=1e-9, atol=1e-12)


@pytest.mark.parametrize("name", ALL_METRICS)
def test_nonnegativity(name):
    m = get_metric(name)
    X = _sample(name, 15, seed=3)
    assert (m.one_to_many(X[0], X) >= 0).all()


def test_distance_counter_counts():
    m = L2()
    X = np.ones((7, 3))
    m.pair(X[0], X[1])
    m.one_to_many(X[0], X)
    assert m.n_dist == 8
    m.reset_counter()
    assert m.n_dist == 0


def test_l2_known_value():
    assert L2().pair(np.array([0.0, 0.0]), np.array([3.0, 4.0])) == pytest.approx(5.0)


def test_l1_known_value():
    assert L1().pair(np.array([1.0, 2.0]), np.array([4.0, -2.0])) == pytest.approx(7.0)


def test_l4_known_value():
    # (1^4 + 1^4)^(1/4) = 2^(1/4)
    d = L4().pair(np.array([0.0, 0.0]), np.array([1.0, 1.0]))
    assert d == pytest.approx(2 ** 0.25)


def test_l4_le_l2_le_l1():
    rng = np.random.default_rng(0)
    a, b = rng.normal(size=(2, 16))
    assert L4().pair(a, b) <= L2().pair(a, b) + 1e-12 <= L1().pair(a, b) + 1e-12


def test_angular_known_values():
    m = Angular()
    e1, e2 = np.array([1.0, 0.0]), np.array([0.0, 1.0])
    assert m.pair(e1, e2) == pytest.approx(0.5)       # 90 degrees -> 0.5
    assert m.pair(e1, -e1) == pytest.approx(1.0)      # opposite -> 1
    assert m.pair(e1, 5 * e1) == pytest.approx(0.0)   # scale-invariant


def test_angular_zero_vector_convention():
    m = Angular()
    z = np.zeros(3)
    v = np.array([1.0, 2.0, 3.0])
    assert m.pair(z, z) == pytest.approx(0.0)
    assert m.pair(z, v) == pytest.approx(0.5)
    got = m.one_to_many(z, np.vstack([z, v]))
    np.testing.assert_allclose(got, [0.0, 0.5])


@pytest.mark.parametrize("a,b,d", [
    ("kitten", "sitting", 3), ("", "abc", 3), ("abc", "abc", 0),
    ("flaw", "lawn", 2), ("a", "b", 1), ("ab", "ba", 2),
])
def test_levenshtein_known(a, b, d):
    assert _levenshtein(a, b) == d
    assert Edit().pair(a, b) == d


def test_levenshtein_matches_duckdb():
    import duckdb
    rng = np.random.default_rng(5)
    words = ["".join(rng.choice(list("abcde"), rng.integers(0, 10)))
             for _ in range(30)]
    con = duckdb.connect()
    for a in words[:10]:
        for b in words[10:20]:
            exp = con.execute("select levenshtein(?, ?)", [a, b]).fetchone()[0]
            assert _levenshtein(a, b) == exp
    con.close()


def test_get_metric_unknown():
    with pytest.raises(ValueError):
        get_metric("cosine")


@pytest.mark.parametrize("name", ALL_METRICS)
def test_metric_names_roundtrip(name):
    assert get_metric(name).name == name
