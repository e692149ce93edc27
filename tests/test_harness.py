"""Table-harness tests at tiny scale: every tableN function produces
the expected paper-vs-measured columns and internally asserts that each
algorithm's outlier set is exact."""
import numpy as np
import pandas as pd
import pytest

from repro.harness import paper_numbers as P
from repro.harness import tables as T


@pytest.fixture(scope="module", autouse=True)
def tiny_scale():
    """Shrink the bench scale so the harness runs in seconds, and keep
    the evaluation cache isolated from other modules."""
    old_n, old_cache = dict(T.BENCH_N), dict(T._CACHE)
    for k in T.BENCH_N:
        T.BENCH_N[k] = 220
    T._CACHE.clear()
    yield
    T.BENCH_N.update(old_n)
    T._CACHE.clear()
    T._CACHE.update(old_cache)


def test_table1_columns():
    df = T.table1(["SIFT", "Words"])
    assert list(df["dataset"]) == ["SIFT", "Words"]
    assert {"paper_cardinality", "ours_cardinality", "distance"} <= set(df.columns)


def test_table2_ratio_measured():
    df = T.table2(["Glove"])
    assert 0.0 <= df["ours_ratio_%"].iloc[0] < 10.0


def test_table3_shape(spark):
    df = T.table3(spark, ["SIFT"])
    for a in P.ALGOS_GRAPH:
        assert f"paper_{a}" in df.columns and f"ours_{a}" in df.columns
        assert df[f"ours_{a}"].iloc[0] > 0


def test_table4_steps(spark):
    df = T.table4(spark)
    assert list(df["step"]) == ["NNDescent(+)", "Connect-SubGraphs",
                                "Remove-Detours", "Remove-Links"]
    assert df["ours_KGraph"].iloc[1] == "-"  # KGraph has no later steps


def test_table5_all_algorithms(spark):
    df = T.table5(spark, ["SIFT"])
    for a in P.ALGOS_ALL:
        assert df[f"ours_{a}"].iloc[0] >= 0
        assert df[f"ours_{a}_Mdist"].iloc[0] >= 0


def test_table6_sizes(spark):
    df = T.table6(spark, ["SIFT"])
    assert df["ours_Nested-loop_KB"].iloc[0] == 0.0
    assert df["ours_MRPG_KB"].iloc[0] > 0


def test_table7_false_positives(spark):
    df = T.table7(spark, ["SIFT"])
    assert df["n"].iloc[0] == 220
    for a in P.ALGOS_GRAPH:
        assert df[f"ours_{a}"].iloc[0] >= 0


def test_table8_phases(spark):
    df = T.table8(spark)
    assert list(df["phase"]) == ["Filtering", "Verification"]


def test_evaluate_dataset_caches(spark):
    e1 = T.evaluate_dataset(spark, "SIFT", algos=["MRPG"])
    e2 = T.evaluate_dataset(spark, "SIFT", algos=["MRPG"])
    assert e1 is e2


def test_evaluate_dataset_rejects_inexact(spark, monkeypatch):
    """The harness must refuse to report numbers for a wrong answer."""
    import repro.harness.tables as tables
    import repro.core.spark_dod as sd

    real_detect = sd.detect

    def bad_detect(spark_, ds, algo, **kw):
        res = real_detect(spark_, ds, algo, **kw)
        res.outliers = res.outliers[:-1] if len(res.outliers) else np.array([0])
        return res

    monkeypatch.setattr(tables, "detect", bad_detect)
    with pytest.raises(AssertionError, match="not exact"):
        T.evaluate_dataset(spark, "Glove", algos=["Nested-loop"])


def test_render_roundtrip():
    df = pd.DataFrame({"a": [1, 22], "bb": ["x", "y"]})
    md = T.render(df, "Title")
    assert "## Title" in md and "22" in md and "bb" in md


def test_paper_numbers_complete():
    for name in P.DATASETS:
        assert set(P.TABLE3[name]) == set(P.ALGOS_GRAPH)
        assert set(P.TABLE5[name]) == set(P.ALGOS_ALL)
        assert set(P.TABLE6[name]) == set(P.ALGOS_ALL)
        assert set(P.TABLE7[name]) == set(P.ALGOS_GRAPH)
    assert set(P.TABLE8) == set(P.ALGOS_GRAPH)
