"""PySpark pipeline tests: the mapInPandas filter/verify pipeline equals
brute force in single- and multi-partition mode, and both the Catalyst
SQL DOD and the pipeline are certified against DuckDB via the oracle."""
import numpy as np
import pytest

from repro.baselines.brute_force import brute_force_outliers
from repro.baselines.sql_dod import dod_sql, long_format, spark_sql_outliers
from repro.core.spark_dod import (ALGORITHMS, GRAPH_ALGORITHMS,
                                  dataset_to_df, detect, outliers_df)
from repro.datasets.generators import DATASET_ORDER, make
from repro.oracle import assert_equivalent

N = 260
K = 8


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
def test_single_partition_mrpg_exact(spark, ds_name, cases):
    ds, truth = cases[ds_name]
    res = detect(spark, ds, "MRPG", partitions=1, K=K)
    np.testing.assert_array_equal(res.outliers, truth)
    assert res.stats["partitions"] == 1
    assert res.stats["build_n_dist"] > 0


@pytest.mark.parametrize("algo", ALGORITHMS)
def test_single_partition_all_algorithms(spark, algo, cases):
    ds, truth = cases["SIFT"]
    res = detect(spark, ds, algo, partitions=1, K=K)
    np.testing.assert_array_equal(res.outliers, truth)


@pytest.mark.parametrize("partitions", [2, 4])
@pytest.mark.parametrize("algo", ["MRPG", "KGraph", "Nested-loop"])
def test_multi_partition_exact(spark, partitions, algo, cases):
    """Local filtering + capped-count global verification is exact."""
    ds, truth = cases["SIFT"]
    res = detect(spark, ds, algo, partitions=partitions, K=K)
    np.testing.assert_array_equal(res.outliers, truth)
    assert res.stats["partitions"] == partitions


@pytest.mark.parametrize("ds_name", ["Glove", "Words", "HEPMASS"])
def test_multi_partition_exact_other_metrics(spark, ds_name, cases):
    ds, truth = cases[ds_name]
    res = detect(spark, ds, "MRPG", partitions=3, K=K)
    np.testing.assert_array_equal(res.outliers, truth)


def test_multi_partition_no_candidates_path(spark, cases):
    ds, _ = cases["SIFT"]
    res = detect(spark, ds, "MRPG", partitions=2, K=K, r=1e12, k=3)
    assert len(res.outliers) == 0


def test_dataset_to_df_roundtrip(spark, cases):
    ds, _ = cases["MNIST"]
    df = dataset_to_df(spark, ds, partitions=2)
    assert df.count() == ds.n
    row = df.where("id = 5").collect()[0]
    np.testing.assert_allclose(np.array(row["vec"]), ds.X[5])
    ds_w, _ = cases["Words"]
    dfw = dataset_to_df(spark, ds_w)
    roww = dfw.where("id = 3").collect()[0]
    assert roww["word"] == ds_w.X[3]


# ---- DuckDB oracle certification ----------------------------------------

@pytest.mark.parametrize("ds_name", DATASET_ORDER)
def test_sql_dod_matches_duckdb_oracle(spark, ds_name, cases):
    """The same SQL runs on Catalyst and DuckDB; results must agree."""
    ds, _ = cases[ds_name]
    got = spark_sql_outliers(spark, ds)
    sql = dod_sql(ds.metric_name, ds.r_default, ds.k_default)
    assert_equivalent(got, sql, pts=long_format(ds))


@pytest.mark.parametrize("ds_name", DATASET_ORDER)
def test_pipeline_matches_duckdb_oracle(spark, ds_name, cases):
    """The mapInPandas pipeline output diffs clean against DuckDB."""
    ds, _ = cases[ds_name]
    res = detect(spark, ds, "MRPG", partitions=2, K=K)
    sql = dod_sql(ds.metric_name, ds.r_default, ds.k_default)
    assert_equivalent(outliers_df(spark, res), sql, pts=long_format(ds))


def test_sql_dod_matches_brute_force(spark, cases):
    ds, truth = cases["SIFT"]
    got = np.sort(np.array(
        [r["id"] for r in spark_sql_outliers(spark, ds).collect()]))
    np.testing.assert_array_equal(got, truth)


def test_stats_merged_across_partitions(spark, cases):
    ds, _ = cases["SIFT"]
    res = detect(spark, ds, "MRPG", partitions=3, K=K)
    st = res.stats
    assert st["n"] == ds.n                    # counters summed
    assert st["partitions"] == 3
    assert "build_steps" in st
    assert st["filter_seconds"] > 0


def test_graph_algorithms_list_consistent():
    assert set(GRAPH_ALGORITHMS) <= set(ALGORITHMS)
    assert len(ALGORITHMS) == 8  # the paper's Table 5 columns
