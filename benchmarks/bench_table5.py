"""Bench target for paper Table 5 (running time, all 8 algorithms):
regenerates the full table and times MRPG detection on Glove."""
import numpy as np

from benchmarks._bench_common import publish

from repro.core.dod import detect_outliers
from repro.core.spark_dod import build_graph
from repro.datasets.generators import make
from repro.harness import tables as T


def test_table5(benchmark, spark, capfd):
    publish(T.render(T.table5(spark), "Table 5: Running time [sec]"),
            "table5.md", capfd)
    ds = make("Glove", n=T.BENCH_N["Glove"])
    g = build_graph(ds.X, ds.metric(), "MRPG", K=T.DEFAULT_K, seed=1)

    res = benchmark.pedantic(
        lambda: detect_outliers(ds.X, ds.metric(), g, ds.r_default,
                                ds.k_default),
        rounds=2, iterations=1)
    assert isinstance(res.outliers, np.ndarray)
