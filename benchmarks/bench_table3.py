"""Bench target for paper Table 3 (pre-processing time): regenerates
the table over all datasets and times one MRPG build."""
from benchmarks._bench_common import publish

from repro.core.mrpg import build_mrpg
from repro.datasets.generators import make
from repro.harness import tables as T


def test_table3(benchmark, spark, capfd):
    publish(T.render(T.table3(spark), "Table 3: Pre-processing time [sec]"),
            "table3.md", capfd)
    ds = make("Glove", n=T.BENCH_N["Glove"])
    g = benchmark.pedantic(
        lambda: build_mrpg(ds.X, ds.metric(), K=T.DEFAULT_K, seed=1),
        rounds=1, iterations=1)
    assert g.n == ds.n
