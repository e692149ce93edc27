"""Bench target for paper Table 4 (decomposed build on Glove): times
the MRPG-basic build whose steps the table decomposes."""
from benchmarks._bench_common import publish

from repro.core.mrpg import build_mrpg
from repro.datasets.generators import make
from repro.harness import tables as T


def test_table4(benchmark, spark, capfd):
    publish(T.render(T.table4(spark),
                     "Table 4: Decomposed pre-processing on Glove [sec]"),
            "table4.md", capfd)
    ds = make("Glove", n=T.BENCH_N["Glove"])
    g = benchmark.pedantic(
        lambda: build_mrpg(ds.X, ds.metric(), K=T.DEFAULT_K, basic=True,
                           seed=1),
        rounds=1, iterations=1)
    assert set(g.build_seconds) == {"NNDescent(+)", "Connect-SubGraphs",
                                    "Remove-Detours", "Remove-Links"}
