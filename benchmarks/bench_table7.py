"""Bench target for paper Table 7 (false positives after filtering):
regenerates the table and times the Greedy-Counting filter phase."""
from benchmarks._bench_common import publish

from repro.core.dod import filter_phase
from repro.core.spark_dod import build_graph
from repro.datasets.generators import make
from repro.harness import tables as T


def test_table7(benchmark, spark, capfd):
    publish(T.render(T.table7(spark),
                     "Table 7: False positives after filtering"),
            "table7.md", capfd)
    ds = make("Glove", n=T.BENCH_N["Glove"])
    g = build_graph(ds.X, ds.metric(), "KGraph", K=T.DEFAULT_K, seed=1)
    cand, decided, _ = benchmark.pedantic(
        lambda: filter_phase(ds.X, ds.metric(), g, ds.r_default,
                             ds.k_default),
        rounds=2, iterations=1)
    assert len(cand) + len(decided) < ds.n
