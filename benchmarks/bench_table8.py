"""Bench target for paper Table 8 (filtering vs verification on Glove):
regenerates the table and times the verification phase."""
from benchmarks._bench_common import publish

from repro.core.dod import filter_phase, verify_candidates
from repro.core.spark_dod import build_graph
from repro.datasets.generators import make
from repro.harness import tables as T


def test_table8(benchmark, spark, capfd):
    publish(T.render(T.table8(spark),
                     "Table 8: Decomposed detection on Glove [sec]"),
            "table8.md", capfd)
    ds = make("Glove", n=T.BENCH_N["Glove"])
    g = build_graph(ds.X, ds.metric(), "KGraph", K=T.DEFAULT_K, seed=1)
    cand, _, _ = filter_phase(ds.X, ds.metric(), g, ds.r_default,
                              ds.k_default)
    out = benchmark.pedantic(
        lambda: verify_candidates(ds.X, ds.metric(), cand, ds.r_default,
                                  ds.k_default),
        rounds=2, iterations=1)
    assert len(out) <= len(cand)
