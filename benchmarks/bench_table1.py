"""Bench target for paper Table 1 (dataset statistics): regenerates the
table and times one bench-scale dataset generation."""
from benchmarks._bench_common import publish

from repro.datasets.generators import make
from repro.harness import tables as T


def test_table1(benchmark, capfd):
    publish(T.render(T.table1(), "Table 1: Datasets (paper vs analogs)"),
            "table1.md", capfd)
    ds = benchmark.pedantic(
        lambda: make("SIFT", n=T.BENCH_N["SIFT"]), rounds=2, iterations=1)
    assert ds.n == T.BENCH_N["SIFT"]
