"""Bench target for paper Table 6 (index size): regenerates the table
and times the VP-tree index build whose size it reports."""
from benchmarks._bench_common import publish

from repro.datasets.generators import make
from repro.harness import tables as T
from repro.vptree.vptree import VPTree


def test_table6(benchmark, spark, capfd):
    publish(T.render(T.table6(spark), "Table 6: Index size"), "table6.md", capfd)
    ds = make("SIFT", n=T.BENCH_N["SIFT"])
    tree = benchmark.pedantic(
        lambda: VPTree(ds.X, ds.metric(), capacity=32, seed=0),
        rounds=2, iterations=1)
    assert tree.index_bytes() > 0
