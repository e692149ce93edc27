"""Bench target for paper Table 2 (default parameters / outlier ratio):
regenerates the table and times the r-calibration + brute-force ratio
measurement on one dataset."""
from benchmarks._bench_common import publish

from repro.baselines.brute_force import brute_force_outliers
from repro.datasets.generators import calibrate_r, make
from repro.harness import tables as T


def test_table2(benchmark, capfd):
    publish(T.render(T.table2(), "Table 2: Default parameters"), "table2.md", capfd)
    ds = make("SIFT", n=T.BENCH_N["SIFT"])

    def work():
        r = calibrate_r(ds.X, ds.metric(), ds.k_default,
                        target_ratio=0.0104, sample=128)
        return brute_force_outliers(ds.X, "l2", r, ds.k_default)

    out = benchmark.pedantic(work, rounds=1, iterations=1)
    assert 0 < len(out) < 0.1 * ds.n
