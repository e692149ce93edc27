"""Shared helpers for the spark-submit job entrypoints.

Each ``jobs/tableN_*.py`` reproduces one evaluation table of the paper:
it builds (or reuses) the per-dataset evaluation via the harness,
prints the paper-vs-measured table, and optionally writes it to a file.
Run as ``spark-submit jobs/table5_running_time.py [--n 2500] [--out f]``
or plain ``python`` (the session is created locally either way).
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def make_parser(desc: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=desc)
    p.add_argument("--n", type=int, default=None,
                   help="override dataset cardinality (default: bench scale)")
    p.add_argument("--datasets", nargs="*", default=None,
                   help="subset of dataset names (default: all seven)")
    p.add_argument("--out", default=None, help="also write the table here")
    return p


def get_spark(app: str) -> SparkSession:
    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def emit(text: str, out: str | None) -> None:
    print(text)
    if out:
        with open(out, "w") as f:
            f.write(text)


def apply_n_override(n: int | None) -> None:
    if n is not None:
        from repro.harness import tables
        for name in tables.BENCH_N:
            tables.BENCH_N[name] = n
