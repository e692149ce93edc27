"""Table harness: one runner per evaluation table of the paper.

``evaluate_dataset`` runs all eight algorithms on one dataset analog
through the Spark pipeline (single partition = the paper's single-node
semantics; per-phase timings and distance counts come from the
in-partition kernels) and caches the result; the ``tableN`` functions
slice that cache into the paper's table layouts, pairing every measured
number with the paper's published value from ``paper_numbers``.

Scale defaults (BENCH_N) are container-sized stand-ins for the paper's
0.46M-10M objects; EXPERIMENTS.md discusses which *shapes* carry over.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.brute_force import brute_force_outliers
from repro.core.spark_dod import ALGORITHMS, GRAPH_ALGORITHMS, detect
from repro.datasets.generators import DATASET_ORDER, make
from repro.harness import paper_numbers as P

# Bench-scale cardinalities (Words smaller: edit distance is the paper's
# own observed bottleneck) and graph degree K (paper: K=40 on PAMAP2,
# K=25 elsewhere — scaled down with n; PAMAP2 also needs K' = 4K >= its
# larger default k for the §5.5 fast path to engage, as in the paper).
BENCH_N = {"Deep": 2500, "Glove": 2500, "HEPMASS": 2500, "MNIST": 2000,
           "PAMAP2": 2500, "SIFT": 2500, "Words": 1200}
BENCH_K = {"PAMAP2": 20}
DEFAULT_K = 10

_CACHE: dict = {}


def evaluate_dataset(spark: SparkSession, name: str, *, n: int | None = None,
                     algos: list[str] | None = None, seed: int = 0) -> dict:
    """Run (and cache) every algorithm on one dataset analog.

    Returns ``{"ds": MetricDataset, "truth": outlier ids,
    "algos": {algo: stats-dict}}`` where each stats dict carries the
    kernel meta (build/filter/verify seconds, distance counts, index
    bytes, false positives) plus ``outliers`` and ``wall_seconds``.
    """
    n = BENCH_N[name] if n is None else n
    key = (name, n, seed)
    entry = _CACHE.get(key)
    if entry is None:
        ds = make(name, n=n)
        truth = brute_force_outliers(ds.X, ds.metric_name, ds.r_default,
                                     ds.k_default)
        entry = _CACHE[key] = {"ds": ds, "truth": truth, "algos": {}}
    ds, truth = entry["ds"], entry["truth"]
    K = BENCH_K.get(name, DEFAULT_K)
    for algo in (algos or ALGORITHMS):
        if algo in entry["algos"]:
            continue
        res = detect(spark, ds, algo, partitions=1, K=K, seed=seed)
        if not np.array_equal(res.outliers, truth):
            raise AssertionError(
                f"{algo} on {name} is not exact: "
                f"{len(res.outliers)} vs {len(truth)} outliers")
        stats = dict(res.stats)
        stats["outliers"] = len(res.outliers)
        stats["wall_seconds"] = res.wall_seconds
        # Detection time: filter+verify for graph algorithms, the scan
        # time for the classic baselines (index build is pre-processing).
        if algo in GRAPH_ALGORITHMS:
            stats["detection_seconds"] = (
                stats.get("filter_seconds", 0.0)
                + stats.get("verify_seconds", 0.0))
            stats["detection_n_dist"] = (
                stats.get("filter_n_dist", 0) + stats.get("verify_n_dist", 0))
        else:
            stats["detection_seconds"] = stats.get("detect_seconds", 0.0)
            stats["detection_n_dist"] = stats.get("detect_n_dist", 0)
        entry["algos"][algo] = stats
    return entry


def _fmt(v, nd=3):
    if v is None:
        return "-"
    if isinstance(v, str):
        return v
    if isinstance(v, float):
        return f"{v:.{nd}f}"
    return str(v)


def table1(datasets: list[str] | None = None) -> pd.DataFrame:
    """Table 1: dataset statistics — paper's vs our analogs'."""
    rows = []
    for name in datasets or DATASET_ORDER:
        ds = make(name, n=BENCH_N[name])
        rows.append({
            "dataset": name,
            "paper_cardinality": ds.paper["cardinality"],
            "ours_cardinality": ds.n,
            "paper_dim": ds.paper["dim"],
            "ours_dim": ds.dim,
            "distance": ds.paper["distance"],
        })
    return pd.DataFrame(rows)


def table2(datasets: list[str] | None = None) -> pd.DataFrame:
    """Table 2: default parameters and measured outlier ratio."""
    rows = []
    for name in datasets or DATASET_ORDER:
        ds = make(name, n=BENCH_N[name])
        truth = brute_force_outliers(ds.X, ds.metric_name, ds.r_default,
                                     ds.k_default)
        rows.append({
            "dataset": name,
            "paper_r": ds.paper["r"], "ours_r": round(ds.r_default, 4),
            "paper_k": ds.paper["k"], "ours_k": ds.k_default,
            "paper_ratio_%": ds.paper["outlier_ratio"],
            "ours_ratio_%": round(100.0 * len(truth) / ds.n, 2),
        })
    return pd.DataFrame(rows)


def table3(spark, datasets: list[str] | None = None) -> pd.DataFrame:
    """Table 3: pre-processing (graph build) time per proximity graph."""
    rows = []
    for name in datasets or DATASET_ORDER:
        e = evaluate_dataset(spark, name, algos=GRAPH_ALGORITHMS)
        row = {"dataset": name}
        for a in GRAPH_ALGORITHMS:
            st = e["algos"][a]
            row[f"paper_{a}"] = _fmt(P.TABLE3[name][a], 2)
            row[f"ours_{a}"] = round(st["build_seconds"], 3)
            row[f"ours_{a}_Mdist"] = round(st["build_n_dist"] / 1e6, 2)
        rows.append(row)
    return pd.DataFrame(rows)


def table4(spark) -> pd.DataFrame:
    """Table 4: decomposed build time on Glove."""
    e = evaluate_dataset(spark, "Glove",
                         algos=["KGraph", "MRPG-basic", "MRPG"])
    steps = ["NNDescent(+)", "Connect-SubGraphs", "Remove-Detours",
             "Remove-Links"]
    rows = []
    for step in steps:
        row = {"step": step}
        for a in ("KGraph", "MRPG-basic", "MRPG"):
            row[f"paper_{a}"] = _fmt(P.TABLE4[a][step], 2)
            ours = e["algos"][a].get("build_steps", {}).get(step)
            row[f"ours_{a}"] = _fmt(round(ours, 3) if ours is not None else None)
        rows.append(row)
    return pd.DataFrame(rows)


def table5(spark, datasets: list[str] | None = None) -> pd.DataFrame:
    """Table 5: detection running time, all eight algorithms."""
    rows = []
    for name in datasets or DATASET_ORDER:
        e = evaluate_dataset(spark, name)
        row = {"dataset": name}
        for a in ALGORITHMS:
            st = e["algos"][a]
            row[f"paper_{a}"] = _fmt(P.TABLE5[name][a], 2)
            row[f"ours_{a}"] = round(st["detection_seconds"], 3)
            row[f"ours_{a}_Mdist"] = round(st["detection_n_dist"] / 1e6, 3)
        rows.append(row)
    return pd.DataFrame(rows)


def table6(spark, datasets: list[str] | None = None) -> pd.DataFrame:
    """Table 6: index size. Paper reports MB at n up to 10M; at our n
    the natural unit is KB — both are emitted."""
    rows = []
    for name in datasets or DATASET_ORDER:
        e = evaluate_dataset(spark, name)
        row = {"dataset": name}
        for a in ALGORITHMS:
            st = e["algos"][a]
            row[f"paper_{a}_MB"] = _fmt(P.TABLE6[name][a], 2)
            row[f"ours_{a}_KB"] = round(st.get("index_bytes", 0) / 1024, 1)
        rows.append(row)
    return pd.DataFrame(rows)


def table7(spark, datasets: list[str] | None = None) -> pd.DataFrame:
    """Table 7: false positives after the filtering phase."""
    rows = []
    for name in datasets or DATASET_ORDER:
        e = evaluate_dataset(spark, name, algos=GRAPH_ALGORITHMS)
        row = {"dataset": name, "n": e["ds"].n, "outliers": len(e["truth"])}
        for a in GRAPH_ALGORITHMS:
            st = e["algos"][a]
            row[f"paper_{a}"] = _fmt(P.TABLE7[name][a])
            row[f"ours_{a}"] = st.get("n_false_positives", 0)
        rows.append(row)
    return pd.DataFrame(rows)


def table8(spark) -> pd.DataFrame:
    """Table 8: filtering vs verification time on Glove."""
    e = evaluate_dataset(spark, "Glove", algos=GRAPH_ALGORITHMS)
    rows = []
    for phase, skey in (("Filtering", "filter_seconds"),
                        ("Verification", "verify_seconds")):
        row = {"phase": phase}
        for a in GRAPH_ALGORITHMS:
            row[f"paper_{a}"] = _fmt(P.TABLE8[a][phase], 2)
            row[f"ours_{a}"] = round(e["algos"][a].get(skey, 0.0), 3)
        rows.append(row)
    return pd.DataFrame(rows)


def render(df: pd.DataFrame, title: str) -> str:
    """Markdown-ish rendering used by jobs/ and the benchmark printers
    (hand-rolled: tabulate is not installed in this container)."""
    cols = list(df.columns)
    widths = [max(len(str(c)), *(len(str(v)) for v in df[c])) for c in cols]
    head = " | ".join(str(c).ljust(w) for c, w in zip(cols, widths))
    sep = "-|-".join("-" * w for w in widths)
    body = "\n".join(
        " | ".join(str(v).ljust(w) for v, w in zip(row, widths))
        for row in df.itertuples(index=False)
    )
    return f"\n## {title}\n\n{head}\n{sep}\n{body}\n"
