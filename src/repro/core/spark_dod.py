"""PySpark driver for the DOD reproduction.

Layering (DESIGN.md §3): the paper's algorithms are single-node
main-memory algorithms, so each Spark partition builds its index
**in-memory** and runs detection locally inside ``mapInPandas``; results
are merged through Catalyst (groupBy/sum) in a global verification
stage.

Two modes, selected by partition count:

- ``partitions == 1`` — paper semantics: the kernel sees the whole
  dataset, runs the full algorithm (filter + its own verification), and
  the emitted inlier/outlier statuses are final.
- ``partitions > 1`` — distributed: each kernel only filters. A local
  neighbor count lower-bounds the global count, so locally-satisfied
  objects (count >= k) are definitively inliers (no false negatives,
  Lemma 1 carries over); everything else becomes a *candidate*. A
  second ``mapInPandas`` pass counts each candidate's neighbors per
  partition, capped at k (``sum(min(c_i, k)) >= k  <=>  sum(c_i) >= k``,
  so capping is exact), and a Catalyst aggregation merges the counts.

Per-partition timings, distance-computation counts, graph sizes and
false-positive counts are emitted on sentinel rows (id = -1) as JSON and
aggregated into ``SparkDODResult.stats`` for the table harnesses.
"""
from __future__ import annotations

import json
import time
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import (ArrayType, DoubleType, LongType, StringType,
                               StructField, StructType)

from repro.baselines.dolphin import dolphin_outliers
from repro.baselines.nested_loop import nested_loop_outliers
from repro.baselines.snif import snif_outliers
from repro.baselines.vptree_dod import vptree_outliers
from repro.core.dod import detect_outliers, filter_phase
from repro.core.mrpg import build_mrpg
from repro.core.nndescent import build_kgraph
from repro.core.nsw import build_nsw
from repro.datasets.generators import MetricDataset
from repro.metrics.distances import get_metric
from repro.vptree.vptree import VPTree

ALGORITHMS = [
    "Nested-loop", "SNIF", "DOLPHIN", "VP-tree",
    "NSW", "KGraph", "MRPG-basic", "MRPG",
]
GRAPH_ALGORITHMS = ["NSW", "KGraph", "MRPG-basic", "MRPG"]


@dataclass
class SparkDODResult:
    """Merged output of one distributed DOD run."""

    outliers: np.ndarray
    stats: dict = field(default_factory=dict)
    wall_seconds: float = 0.0


def dataset_to_df(spark: SparkSession, ds: MetricDataset,
                  *, partitions: int = 1) -> DataFrame:
    """Dataset analog -> DataFrame(id, vec|word), hash-partitioned."""
    if ds.X.dtype == object:
        pdf = pd.DataFrame({"id": np.arange(ds.n), "word": list(ds.X)})
        schema = StructType([StructField("id", LongType()),
                             StructField("word", StringType())])
    else:
        pdf = pd.DataFrame({"id": np.arange(ds.n),
                            "vec": list(map(list, ds.X))})
        schema = StructType([StructField("id", LongType()),
                             StructField("vec", ArrayType(DoubleType()))])
    df = spark.createDataFrame(pdf, schema=schema)
    return df.repartition(partitions, "id")


def _pdf_to_objects(pdf: pd.DataFrame):
    """Arrow batch -> (ids ndarray, objects ndarray)."""
    ids = pdf["id"].to_numpy(dtype=np.int64)
    if "word" in pdf.columns:
        X = np.array(pdf["word"].tolist(), dtype=object)
    else:
        X = np.array(pdf["vec"].tolist(), dtype=np.float64)
    return ids, X


def build_graph(X, metric, algo: str, *, K: int, seed: int = 0):
    """Build the proximity graph an algorithm name refers to.

    KGraph is the paper's directed AKNN graph: Greedy-Counting follows
    out-links only, which is exactly why its reachability (and hence
    ``f``, Table 7) is worse than MRPG's — MRPG's Connect-SubGraphs adds
    the reverse links among other things.
    """
    if algo == "KGraph":
        return build_kgraph(X, metric, K=K, seed=seed)
    if algo == "NSW":
        return build_nsw(X, metric, K=K, seed=seed)
    if algo == "MRPG-basic":
        return build_mrpg(X, metric, K=K, basic=True, seed=seed)
    if algo == "MRPG":
        return build_mrpg(X, metric, K=K, seed=seed)
    raise ValueError(f"not a graph algorithm: {algo}")


def run_partition(ids, X, metric_name: str, algo: str, r: float, k: int, *,
                  K: int = 15, seed: int = 0, verify_method: str = "scan",
                  filter_only: bool = False):
    """Run one algorithm on one in-memory partition.

    Returns ``(status, meta)`` where ``status`` maps each position to
    'inlier' | 'outlier' | 'candidate' (candidates only in
    ``filter_only`` mode) and ``meta`` carries timings/counters.
    """
    metric = get_metric(metric_name)
    n = len(X)
    meta: dict = {"algo": algo, "n": n}
    status = np.full(n, "inlier", dtype=object)

    if algo in GRAPH_ALGORITHMS:
        t0 = time.perf_counter()
        g = build_graph(X, metric, algo, K=K, seed=seed)
        meta["build_seconds"] = time.perf_counter() - t0
        meta["build_steps"] = g.build_seconds
        meta["build_n_dist"] = g.build_n_dist
        meta["index_bytes"] = g.index_bytes()
        meta["n_links"] = g.n_links()
        if filter_only:
            t0 = time.perf_counter()
            before = metric.n_dist
            cand, decided, _ = filter_phase(X, metric, g, r, k)
            meta["filter_seconds"] = time.perf_counter() - t0
            meta["filter_n_dist"] = metric.n_dist - before
            # Local 'decided outliers' are only locally exact: with a
            # partial dataset they must still be verified globally.
            status[np.concatenate([cand, decided]).astype(int)] = "candidate"
        else:
            res = detect_outliers(X, metric, g, r, k,
                                  verify_method=verify_method)
            meta["filter_seconds"] = res.filter_seconds
            meta["verify_seconds"] = res.verify_seconds
            meta["filter_n_dist"] = res.filter_n_dist
            meta["verify_n_dist"] = res.verify_n_dist
            meta["n_candidates"] = res.n_candidates
            meta["n_false_positives"] = res.n_false_positives
            meta["n_decided_outliers"] = res.n_decided_outliers
            status[res.outliers] = "outlier"
        return status, meta

    # Classic baselines: always compute the exact local answer; in
    # filter_only mode local outliers are merely global candidates.
    stats: dict = {}
    t0 = time.perf_counter()
    before = metric.n_dist
    if algo == "Nested-loop":
        out = nested_loop_outliers(X, metric, r, k, seed=seed)
        meta["index_bytes"] = 0
    elif algo == "SNIF":
        out = snif_outliers(X, metric, r, k, seed=seed, stats=stats)
    elif algo == "DOLPHIN":
        out = dolphin_outliers(X, metric, r, k, seed=seed, stats=stats)
    elif algo == "VP-tree":
        tb = time.perf_counter()
        tree = VPTree(X, metric, capacity=32, seed=seed)
        meta["build_seconds"] = time.perf_counter() - tb
        meta["index_bytes"] = tree.index_bytes()
        out = vptree_outliers(X, metric, r, k, tree=tree)
    else:
        raise ValueError(f"unknown algorithm {algo!r}")
    meta.setdefault("index_bytes", stats.get("index_bytes", 0))
    meta["detect_seconds"] = time.perf_counter() - t0
    meta["detect_n_dist"] = metric.n_dist - before
    status[out] = "candidate" if filter_only else "outlier"
    return status, meta


_FILTER_SCHEMA = StructType([
    StructField("id", LongType()),
    StructField("status", StringType()),
    StructField("meta", StringType()),
])

_COUNT_SCHEMA = StructType([
    StructField("cand_id", LongType()),
    StructField("cnt", LongType()),
])


def detect(
    spark: SparkSession,
    ds: MetricDataset,
    algo: str,
    *,
    r: float | None = None,
    k: int | None = None,
    partitions: int = 1,
    K: int = 15,
    seed: int = 0,
    verify_method: str | None = None,
) -> SparkDODResult:
    """Distributed DOD: local (graph-)filtering + global verification."""
    r = ds.r_default if r is None else r
    k = ds.k_default if k is None else k
    vm = verify_method or ("vptree" if ds.name in ("HEPMASS", "PAMAP2", "Words")
                           else "scan")
    metric_name = ds.metric_name
    filter_only = partitions > 1
    df = dataset_to_df(spark, ds, partitions=partitions).cache()
    df.count()  # materialize before timing detection

    def filter_fn(batches):
        pdf = pd.concat(list(batches), ignore_index=True)
        if len(pdf) == 0:
            return
        ids, X = _pdf_to_objects(pdf)
        status, meta = run_partition(
            ids, X, metric_name, algo, r, k, K=K, seed=seed,
            verify_method=vm, filter_only=filter_only)
        out = pd.DataFrame({"id": ids, "status": status, "meta": None})
        sentinel = pd.DataFrame(
            {"id": [-1], "status": ["meta"], "meta": [json.dumps(meta)]})
        yield pd.concat([out, sentinel], ignore_index=True)

    t0 = time.perf_counter()
    rows = df.mapInPandas(filter_fn, schema=_FILTER_SCHEMA).collect()
    statuses = {int(w["id"]): w["status"] for w in rows if w["id"] >= 0}
    metas = [json.loads(w["meta"]) for w in rows if w["id"] == -1]

    if not filter_only:
        outliers = np.array(sorted(i for i, s in statuses.items()
                                   if s == "outlier"), dtype=np.int64)
        result = SparkDODResult(outliers=outliers,
                                stats=_merge_metas(metas),
                                wall_seconds=time.perf_counter() - t0)
        df.unpersist()
        return result

    cand_ids = np.array(sorted(i for i, s in statuses.items()
                               if s == "candidate"), dtype=np.int64)
    if len(cand_ids) == 0:
        df.unpersist()
        return SparkDODResult(outliers=cand_ids, stats=_merge_metas(metas),
                              wall_seconds=time.perf_counter() - t0)

    # Global verification: broadcast candidates, count per partition with
    # a cap at k, merge through Catalyst. Self-matches excluded by id.
    cand_mask = np.isin(np.arange(ds.n), cand_ids)
    cand_objects = ds.X[cand_mask]
    bc = spark.sparkContext.broadcast((cand_ids, cand_objects))

    def count_fn(batches):
        c_ids, c_objs = bc.value
        metric = get_metric(metric_name)
        for pdf in batches:
            if len(pdf) == 0:
                continue
            ids, X = _pdf_to_objects(pdf)
            cnts = np.zeros(len(c_ids), dtype=np.int64)
            for ci, (cid, cobj) in enumerate(zip(c_ids, c_objs)):
                d = metric.one_to_many(cobj, X)
                cnts[ci] = int(((d <= r) & (ids != cid)).sum())
            yield pd.DataFrame({"cand_id": c_ids, "cnt": np.minimum(cnts, k)})

    merged = (
        df.mapInPandas(count_fn, schema=_COUNT_SCHEMA)
        .groupBy("cand_id")
        .agg(F.sum("cnt").alias("total"))
        .where(F.col("total") < F.lit(k))
        .select("cand_id")
        .collect()
    )
    outliers = np.array(sorted(int(w["cand_id"]) for w in merged),
                        dtype=np.int64)
    stats = _merge_metas(metas)
    stats["n_global_candidates"] = len(cand_ids)
    df.unpersist()
    return SparkDODResult(outliers=outliers, stats=stats,
                          wall_seconds=time.perf_counter() - t0)


def _merge_metas(metas: list[dict]) -> dict:
    """Merge per-partition metas: sums for counters, max for timings
    (partitions run in parallel — max is the wall-clock proxy)."""
    out: dict = {"partitions": len(metas)}
    sum_keys = ("build_n_dist", "filter_n_dist", "verify_n_dist",
                "detect_n_dist", "index_bytes", "n_links", "n_candidates",
                "n_false_positives", "n_decided_outliers", "n")
    max_keys = ("build_seconds", "filter_seconds", "verify_seconds",
                "detect_seconds")
    for m in metas:
        for kk in sum_keys:
            if kk in m:
                out[kk] = out.get(kk, 0) + m[kk]
        for kk in max_keys:
            if kk in m:
                out[kk] = max(out.get(kk, 0.0), m[kk])
        if "build_steps" in m:
            steps = out.setdefault("build_steps", {})
            for s, v in m["build_steps"].items():
                steps[s] = max(steps.get(s, 0.0), v)
    return out


def outliers_df(spark: SparkSession, result: SparkDODResult) -> DataFrame:
    """Outlier ids as a DataFrame(id) — the shape the DuckDB oracle diffs."""
    pdf = pd.DataFrame({"id": result.outliers.astype(np.int64)})
    return spark.createDataFrame(pdf, schema=StructType(
        [StructField("id", LongType())]))
