"""Distance-based outlier detection expressed entirely in SQL.

This is the Catalyst-native nested-loop reference: vectors are exploded
to long format ``(id, i, x)``, pairwise metric distances are computed by
a self-join on the dimension index + aggregation, and outliers are the
ids with fewer than ``k`` neighbor rows within ``r``. Strings use the
engine's built-in ``levenshtein``.

The SQL is written in the dialect subset shared by Spark SQL and DuckDB,
so the *same* statement runs on both engines — which is exactly what
``repro.oracle.assert_equivalent`` needs to certify every other
implementation in this repo (DESIGN.md §6).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.datasets.generators import MetricDataset

_PAIR_DIST = {
    "l1": "SUM(ABS(a.x - b.x))",
    "l2": "SQRT(SUM((a.x - b.x) * (a.x - b.x)))",
    "l4": "POWER(SUM(POWER(a.x - b.x, 4)), 0.25)",
    "angular": (
        "ACOS(LEAST(CAST(1 AS DOUBLE), GREATEST(CAST(-1 AS DOUBLE), "
        "SUM(a.x * b.x) / (SQRT(SUM(a.x * a.x)) * SQRT(SUM(b.x * b.x)))"
        "))) / PI()"
    ),
}


def long_format(ds: MetricDataset) -> pd.DataFrame:
    """Vectors -> (id, i, x) rows; strings -> (id, word) rows."""
    if ds.X.dtype == object:
        return pd.DataFrame({"id": np.arange(ds.n), "word": list(ds.X)})
    n, d = ds.X.shape
    return pd.DataFrame({
        "id": np.repeat(np.arange(n), d),
        "i": np.tile(np.arange(d), n),
        "x": ds.X.ravel(),
    })


def dod_sql(metric_name: str, r: float, k: int, *, table: str = "pts") -> str:
    """One engine-portable SQL statement returning outlier ids."""
    if metric_name == "edit":
        return f"""
            SELECT a.id AS id
            FROM {table} a JOIN {table} b ON a.id <> b.id
            GROUP BY a.id
            HAVING COUNT(CASE WHEN levenshtein(a.word, b.word) <= {r}
                         THEN 1 END) < {k}
            ORDER BY id
        """
    dist = _PAIR_DIST[metric_name]
    return f"""
        WITH pair AS (
            SELECT a.id AS ai, b.id AS bi, {dist} AS dist
            FROM {table} a JOIN {table} b ON a.i = b.i AND a.id <> b.id
            GROUP BY a.id, b.id
        )
        SELECT ai AS id FROM pair
        GROUP BY ai
        HAVING COUNT(CASE WHEN dist <= {r} THEN 1 END) < {k}
        ORDER BY id
    """


def spark_sql_outliers(spark: SparkSession, ds: MetricDataset, *,
                       r: float | None = None, k: int | None = None,
                       table: str = "pts") -> DataFrame:
    """Run the SQL DOD on Spark (Catalyst plans the join + aggregates)."""
    r = ds.r_default if r is None else r
    k = ds.k_default if k is None else k
    spark.createDataFrame(long_format(ds)).createOrReplaceTempView(table)
    return spark.sql(dod_sql(ds.metric_name, r, k, table=table))
