"""Distributed O(n) estimator initialization — the per-partition UDF.

The cost model's only O(n) work is its initialization: the global-cost
coefficient matrix ``A[j][k]`` (Eq. 6) and the d local-cost pattern
tables (Algorithm 1).  Both are *sums over queries*, so they distribute
perfectly: each partition of the query DataFrame computes its partial
statistics inside a ``mapInPandas`` UDF and emits them as one pickled
row; the driver merges the partials with the estimators' ``merge``.
After that, scoring each candidate BMC is O(d * ell) on the driver —
the constant-time property the paper proves, now over a workload that
never has to fit in one machine's memory.
"""
from __future__ import annotations

import pickle
from typing import Iterator

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.cost_model import WorkloadCostEstimator
from repro.core.query import RangeQuery

_PARTIAL_SCHEMA = "payload binary"


def queries_to_spark(
    spark: SparkSession, queries: list[RangeQuery], n_partitions: int = 8
) -> DataFrame:
    """Workload as a DataFrame with lo_<i>/hi_<i> integer columns."""
    if not queries:
        raise ValueError("empty workload")
    d = queries[0].d
    data = {}
    for i in range(d):
        data[f"lo_{i}"] = [q.lo[i] for q in queries]
        data[f"hi_{i}"] = [q.hi[i] for q in queries]
    return spark.createDataFrame(pd.DataFrame(data)).repartition(n_partitions)


def spark_queries_to_list(df: DataFrame) -> list[RangeQuery]:
    """Collect a query DataFrame back into RangeQuery objects."""
    d = sum(1 for c in df.columns if c.startswith("lo_"))
    pdf = df.toPandas()
    return [
        RangeQuery(
            tuple(int(pdf[f"lo_{i}"].iloc[r]) for i in range(d)),
            tuple(int(pdf[f"hi_{i}"].iloc[r]) for i in range(d)),
        )
        for r in range(len(pdf))
    ]


def fit_estimator_distributed(
    queries_df: DataFrame, d: int, ell: int
) -> WorkloadCostEstimator:
    """Build a WorkloadCostEstimator with per-partition parallel init.

    Each query partition computes its own ``A`` matrix and pattern
    tables (both additive) inside the Python workers; only the tiny
    summaries (O(d * ell * (ell+1)^(d-1)) numbers) cross the wire.
    """
    cols = [f"lo_{i}" for i in range(d)] + [f"hi_{i}" for i in range(d)]
    missing = [c for c in cols if c not in queries_df.columns]
    if missing:
        raise ValueError(f"query DataFrame lacks columns {missing}")

    def build_partial(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        queries = []
        for pdf in batches:
            for r in range(len(pdf)):
                queries.append(
                    RangeQuery(
                        tuple(int(pdf[f"lo_{i}"].iloc[r]) for i in range(d)),
                        tuple(int(pdf[f"hi_{i}"].iloc[r]) for i in range(d)),
                    )
                )
        if queries:
            part = WorkloadCostEstimator(queries, d, ell)
            yield pd.DataFrame({"payload": [pickle.dumps(part)]})

    rows = (
        queries_df.select(*cols)
        .mapInPandas(build_partial, schema=_PARTIAL_SCHEMA)
        .collect()
    )
    parts = [pickle.loads(bytes(r.payload)) for r in rows]
    if not parts:
        raise ValueError("no queries in DataFrame")
    return WorkloadCostEstimator.merge(parts)
