"""Layout-partitioned Parquet I/O, rewritten query execution, reorg jobs.

Implements the measured operations of the paper's evaluation:

- :func:`write_layout` — materialize a dataset under a layout: assign BIDs,
  cluster rows by BID, write Parquet ``partitionBy("BID")``.
- :func:`run_query` — the rewritten query: ``BID IN (...)`` (computed from
  partition metadata, pruned by Catalyst at the directory level) plus the
  original predicate, followed by a small aggregate so the scan is not
  optimized away.
- :func:`reorganize` — the reorganization job whose cost is α: read all
  partitions, recompute the BID column under the new layout, repartition by
  BID, compress and write the new table (the four steps listed in §VI-D1).
- :func:`full_scan` — the full-table-scan query that defines α's
  denominator.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.layouts.metadata import MaterializedLayout
from repro.sparkio.bid import with_bid
from repro.workload.queries import Query


def write_layout(df: DataFrame, layout, path: str) -> None:
    """Materialize ``df`` under ``layout`` as BID-partitioned Parquet."""
    (
        with_bid(df, layout)
        .repartition("BID")
        .write.mode("overwrite")
        .partitionBy("BID")
        .parquet(path)
    )


def read_layout_table(spark: SparkSession, path: str) -> DataFrame:
    return spark.read.parquet(path)


def _agg(df: DataFrame, agg_col: str) -> list:
    """Small aggregate forcing a real scan of the selected partitions."""
    return df.agg(
        F.count(F.lit(1)).alias("cnt"), F.sum(agg_col).alias("s")
    ).collect()


def _agg_all_columns(df: DataFrame) -> list:
    """Aggregate touching every column, so Parquet cannot skip any of them.

    A single-column aggregate would let the columnar reader scan a fraction
    of the bytes; the paper's α denominator is a *full table scan*.
    """
    aggs = []
    for f in df.schema.fields:
        if f.name == "BID":
            continue
        if f.dataType.typeName() in ("string",):
            aggs.append(F.max(f.name).alias(f"max_{f.name}"))
        else:
            aggs.append(F.sum(F.col(f.name).cast("double")).alias(f"sum_{f.name}"))
    return df.agg(*aggs).collect()


def run_query(
    df: DataFrame,
    query: Query,
    layout_meta: MaterializedLayout,
    *,
    agg_col: str,
) -> tuple[float, int]:
    """Execute the rewritten query; return (seconds, partitions_read).

    The BID list comes from partition metadata exactly as OREO's query
    optimizer computes it; Catalyst prunes the corresponding directories.
    """
    bids = layout_meta.relevant_bids(query)
    t0 = time.perf_counter()
    q = df.where(F.col("BID").isin(bids)).where(F.expr(query.to_sql_where()))
    _agg(q, agg_col)
    return time.perf_counter() - t0, len(bids)


def full_scan(df: DataFrame, *, agg_col: str | None = None) -> float:
    """Full-table-scan seconds (the unit of the cost model).

    With ``agg_col`` set, only that column is aggregated (cheap probe);
    without it, every column is aggregated — the honest full-scan cost.
    """
    t0 = time.perf_counter()
    if agg_col is None:
        _agg_all_columns(df)
    else:
        _agg(df, agg_col)
    return time.perf_counter() - t0


def reorganize(
    spark: SparkSession, src_path: str, layout, dst_path: str
) -> float:
    """Rewrite the table under a new layout; return elapsed seconds.

    Steps (§VI-D1): 1) read partitions 2) update the BID column
    3) repartition by BID 4) compress + write the new partitions.
    """
    t0 = time.perf_counter()
    df = spark.read.parquet(src_path)
    write_layout(df, layout, dst_path)
    return time.perf_counter() - t0
