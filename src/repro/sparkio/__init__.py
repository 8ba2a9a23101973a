"""Spark integration: the paper's "shallow integration" (§VI-A1), made real.

The paper adds a BID (partition id) column to each table, stores partitions
as Parquet, rewrites queries with an explicit ``BID IN (...)`` filter from
partition metadata, and reorganizes by rewriting rows with new BIDs. We do
exactly that with one upgrade: the table is written with
``partitionBy("BID")``, so the BID filter is pushed down by Catalyst as
directory-level partition pruning — skipped partitions are physically never
read, not merely filtered.
"""
from repro.sparkio.bid import with_bid  # noqa: F401
from repro.sparkio.runner import (  # noqa: F401
    full_scan,
    read_layout_table,
    reorganize,
    run_query,
    write_layout,
)
