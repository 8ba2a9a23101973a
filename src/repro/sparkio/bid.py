"""BID assignment inside Spark.

Layout objects (FixedRangeLayout / QdTreeLayout / ZOrderLayout) are pure
Python + numpy and a pure function of row values, so the same object that
drove the simulator is shipped to executors and applied per Arrow batch via
``mapInPandas`` — the Spark-side reorganization is guaranteed to agree with
the simulator's row→partition mapping.
"""
from __future__ import annotations

from typing import Iterator

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql.types import LongType, StructField, StructType


def with_bid(df: DataFrame, layout) -> DataFrame:
    """Return ``df`` with a ``BID`` column computed by ``layout.assign``.

    Any existing BID column is replaced (reorganization = BID rewrite).
    """
    src = df.drop("BID") if "BID" in df.columns else df
    schema = StructType(src.schema.fields + [StructField("BID", LongType(), False)])

    def assign(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            out = pdf.copy()
            out["BID"] = layout.assign(pdf)
            yield out

    return src.mapInPandas(assign, schema=schema)
