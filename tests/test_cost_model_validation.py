"""Validates the logical cost model against real Spark execution.

The cost model asserts c(s,q) = fraction of data in non-skippable
partitions. Here we verify in Spark that (1) the number of Parquet files a
rewritten query reads equals the number of metadata-relevant partitions —
i.e., skipping is physical, not cosmetic — and (2) the bytes touched scale
with the modeled cost.
"""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.layouts.metadata import build_materialized
from repro.layouts.qdtree import build_qdtree
from repro.sparkio.runner import read_layout_table, write_layout
from repro.workload import datasets as ds
from repro.workload.generator import generate_workload


@pytest.fixture(scope="module")
def setup(spark, tmp_path_factory):
    pdf = ds.tpch_lite_pdf(sf=0.01, seed=71)
    wl = generate_workload("tpch_lite", n_queries=150, n_segments=5, seed=73)
    lay = build_qdtree(
        pdf, wl.queries, 10, categorical_cols=ds.TPCH_LITE.categorical_cols
    )
    mat = build_materialized(
        pdf, lay.assign(pdf), name="qd", categorical_cols=ds.TPCH_LITE.categorical_cols
    )
    path = str(tmp_path_factory.mktemp("cmv") / "tbl")
    write_layout(spark.createDataFrame(pdf), lay, path)
    return pdf, wl, mat, path


class TestPhysicalSkipping:
    def test_files_read_match_relevant_partitions(self, spark, setup):
        pdf, wl, mat, path = setup
        df = read_layout_table(spark, path)
        for q in wl.queries[::10]:
            bids = mat.relevant_bids(q)
            files = (
                df.where(F.col("BID").isin(bids))
                .select(F.input_file_name().alias("f"))
                .distinct()
                .count()
            )
            # One Parquet file per non-empty BID directory at this scale.
            nonempty = sum(1 for b in bids if mat.rows[b] > 0)
            assert files == nonempty, q

    def test_rows_scanned_equal_modeled_fraction(self, spark, setup):
        pdf, wl, mat, path = setup
        df = read_layout_table(spark, path)
        for q in wl.queries[::25]:
            bids = mat.relevant_bids(q)
            scanned = df.where(F.col("BID").isin(bids)).count()
            assert scanned == pytest.approx(mat.cost(q) * len(pdf))

    def test_skipping_never_loses_rows(self, spark, setup):
        """Row counts with and without the BID filter agree on the predicate."""
        pdf, wl, mat, path = setup
        df = read_layout_table(spark, path)
        for q in wl.queries[::25]:
            bids = mat.relevant_bids(q)
            with_skip = (
                df.where(F.col("BID").isin(bids))
                .where(F.expr(q.to_sql_where()))
                .count()
            )
            without = df.where(F.expr(q.to_sql_where())).count()
            assert with_skip == without, q
