"""Self-tests for the DuckDB result-equality oracle (repro.oracle)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.workload import datasets as ds


@pytest.fixture(scope="module")
def pdf():
    return ds.tpch_lite_pdf(sf=0.002, seed=83)


class TestAssertEquivalent:
    def test_passes_on_matching_aggregate(self, spark, pdf):
        sdf = spark.createDataFrame(pdf)
        got = sdf.agg(
            F.count(F.lit(1)).alias("cnt"),
            F.round(F.sum("l_quantity"), 2).alias("qty"),
        )
        assert_equivalent(
            got, "SELECT count(*) AS cnt, round(sum(l_quantity),2) AS qty FROM t", t=pdf
        )

    def test_passes_on_matching_groupby(self, spark, pdf):
        sdf = spark.createDataFrame(pdf)
        got = sdf.groupBy("l_returnflag").agg(F.count(F.lit(1)).alias("cnt"))
        assert_equivalent(
            got,
            "SELECT l_returnflag, count(*) AS cnt FROM t GROUP BY l_returnflag",
            t=pdf,
        )

    def test_catches_wrong_rows(self, spark, pdf):
        sdf = spark.createDataFrame(pdf)
        got = sdf.where("l_quantity > 25").agg(F.count(F.lit(1)).alias("cnt"))
        with pytest.raises(AssertionError):
            assert_equivalent(
                got, "SELECT count(*) AS cnt FROM t WHERE l_quantity > 10", t=pdf
            )

    def test_catches_column_mismatch(self, spark, pdf):
        sdf = spark.createDataFrame(pdf)
        got = sdf.agg(F.count(F.lit(1)).alias("wrong_name"))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(got, "SELECT count(*) AS cnt FROM t", t=pdf)

    def test_accepts_spark_inputs_as_tables(self, spark, pdf):
        sdf = spark.createDataFrame(pdf)
        got = sdf.agg(F.count(F.lit(1)).alias("cnt"))
        assert_equivalent(got, "SELECT count(*) AS cnt FROM t", t=sdf)
