"""Unit tests for the lite dataset builders (repro.workload.datasets)."""
import numpy as np
import pandas as pd
import pytest

from repro.workload import datasets as ds


@pytest.mark.parametrize("name", sorted(ds.BUILDERS))
class TestBuilders:
    def test_deterministic(self, name):
        a = ds.build_pdf(name, sf=0.002, seed=3)
        b = ds.build_pdf(name, sf=0.002, seed=3)
        pd.testing.assert_frame_equal(a, b)

    def test_seed_changes_data(self, name):
        a = ds.build_pdf(name, sf=0.002, seed=3)
        b = ds.build_pdf(name, sf=0.002, seed=4)
        assert not a.equals(b)

    def test_schema_matches_spec(self, name):
        spec = ds.SPECS[name]
        pdf = ds.build_pdf(name, sf=0.002)
        for c in spec.numeric_cols:
            assert np.issubdtype(pdf[c].dtype, np.number), c
        for c in spec.categorical_cols:
            assert pdf[c].dtype == object, c

    def test_scale_factor_scales_rows(self, name):
        small = ds.build_pdf(name, sf=0.002)
        big = ds.build_pdf(name, sf=0.01)
        assert len(big) > len(small) * 3

    def test_default_sort_col_exists(self, name):
        spec = ds.SPECS[name]
        pdf = ds.build_pdf(name, sf=0.002)
        assert spec.default_sort_col in pdf.columns

    def test_no_nulls(self, name):
        pdf = ds.build_pdf(name, sf=0.002)
        assert not pdf.isna().any().any()


class TestTpchLite:
    def test_date_ordering(self):
        pdf = ds.tpch_lite_pdf(sf=0.005)
        assert (pdf["l_shipdate"] > pdf["o_orderdate"]).all()
        assert (pdf["l_receiptdate"] >= pdf["l_shipdate"]).all()

    def test_domains(self):
        pdf = ds.tpch_lite_pdf(sf=0.005)
        assert pdf["l_quantity"].between(1, 50).all()
        assert pdf["l_discount"].between(0, 0.10).all()
        assert pdf["c_nationkey"].between(0, 24).all()
        assert set(pdf["c_mktsegment"]) <= set(ds.MKTSEGMENTS)
        assert set(pdf["p_brand"]) <= set(ds.BRANDS)

    def test_dates_within_span(self):
        pdf = ds.tpch_lite_pdf(sf=0.005)
        for c in ("l_shipdate", "l_commitdate", "l_receiptdate", "o_orderdate"):
            assert pdf[c].between(0, ds.DATE_SPAN - 1).all(), c


class TestTpcdsLite:
    def test_derived_date_columns_consistent(self):
        pdf = ds.tpcds_lite_pdf(sf=0.005)
        assert (pdf["d_year"] == 1992 + pdf["ss_sold_date"] // 365).all()
        assert pdf["d_moy"].between(1, 12).all()

    def test_store_skew(self):
        """Stores are zipf-popular: the top store should dominate the tail."""
        pdf = ds.tpcds_lite_pdf(sf=0.01)
        counts = pdf["s_store"].value_counts()
        assert counts.iloc[0] > 2 * counts.iloc[-1]


class TestTelemetry:
    def test_arrival_time_skews_recent(self):
        pdf = ds.telemetry_pdf(sf=0.01)
        t = pdf["arrival_time"]
        recent = (t > ds.TELEMETRY_SPAN_MIN / 2).mean()
        assert recent > 0.6  # sqrt sampling puts ~75% in the later half

    def test_status_mostly_success(self):
        pdf = ds.telemetry_pdf(sf=0.01)
        assert (pdf["status"] == "SUCCESS").mean() > 0.7

    def test_collector_zipf(self):
        pdf = ds.telemetry_pdf(sf=0.01)
        counts = pdf["collector"].value_counts()
        assert counts.iloc[0] > 5 * counts.iloc[len(counts) // 2]


def test_unknown_dataset_raises():
    with pytest.raises(KeyError):
        ds.build_pdf("nope")


def test_minimum_row_floor():
    pdf = ds.build_pdf("tpch_lite", sf=1e-9)
    assert len(pdf) >= 64
