"""Unit tests for partition metadata + metadata-only costing (soundness)."""
import numpy as np
import pytest

from repro.layouts.metadata import build_materialized
from repro.workload import datasets as ds
from repro.workload.generator import generate_workload
from repro.workload.queries import InPredicate, Query, RangePredicate


@pytest.fixture(scope="module")
def pdf():
    return ds.tpch_lite_pdf(sf=0.005, seed=11)


@pytest.fixture(scope="module")
def mat(pdf):
    g = np.random.default_rng(0)
    bids = g.integers(0, 16, len(pdf))
    return build_materialized(
        pdf, bids, name="random16", categorical_cols=ds.TPCH_LITE.categorical_cols
    )


class TestBuildMaterialized:
    def test_row_counts(self, pdf, mat):
        assert mat.n_rows == len(pdf)
        assert mat.rows.sum() == len(pdf)
        assert mat.n_partitions == 16

    def test_minmax_correct(self, pdf, mat):
        g = np.random.default_rng(0)
        bids = g.integers(0, 16, len(pdf))
        for b in (0, 7, 15):
            sub = pdf[bids == b]
            assert mat.mins["l_shipdate"][b] == sub["l_shipdate"].min()
            assert mat.maxs["l_shipdate"][b] == sub["l_shipdate"].max()

    def test_distinct_correct(self, pdf, mat):
        g = np.random.default_rng(0)
        bids = g.integers(0, 16, len(pdf))
        sub = pdf[bids == 3]
        assert mat.distinct["c_mktsegment"][3] == frozenset(sub["c_mktsegment"])

    def test_empty_partition(self, pdf):
        bids = np.zeros(len(pdf), dtype=int)
        bids[0] = 2  # partition 1 stays empty
        m = build_materialized(
            pdf, bids, name="gap", categorical_cols=ds.TPCH_LITE.categorical_cols
        )
        assert m.rows[1] == 0
        q = Query((RangePredicate("l_shipdate", lo=0),))
        assert 1 not in m.relevant_bids(q)

    def test_length_mismatch_raises(self, pdf):
        with pytest.raises(ValueError):
            build_materialized(pdf, np.zeros(3), name="x", categorical_cols=())


class TestPruningSoundness:
    """Metadata pruning must never skip a partition holding matching rows."""

    def test_sound_on_workload(self, pdf, mat):
        g = np.random.default_rng(0)
        bids = g.integers(0, 16, len(pdf))
        w = generate_workload("tpch_lite", n_queries=120, n_segments=10, seed=13)
        for q in w.queries:
            matched_bids = set(np.unique(bids[q.mask(pdf)]))
            kept = set(mat.relevant_bids(q))
            assert matched_bids <= kept, f"pruned a matching partition for {q}"

    def test_prunes_something_for_selective_query(self, pdf):
        # Range-partition by shipdate: a narrow shipdate query must prune.
        qs = np.quantile(pdf["l_shipdate"], np.linspace(0, 1, 9)[1:-1])
        bids = np.searchsorted(qs, pdf["l_shipdate"].to_numpy())
        m = build_materialized(
            pdf, bids, name="ship8", categorical_cols=ds.TPCH_LITE.categorical_cols
        )
        lo = int(np.quantile(pdf["l_shipdate"], 0.4))
        q = Query((RangePredicate("l_shipdate", lo=lo, hi=lo + 30),))
        assert len(m.relevant_bids(q)) < m.n_partitions

    def test_unknown_column_is_never_pruned_on(self, pdf, mat):
        q = Query((RangePredicate("not_a_column", lo=0),))
        assert mat.cost(q) == 1.0


class TestCostModel:
    def test_cost_bounds(self, pdf, mat):
        w = generate_workload("tpch_lite", n_queries=60, n_segments=6, seed=17)
        for q in w.queries:
            assert 0.0 <= mat.cost(q) <= 1.0

    def test_cost_is_fraction_of_kept_rows(self, pdf, mat):
        q = Query((InPredicate("l_returnflag", frozenset({"R"})),))
        keep = mat.relevant_partitions(q)
        assert mat.cost(q) == pytest.approx(mat.rows[keep].sum() / mat.n_rows)

    def test_full_match_costs_one(self, pdf, mat):
        q = Query((RangePredicate("l_quantity", lo=0, hi=1e9),))
        assert mat.cost(q) == 1.0

    def test_no_match_costs_zero(self, pdf, mat):
        q = Query((RangePredicate("l_quantity", lo=1e6),))
        assert mat.cost(q) == 0.0

    def test_eval_skipped_complements_cost(self, mat):
        qs = [
            Query((RangePredicate("l_quantity", lo=0, hi=1e9),)),
            Query((RangePredicate("l_quantity", lo=1e6),)),
        ]
        assert mat.eval_skipped(qs) == pytest.approx(0.5)
        assert mat.eval_skipped([]) == 0.0

    def test_cost_vector_matches_cost(self, mat):
        qs = [
            Query((RangePredicate("l_shipdate", lo=100, hi=200),)),
            Query((InPredicate("c_mktsegment", frozenset({"BUILDING"})),)),
        ]
        cv = mat.cost_vector(qs)
        assert cv.shape == (2,)
        assert cv[0] == mat.cost(qs[0]) and cv[1] == mat.cost(qs[1])

    def test_empty_layout_cost_zero(self):
        import pandas as pd

        empty = pd.DataFrame({"x": []})
        m = build_materialized(empty, np.array([], dtype=int), name="e", categorical_cols=())
        assert m.cost(Query((RangePredicate("x", lo=0),))) == 0.0
