"""Integration tests for the OREO simulation driver (repro.core.oreo)."""
import numpy as np
import pytest

from repro.core.oreo import DelayedSwitcher, OreoResult, default_layout, run_oreo
from repro.workload import datasets as ds
from repro.workload.generator import generate_workload


@pytest.fixture(scope="module")
def pdf():
    return ds.tpch_lite_pdf(sf=0.01, seed=41)


@pytest.fixture(scope="module")
def workload():
    return generate_workload("tpch_lite", n_queries=1500, n_segments=6, seed=43)


@pytest.fixture(scope="module")
def result(pdf, workload):
    return run_oreo(pdf, ds.TPCH_LITE, workload, k=16, alpha=20, seed=0)


class TestDelayedSwitcher:
    def test_no_delay_switch_next_query(self):
        sw = DelayedSwitcher("a", delta=0)
        assert sw.at(0) == "a"
        sw.decide(0, "b")
        assert sw.at(1) == "b"

    def test_delay_serves_old_layout(self):
        sw = DelayedSwitcher("a", delta=3)
        sw.decide(0, "b")
        assert [sw.at(t) for t in range(1, 6)] == ["a", "a", "a", "b", "b"]

    def test_chained_decisions_apply_in_order(self):
        sw = DelayedSwitcher("a", delta=1)
        sw.decide(0, "b")
        sw.decide(5, "c")
        assert sw.at(2) == "b"
        assert sw.at(7) == "c"


class TestDefaultLayout:
    def test_partitions_by_sort_column(self, pdf):
        mat = default_layout(pdf, ds.TPCH_LITE, 16)
        assert mat.n_partitions == 16
        assert mat.name.startswith("fixed:l_shipdate")
        assert mat.n_rows == len(pdf)


class TestRunOreo:
    def test_result_shape(self, result, workload):
        assert isinstance(result, OreoResult)
        assert len(result.query_costs) == len(workload)
        assert len(result.layout_per_query) == len(workload)
        assert ((result.query_costs >= 0) & (result.query_costs <= 1)).all()

    def test_cost_accounting(self, result):
        assert result.total_cost == pytest.approx(
            result.query_cost + result.reorg_cost
        )
        assert result.reorg_cost == pytest.approx(result.n_moves * 20.0)

    def test_layouts_evolve(self, result):
        assert result.n_candidates > 0
        assert result.n_admitted >= 1
        assert len(set(result.layout_per_query)) > 1

    def test_first_query_served_on_default(self, result):
        assert result.layout_per_query[0].startswith("fixed:")

    def test_deterministic_in_seed(self, pdf, workload):
        a = run_oreo(pdf, ds.TPCH_LITE, workload, k=16, alpha=20, seed=5)
        b = run_oreo(pdf, ds.TPCH_LITE, workload, k=16, alpha=20, seed=5)
        assert a.total_cost == b.total_cost
        assert a.layout_per_query == b.layout_per_query

    def test_delay_does_not_change_reorg_cost(self, pdf, workload):
        a = run_oreo(pdf, ds.TPCH_LITE, workload, k=16, alpha=20, seed=1, delta=0)
        b = run_oreo(pdf, ds.TPCH_LITE, workload, k=16, alpha=20, seed=1, delta=20)
        assert b.reorg_cost == a.reorg_cost  # cost charged at decision time

    def test_delay_increases_query_cost(self, pdf, workload):
        """§VI-D5: serving on the outdated layout raises query costs."""
        a = run_oreo(pdf, ds.TPCH_LITE, workload, k=16, alpha=20, seed=1, delta=0)
        b = run_oreo(pdf, ds.TPCH_LITE, workload, k=16, alpha=20, seed=1, delta=60)
        assert b.query_cost >= a.query_cost

    def test_admit_modes_run(self, pdf, workload):
        for mode in ("replay", "median", "defer"):
            r = run_oreo(
                pdf, ds.TPCH_LITE, workload, k=16, alpha=20, seed=0, admit_mode=mode
            )
            assert r.total_cost > 0

    def test_bad_admit_mode_rejected(self, pdf, workload):
        with pytest.raises(ValueError):
            run_oreo(pdf, ds.TPCH_LITE, workload, admit_mode="nope")

    def test_higher_alpha_fewer_moves(self, pdf, workload):
        lo = run_oreo(pdf, ds.TPCH_LITE, workload, k=16, alpha=10, seed=2)
        hi = run_oreo(pdf, ds.TPCH_LITE, workload, k=16, alpha=200, seed=2)
        assert hi.n_moves <= lo.n_moves

    def test_states_bounded_by_max_states(self, pdf, workload):
        r = run_oreo(
            pdf, ds.TPCH_LITE, workload, k=16, alpha=20, seed=0, max_states=4
        )
        # n_states_max counts the reorganizer's total set; pruning keeps the
        # *space* at max_states, transiently +1 while an add/remove settles.
        assert r.n_states_max <= 5
