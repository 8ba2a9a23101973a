"""Per-dataset query templates.

A template is a parameterized query family: calling ``instantiate`` with an
RNG draws concrete predicate constants (dates, segments, brands, ...) the
way the TPC-H/TPC-DS query generators draw substitution parameters. The
workload generator (``generator.py``) samples many instances of one template
per segment, so queries within a segment share columns/shape but differ in
constants — exactly the drift structure the paper's state-machine workload
produces.

TPC-H-lite carries 13 templates mirroring the 13 lineitem-touching TPC-H
queries the paper uses (q1,q3,q4,q5,q6,q7,q8,q10,q12,q14,q17,q21 — q9/q18
excluded by the paper because their predicates cannot be evaluated with
basic partition metadata; we add one extra receiptdate template to reach
13 as in the paper's list). TPC-DS-lite carries 17 templates standing in
for the paper's 17 store_sales templates. Telemetry carries the predicate
mix described in §VI-A2: time ranges from hours to months plus collector
filters.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

import numpy as np

from repro.workload.datasets import (
    BRANDS,
    CATEGORIES,
    CONTAINERS,
    DATE_SPAN,
    EDUCATIONS,
    JOB_TYPES,
    MARITALS,
    MKTSEGMENTS,
    PRIORITIES,
    PTYPES,
    SHIPMODES,
    STATES,
    TELEMETRY_SPAN_MIN,
)
from repro.workload.queries import InPredicate, Query, RangePredicate


@dataclass(frozen=True)
class Template:
    """A named query family; ``make(rng)`` draws one instance's predicates."""

    tid: int
    name: str
    make: Callable[[np.random.Generator], tuple]

    def instantiate(self, g: np.random.Generator) -> Query:
        return Query(predicates=tuple(self.make(g)), template_id=self.tid)


def _day(g: np.random.Generator, margin: int = 400) -> int:
    return int(g.integers(0, DATE_SPAN - margin))


# ---------------------------------------------------------------------------
# TPC-H lite templates.
# ---------------------------------------------------------------------------

def _tpch_makers() -> list[tuple[str, Callable]]:
    return [
        # q1: pricing summary over shipdate <= D (large scan, upper tail).
        ("q1_shipdate_le", lambda g: (
            RangePredicate("l_shipdate", hi=int(g.integers(DATE_SPAN - 200, DATE_SPAN - 60))),
        )),
        # q3: shipping priority — segment + orderdate band + shipdate > D.
        ("q3_segment_dates", lambda g: (lambda d: (
            InPredicate("c_mktsegment", frozenset({str(g.choice(MKTSEGMENTS))})),
            RangePredicate("o_orderdate", lo=d, hi=d + 90),
            RangePredicate("l_shipdate", lo=d),
        ))(_day(g))),
        # q4: order priority check — orderdate in a quarter.
        ("q4_orderdate_qtr", lambda g: (lambda d: (
            RangePredicate("o_orderdate", lo=d, hi=d + 90),
        ))(_day(g))),
        # q5: local supplier volume — nation region + orderdate half-year.
        ("q5_nation_year", lambda g: (lambda d, r: (
            RangePredicate("c_nationkey", lo=r * 5, hi=r * 5 + 4),
            RangePredicate("o_orderdate", lo=d, hi=d + 180),
        ))(_day(g), int(g.integers(0, 5)))),
        # q6: forecast revenue — shipdate window + discount band + quantity cap.
        ("q6_ship_disc_qty", lambda g: (lambda d, disc: (
            RangePredicate("l_shipdate", lo=d, hi=d + 180),
            RangePredicate("l_discount", lo=disc, hi=disc + 0.02),
            RangePredicate("l_quantity", hi=float(g.integers(24, 26))),
        ))(_day(g), float(g.integers(2, 8)) / 100.0)),
        # q7: volume shipping — two specific nations + shipdate year.
        ("q7_nations_ship", lambda g: (lambda d, n1: (
            RangePredicate("c_nationkey", lo=n1, hi=n1 + 1),
            RangePredicate("l_shipdate", lo=d, hi=d + 365),
        ))(_day(g), int(g.integers(0, 24)))),
        # q8: market share — part type + orderdate year.
        ("q8_ptype_years", lambda g: (lambda d: (
            InPredicate("p_type", frozenset({str(g.choice(PTYPES))})),
            RangePredicate("o_orderdate", lo=d, hi=d + 365),
        ))(_day(g))),
        # q10: returned items — orderdate quarter + returnflag = R.
        ("q10_returns_qtr", lambda g: (lambda d: (
            RangePredicate("o_orderdate", lo=d, hi=d + 90),
            InPredicate("l_returnflag", frozenset({"R"})),
        ))(_day(g))),
        # q12: shipmode — two modes + receiptdate year.
        ("q12_shipmode", lambda g: (lambda d: (
            InPredicate("l_shipmode", frozenset(map(str, g.choice(SHIPMODES, 2, replace=False)))),
            RangePredicate("l_receiptdate", lo=d, hi=d + 365),
        ))(_day(g))),
        # q14: promo effect — shipdate month + part type.
        ("q14_promo_month", lambda g: (lambda d: (
            RangePredicate("l_shipdate", lo=d, hi=d + 30),
            InPredicate("p_type", frozenset({str(g.choice(PTYPES))})),
        ))(_day(g))),
        # q17: small-quantity-order revenue — brand + container + quantity cap.
        ("q17_brand_container", lambda g: (
            InPredicate("p_brand", frozenset({str(g.choice(BRANDS))})),
            InPredicate("p_container", frozenset({str(g.choice(CONTAINERS))})),
            RangePredicate("l_quantity", hi=float(g.integers(5, 15))),
        )),
        # q21: suppliers who kept orders waiting — status F + nation.
        ("q21_waiting", lambda g: (
            InPredicate("o_orderstatus", frozenset({"F"})),
            RangePredicate("c_nationkey", lo=(n := int(g.integers(0, 25))), hi=n),
        )),
        # extra receiptdate/priority template (13th, cf. the paper's 13).
        ("q_priority_receipt", lambda g: (lambda d: (
            InPredicate("o_orderpriority", frozenset({str(g.choice(PRIORITIES[:2]))})),
            RangePredicate("l_receiptdate", lo=d, hi=d + 180),
        ))(_day(g))),
    ]


# ---------------------------------------------------------------------------
# TPC-DS lite templates (17, mirroring the paper's store_sales template count).
# ---------------------------------------------------------------------------

def _tpcds_makers() -> list[tuple[str, Callable]]:
    def year(g):
        return int(g.integers(1992, 1998))

    return [
        ("q3_brand_year", lambda g: (
            InPredicate("i_brand", frozenset({f"brand#{int(g.integers(1, 51))}"})),
            RangePredicate("d_year", lo=(y := year(g)), hi=y),
        )),
        ("q7_demo_year", lambda g: (
            InPredicate("cd_gender", frozenset({str(g.choice(["M", "F"]))})),
            InPredicate("cd_marital_status", frozenset({str(g.choice(MARITALS))})),
            RangePredicate("d_year", lo=(y := year(g)), hi=y),
        )),
        ("q13_price_band", lambda g: (lambda lo: (
            RangePredicate("ss_sales_price", lo=lo, hi=lo + 50),
            InPredicate("cd_education", frozenset({str(g.choice(EDUCATIONS))})),
        ))(float(g.integers(0, 250)))),
        ("q19_cat_moy", lambda g: (
            InPredicate("i_category", frozenset({str(g.choice(CATEGORIES))})),
            RangePredicate("d_moy", lo=(m := int(g.integers(1, 13))), hi=m),
            RangePredicate("d_year", lo=(y := year(g)), hi=y),
        )),
        ("q27_state_year", lambda g: (
            InPredicate("s_state", frozenset(map(str, g.choice(STATES, 3, replace=False)))),
            RangePredicate("d_year", lo=(y := year(g)), hi=y),
        )),
        ("q28_qty_price", lambda g: (lambda q: (
            RangePredicate("ss_quantity", lo=q, hi=q + 20),
            RangePredicate("ss_sales_price", lo=float(g.integers(0, 150)), hi=float(g.integers(150, 310))),
        ))(int(g.integers(0, 81)))),
        ("q34_store_dep", lambda g: (
            InPredicate("s_store", frozenset({f"store_{int(g.integers(0, 20)):02d}"})),
            RangePredicate("hd_dep_count", lo=(d := int(g.integers(0, 8))), hi=d + 2),
        )),
        ("q36_cat_state", lambda g: (
            InPredicate("i_category", frozenset(map(str, g.choice(CATEGORIES, 2, replace=False)))),
            InPredicate("s_state", frozenset(map(str, g.choice(STATES, 2, replace=False)))),
        )),
        ("q46_store_date", lambda g: (lambda d: (
            InPredicate("s_store", frozenset({f"store_{int(g.integers(0, 20)):02d}"})),
            RangePredicate("ss_sold_date", lo=d, hi=d + 120),
        ))(_day(g))),
        ("q48_qty_marital", lambda g: (
            RangePredicate("ss_quantity", lo=(q := int(g.integers(0, 60))), hi=q + 40),
            InPredicate("cd_marital_status", frozenset({str(g.choice(MARITALS))})),
            InPredicate("ca_state", frozenset(map(str, g.choice(STATES, 3, replace=False)))),
        )),
        ("q53_brand_moy", lambda g: (
            InPredicate("i_brand", frozenset({f"brand#{int(g.integers(1, 51))}"})),
            RangePredicate("d_moy", lo=(m := int(g.integers(1, 10))), hi=m + 3),
        )),
        ("q68_date_range", lambda g: (lambda d: (
            RangePredicate("ss_sold_date", lo=d, hi=d + 60),
            RangePredicate("hd_dep_count", lo=0, hi=int(g.integers(2, 6))),
        ))(_day(g))),
        ("q79_store_profit", lambda g: (
            InPredicate("s_store", frozenset(map(str, [f"store_{k:02d}" for k in g.choice(20, 4, replace=False)]))),
            RangePredicate("ss_net_profit", lo=float(g.integers(0, 100))),
        )),
        ("q88_time_dep", lambda g: (lambda d: (
            RangePredicate("ss_sold_date", lo=d, hi=d + 365),
            RangePredicate("hd_dep_count", lo=(k := int(g.integers(0, 9))), hi=k + 1),
        ))(_day(g))),
        ("q89_cat_year", lambda g: (
            InPredicate("i_category", frozenset(map(str, g.choice(CATEGORIES, 3, replace=False)))),
            RangePredicate("d_year", lo=(y := year(g)), hi=y),
        )),
        ("q96_qty_store", lambda g: (
            RangePredicate("ss_quantity", lo=(q := int(g.integers(50, 90))), hi=q + 10),
            InPredicate("s_store", frozenset({f"store_{int(g.integers(0, 20)):02d}"})),
        )),
        ("q98_cat_date", lambda g: (lambda d: (
            InPredicate("i_category", frozenset({str(g.choice(CATEGORIES))})),
            RangePredicate("ss_sold_date", lo=d, hi=d + 30),
        ))(_day(g))),
    ]


# ---------------------------------------------------------------------------
# Telemetry templates (§VI-A2: time ranges from hours to months + collector
# and other operational filters).
# ---------------------------------------------------------------------------

def _telemetry_makers() -> list[tuple[str, Callable]]:
    span = TELEMETRY_SPAN_MIN

    def start(g, width):
        return int(g.integers(0, max(1, span - width)))

    HOURS6, DAY, WEEK, MONTH = 360, 1_440, 10_080, 43_200
    return [
        ("time_hours", lambda g: (lambda s: (
            RangePredicate("arrival_time", lo=s, hi=s + HOURS6),
        ))(start(g, HOURS6))),
        ("time_week", lambda g: (lambda s: (
            RangePredicate("arrival_time", lo=s, hi=s + WEEK),
        ))(start(g, WEEK))),
        ("collector_month", lambda g: (lambda s: (
            InPredicate("collector", frozenset({f"collector_{int(g.integers(0, 12)):03d}"})),
            RangePredicate("arrival_time", lo=s, hi=s + MONTH),
        ))(start(g, MONTH))),
        ("collector_only", lambda g: (
            InPredicate("collector", frozenset(
                {f"collector_{int(k):03d}" for k in g.choice(50, 2, replace=False)}
            )),
        )),
        ("failed_by_collector", lambda g: (
            InPredicate("status", frozenset({"FAILED", "TIMEOUT"})),
            InPredicate("collector", frozenset(
                {f"collector_{int(k):03d}" for k in g.choice(20, 3, replace=False)}
            )),
        )),
        ("team_jobs", lambda g: (
            InPredicate("team", frozenset({f"team_{int(g.integers(0, 30)):02d}"})),
            InPredicate("job_type", frozenset(map(str, g.choice(JOB_TYPES, 2, replace=False)))),
        )),
        ("slow_jobs", lambda g: (
            InPredicate("job_type", frozenset({str(g.choice(JOB_TYPES))})),
            RangePredicate("duration_ms", lo=float(g.integers(20_000, 120_000))),
        )),
        ("big_ingests", lambda g: (
            RangePredicate("rows_ingested", lo=float(g.integers(3_500_000, 4_800_000))),
            RangePredicate("payload_kb", lo=float(g.integers(500, 4_000))),
        )),
        ("payload_week", lambda g: (lambda s: (
            RangePredicate("payload_kb", lo=float(g.integers(2_000, 8_000))),
            RangePredicate("arrival_time", lo=s, hi=s + WEEK),
        ))(start(g, WEEK))),
    ]


def _build(makers: list[tuple[str, Callable]]) -> tuple[Template, ...]:
    return tuple(Template(tid=i, name=nm, make=mk) for i, (nm, mk) in enumerate(makers))


TPCH_TEMPLATES: tuple[Template, ...] = _build(_tpch_makers())
TPCDS_TEMPLATES: tuple[Template, ...] = _build(_tpcds_makers())
TELEMETRY_TEMPLATES: tuple[Template, ...] = _build(_telemetry_makers())

TEMPLATES: dict[str, tuple[Template, ...]] = {
    "tpch_lite": TPCH_TEMPLATES,
    "tpcds_lite": TPCDS_TEMPLATES,
    "telemetry": TELEMETRY_TEMPLATES,
}
