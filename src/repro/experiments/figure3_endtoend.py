"""Figure 3 (as a table): total query + reorganization cost per method.

Paper: end-to-end Spark seconds for Static / Greedy / Regret / OREO with
Qd-tree and Z-order layouts on TPC-H, TPC-DS, Telemetry; headline result is
OREO beating the static optimized layout by up to 32% in total compute.

We reproduce the full grid in the logical cost model at the paper's stream
length (30K queries, 20 segments), then convert logical costs to seconds
with the measured unit times from Table I (logical model: query cost is in
full-scan units, one reorganization costs α scans — so
``seconds = query_cost × t_scan + n_moves × t_reorg``). The direct
end-to-end Spark validation of the cost model itself lives in
``tests/test_cost_model_validation.py`` and Table I.
"""
from __future__ import annotations

from repro.baselines.runners import run_greedy, run_regret, run_static
from repro.core.oreo import run_oreo
from repro.experiments.common import (
    ALPHA,
    DATASETS,
    K_PARTITIONS,
    N_QUERIES_HEADLINE,
    make_setup,
    markdown_table,
    mean_over_seeds,
)

LAYOUT_KINDS = ("qdtree", "zorder")
METHODS = ("static", "greedy", "regret", "oreo")


def run(n_queries: int = N_QUERIES_HEADLINE, datasets=DATASETS, layout_kinds=LAYOUT_KINDS) -> list[dict]:
    rows = []
    for d in datasets:
        su = make_setup(d, n_queries=n_queries)
        for kind in layout_kinds:
            kw = dict(k=K_PARTITIONS, layout_kind=kind)
            per_method = {}
            s = run_static(su.pdf, su.spec, su.workload, seed=0, **kw)
            per_method["static"] = {
                "query_cost": s.query_cost, "reorg_cost": 0.0,
                "total_cost": s.total_cost, "n_moves": 0,
            }
            g = run_greedy(su.pdf, su.spec, su.workload, alpha=ALPHA, seed=0, **kw)
            per_method["greedy"] = {
                "query_cost": g.query_cost, "reorg_cost": g.reorg_cost,
                "total_cost": g.total_cost, "n_moves": g.n_moves,
            }
            r = run_regret(su.pdf, su.spec, su.workload, alpha=ALPHA, seed=0, **kw)
            per_method["regret"] = {
                "query_cost": r.query_cost, "reorg_cost": r.reorg_cost,
                "total_cost": r.total_cost, "n_moves": r.n_moves,
            }
            per_method["oreo"] = mean_over_seeds(
                lambda seed: run_oreo(
                    su.pdf, su.spec, su.workload, alpha=ALPHA, seed=seed, **kw
                )
            )
            for m in METHODS:
                rows.append({"dataset": d, "layout": kind, "method": m, **per_method[m]})
    return rows


def improvement_vs_static(rows: list[dict]) -> list[dict]:
    """OREO's total-cost improvement over Static per (dataset, layout)."""
    out = []
    by_key = {(r["dataset"], r["layout"], r["method"]): r for r in rows}
    for (d, kind, m), r in by_key.items():
        if m != "oreo":
            continue
        s = by_key[(d, kind, "static")]
        out.append(
            {
                "dataset": d,
                "layout": kind,
                "improvement_pct": round(
                    (s["total_cost"] - r["total_cost"]) / s["total_cost"] * 100, 1
                ),
            }
        )
    return out


def to_seconds(rows: list[dict], *, t_scan: float, t_reorg: float) -> list[dict]:
    """Convert logical costs to end-to-end seconds via Table I unit times."""
    out = []
    for r in rows:
        out.append(
            {
                **r,
                "query_s": round(r["query_cost"] * t_scan, 1),
                "reorg_s": round(r["n_moves"] * t_reorg, 1),
                "total_s": round(r["query_cost"] * t_scan + r["n_moves"] * t_reorg, 1),
            }
        )
    return out


def format_table(rows: list[dict]) -> str:
    header = ["dataset", "layout", "method", "query", "reorg", "total", "moves"]
    body = [
        [
            r["dataset"], r["layout"], r["method"],
            f"{r['query_cost']:.0f}", f"{r['reorg_cost']:.0f}",
            f"{r['total_cost']:.0f}", f"{r['n_moves']:.0f}",
        ]
        for r in rows
    ]
    return markdown_table(header, body)
