"""Baseline reorganization strategies (paper §VI-A3) and oracles (§VI-C).

All online methods consume the *same* candidate layout stream as OREO
(a :class:`~repro.core.layout_manager.CandidateGenerator` with identical
parameters), differing only in the switching policy:

- **Static** — offline: builds one layout from the *entire* workload and
  never reorganizes (the paper's main comparison point).
- **Greedy** — switches to any new candidate whose mean cost over the
  sliding window beats the current layout, ignoring α.
- **Regret** — tracks, for each candidate, the cumulative query-cost saving
  it would have had retroactively over queries serviced on the current
  layout; switches once the best saving exceeds α (inspired by TASM [23]).
- **MTS Optimal** — OREO's reorganizer on a *fixed*, precomputed state
  space holding the best layout per query template.
- **Offline Optimal** — knows the workload; switches to each segment's best
  layout exactly at the template boundary.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.baselines.optimal import offline_optimal_schedule, schedule_cost
from repro.core.layout_manager import CandidateGenerator
from repro.core.mts import Reorganizer
from repro.core.oreo import DelayedSwitcher, OreoResult, default_layout
from repro.layouts.metadata import MaterializedLayout, build_materialized
from repro.layouts.qdtree import build_qdtree
from repro.layouts.zorder import build_zorder
from repro.workload.datasets import DatasetSpec
from repro.workload.generator import Workload
from repro.workload.queries import Query


def _materialize(pdf, spec, layout) -> MaterializedLayout:
    return build_materialized(
        pdf,
        layout.assign(pdf),
        name=layout.name,
        categorical_cols=spec.categorical_cols,
        layout=layout,
    )


def build_workload_layout(
    pdf: pd.DataFrame,
    spec: DatasetSpec,
    queries,
    k: int,
    *,
    layout_kind: str = "qdtree",
    name: str,
    build_sample_rows: int = 4_000,
    seed: int = 0,
) -> MaterializedLayout:
    """Build + materialize one workload-aware layout from ``queries``."""
    n = min(len(pdf), build_sample_rows)
    sample = pdf.sample(n=n, random_state=seed).reset_index(drop=True)
    if layout_kind == "qdtree":
        lay = build_qdtree(
            sample, queries, k, categorical_cols=spec.categorical_cols, name=name, seed=seed
        )
    elif layout_kind == "zorder":
        lay = build_zorder(
            sample, queries, k, categorical_cols=spec.categorical_cols, name=name
        )
    else:
        raise ValueError(f"unknown layout kind {layout_kind!r}")
    return _materialize(pdf, spec, lay)


def run_static(
    pdf: pd.DataFrame,
    spec: DatasetSpec,
    workload: Workload,
    *,
    k: int,
    layout_kind: str = "qdtree",
    seed: int = 0,
) -> OreoResult:
    """Offline single layout optimized for the whole workload; no reorgs."""
    mat = build_workload_layout(
        pdf, spec, workload.queries, k, layout_kind=layout_kind,
        name=f"static:{layout_kind}", seed=seed,
    )
    paid = mat.cost_vector(workload.queries)
    return OreoResult(
        method=f"static:{layout_kind}",
        query_costs=paid,
        reorg_cost=0.0,
        n_moves=0,
        layout_per_query=[mat.name] * len(workload),
    )


def _run_candidate_policy(
    pdf, spec, workload, *, policy: str, alpha: float, k: int,
    layout_kind: str, window: int, regen_every: int, delta: int, seed: int,
) -> OreoResult:
    """Shared driver for Greedy and Regret over the common candidate stream."""
    init = default_layout(pdf, spec, k)
    gen = CandidateGenerator(
        pdf, spec, k=k, layout_kind=layout_kind, strategy="sw",
        window=window, regen_every=regen_every, seed=seed,
    )
    catalog: dict[str, MaterializedLayout] = {init.name: init}
    current = init.name
    switcher = DelayedSwitcher(current, delta)
    # Regret bookkeeping: cumulative saving of each alternative vs current,
    # reset on every switch. Bounded to the most recent candidates — older
    # window layouts are superseded by newer ones for the same workload.
    savings: dict[str, float] = {}
    max_alts = 8

    paid = np.zeros(len(workload))
    served_on: list[str] = []
    n_moves = 0
    for t, q in enumerate(workload.queries):
        eff = switcher.at(t)
        paid[t] = catalog[eff].cost(q)
        served_on.append(eff)

        if policy == "regret":
            cur_cost = catalog[current].cost(q)
            for alt in savings:
                savings[alt] += cur_cost - catalog[alt].cost(q)

        for cand in gen.step(q):
            catalog[cand.name] = cand
            if policy == "regret":
                savings[cand.name] = 0.0
                while len(savings) > max_alts:
                    savings.pop(next(iter(savings)))

            if policy == "greedy":
                wq = list(gen.window)
                if cand.cost_vector(wq).mean() < catalog[current].cost_vector(wq).mean():
                    current = cand.name
                    n_moves += 1
                    switcher.decide(t, current)
                    savings = {s: 0.0 for s in savings}
        if policy == "regret" and savings:
            best = max(savings, key=lambda s: (savings[s], s))
            if best != current and savings[best] > alpha:
                current = best
                n_moves += 1
                switcher.decide(t, current)
                savings = {s: 0.0 for s in savings}

    return OreoResult(
        method=f"{policy}:{layout_kind}",
        query_costs=paid,
        reorg_cost=n_moves * alpha,
        n_moves=n_moves,
        layout_per_query=served_on,
        n_candidates=len(catalog) - 1,
    )


def run_greedy(pdf, spec, workload, *, alpha: float = 80.0, k: int,
               layout_kind: str = "qdtree", window: int = 200,
               regen_every: int = 100, delta: int = 0, seed: int = 0) -> OreoResult:
    """Greedy baseline: always chase the better window layout (§VI-A3)."""
    return _run_candidate_policy(
        pdf, spec, workload, policy="greedy", alpha=alpha, k=k,
        layout_kind=layout_kind, window=window, regen_every=regen_every,
        delta=delta, seed=seed,
    )


def run_regret(pdf, spec, workload, *, alpha: float = 80.0, k: int,
               layout_kind: str = "qdtree", window: int = 200,
               regen_every: int = 100, delta: int = 0, seed: int = 0) -> OreoResult:
    """Regret baseline: switch when retroactive savings exceed α (§VI-A3)."""
    return _run_candidate_policy(
        pdf, spec, workload, policy="regret", alpha=alpha, k=k,
        layout_kind=layout_kind, window=window, regen_every=regen_every,
        delta=delta, seed=seed,
    )


def per_template_layouts(
    pdf: pd.DataFrame,
    spec: DatasetSpec,
    workload: Workload,
    k: int,
    *,
    layout_kind: str = "qdtree",
    seed: int = 0,
) -> dict[int, MaterializedLayout]:
    """Best precomputed layout per query template appearing in the workload."""
    by_tid: dict[int, list[Query]] = {}
    for q in workload.queries:
        by_tid.setdefault(q.template_id, []).append(q)
    return {
        tid: build_workload_layout(
            pdf, spec, qs, k, layout_kind=layout_kind,
            name=f"tmpl{tid}:{layout_kind}", seed=seed,
        )
        for tid, qs in sorted(by_tid.items())
    }


def run_mts_optimal(
    pdf: pd.DataFrame,
    spec: DatasetSpec,
    workload: Workload,
    *,
    alpha: float = 80.0,
    gamma: float = 1.0,
    k: int,
    layout_kind: str = "qdtree",
    seed: int = 0,
    layouts: dict[int, MaterializedLayout] | None = None,
) -> OreoResult:
    """OREO's MTS algorithm on a fixed, workload-informed state space (§VI-C)."""
    layouts = layouts or per_template_layouts(
        pdf, spec, workload, k, layout_kind=layout_kind, seed=seed
    )
    catalog = {m.name: m for m in layouts.values()}
    reorg = Reorganizer(sorted(catalog), alpha=alpha, gamma=gamma, seed=seed)
    paid = np.zeros(len(workload))
    served_on: list[str] = []
    for t, q in enumerate(workload.queries):
        served = reorg.current
        paid[t] = catalog[served].cost(q)
        served_on.append(served)
        reorg.observe({s: catalog[s].cost(q) for s in reorg.states})
    return OreoResult(
        method=f"mts_optimal:{layout_kind}",
        query_costs=paid,
        reorg_cost=reorg.total_move,
        n_moves=reorg.n_moves,
        layout_per_query=served_on,
        n_phases=reorg.n_phases,
        n_states_max=len(catalog),
    )


def run_offline_optimal(
    pdf: pd.DataFrame,
    spec: DatasetSpec,
    workload: Workload,
    *,
    alpha: float = 80.0,
    k: int,
    layout_kind: str = "qdtree",
    seed: int = 0,
    layouts: dict[int, MaterializedLayout] | None = None,
) -> OreoResult:
    """Clairvoyant oracle: best per-template layout at every boundary (§VI-C)."""
    layouts = layouts or per_template_layouts(
        pdf, spec, workload, k, layout_kind=layout_kind, seed=seed
    )
    names = sorted(m.name for m in layouts.values())
    idx = {n: i for i, n in enumerate(names)}
    catalog = {m.name: m for m in layouts.values()}
    cost_mat = np.stack(
        [catalog[n].cost_vector(workload.queries) for n in names], axis=1
    )
    seg_best = [
        idx[layouts[tid].name] for tid in workload.segment_templates
    ]
    sched = offline_optimal_schedule(
        workload.segment_starts, seg_best, len(workload)
    )
    service, move, n_moves = schedule_cost(cost_mat, sched, alpha)
    return OreoResult(
        method=f"offline_optimal:{layout_kind}",
        query_costs=cost_mat[np.arange(len(sched)), sched],
        reorg_cost=move,
        n_moves=n_moves,
        layout_per_query=[names[s] for s in sched],
        n_states_max=len(names),
    )
