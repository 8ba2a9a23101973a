"""End-to-end OREO simulation driver (paper Figure 1 workflow).

Ties the LAYOUT MANAGER and the REORGANIZER together over a query stream:

1. each query is shown to the layout manager, which may emit state
   add/remove events (new candidate layouts admitted, redundant ones
   pruned) that are forwarded to the reorganizer;
2. per-state service costs for the query are computed from partition
   metadata only and fed to the reorganizer, which updates its counters and
   possibly decides to reorganize (movement cost α);
3. the *paid* query cost honours the background-reorganization delay Δ:
   when a switch is decided at query t it only takes effect at query t+Δ —
   queries in between are still served on the outgoing layout, while the
   reorganization cost is charged at decision time (§VI-D5).

Costs follow the paper's logical model: service cost = fraction of data
accessed (∈[0,1]), movement cost = α full-scan equivalents.
"""
from __future__ import annotations

from collections import deque
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.core.layout_manager import CandidateGenerator, LayoutManager
from repro.core.mts import Reorganizer
from repro.layouts.fixed import build_fixed
from repro.layouts.metadata import MaterializedLayout, build_materialized
from repro.workload.datasets import DatasetSpec
from repro.workload.generator import Workload


@dataclass
class OreoResult:
    """Outcome of one simulated run (OREO or a baseline)."""

    method: str
    query_costs: np.ndarray  # paid service cost per query (delay-adjusted)
    reorg_cost: float  # total movement cost in full-scan units
    n_moves: int
    layout_per_query: list[str]  # layout each query was actually served on
    n_phases: int = 0
    n_states_max: int = 0  # peak size of the dynamic state space
    n_candidates: int = 0
    n_admitted: int = 0

    @property
    def query_cost(self) -> float:
        return float(self.query_costs.sum())

    @property
    def total_cost(self) -> float:
        return self.query_cost + self.reorg_cost


def default_layout(pdf: pd.DataFrame, spec: DatasetSpec, k: int) -> MaterializedLayout:
    """The workload-oblivious starting layout: range-partition by time/key."""
    lay = build_fixed(pdf, spec.default_sort_col, k)
    return build_materialized(
        pdf,
        lay.assign(pdf),
        name=lay.name,
        categorical_cols=spec.categorical_cols,
        layout=lay,
    )


class DelayedSwitcher:
    """Tracks which layout queries are *actually* served on under delay Δ."""

    def __init__(self, initial: str, delta: int) -> None:
        self.effective = initial
        self.delta = int(delta)
        self._pending: deque[tuple[int, str]] = deque()  # (t_effective, state)

    def decide(self, t: int, new_state: str) -> None:
        """A switch decided while processing query t first serves t+1+delta."""
        self._pending.append((t + 1 + self.delta, new_state))

    def at(self, t: int) -> str:
        while self._pending and self._pending[0][0] <= t:
            self.effective = self._pending.popleft()[1]
        return self.effective


def run_oreo(
    pdf: pd.DataFrame,
    spec: DatasetSpec,
    workload: Workload,
    *,
    alpha: float = 80.0,
    gamma: float = 1.0,
    epsilon: float = 0.08,
    window: int = 200,
    regen_every: int = 100,
    k: int | None = None,
    layout_kind: str = "qdtree",
    strategy: str = "sw",
    delta: int = 0,
    eval_sample_size: int = 50,
    max_states: int = 10,
    admit_mode: str = "replay",
    seed: int = 0,
) -> OreoResult:
    """Run OREO over ``workload`` on dataset ``pdf`` and return logical costs.

    Defaults mirror the paper's defaults: α=80, ε=0.08, γ=1, sliding window
    of 200 queries, Qd-tree layouts. ``k`` defaults to ~1 partition per
    1/50th of the data (the paper keeps partitions at 1–2M rows out of
    tens of millions, i.e. a few dozen partitions).

    ``admit_mode`` controls how states admitted mid-phase enter the
    reorganizer: ``"replay"`` pre-fills the new counter by replaying the
    current phase's queries on the new layout's metadata (§IV-C), letting
    it join the phase immediately; ``"median"`` initializes the counter to
    the median of active counters; ``"defer"`` is the strict Algorithm 4
    behaviour (state joins only at the next phase reset).
    """
    if admit_mode not in ("replay", "median", "defer"):
        raise ValueError(f"unknown admit_mode {admit_mode!r}")
    if k is None:
        k = max(8, min(64, len(pdf) // 1_000))
    init = default_layout(pdf, spec, k)
    gen = CandidateGenerator(
        pdf,
        spec,
        k=k,
        layout_kind=layout_kind,
        strategy=strategy,
        window=window,
        regen_every=regen_every,
        seed=seed,
    )
    manager = LayoutManager(
        gen,
        init,
        epsilon=epsilon,
        eval_sample_size=eval_sample_size,
        max_states=max_states,
        seed=seed,
    )
    reorg = Reorganizer(
        [init.name], alpha=alpha, gamma=gamma, stay_on_reset=True, seed=seed
    )
    switcher = DelayedSwitcher(reorg.current, delta)

    paid = np.zeros(len(workload))
    served_on: list[str] = []
    n_states_max = 1
    phase_queries: list = []  # queries of the current phase, for replay init
    last_phase = reorg.n_phases
    for t, q in enumerate(workload.queries):
        # The layout actually serving this query (honours the Δ delay).
        eff = switcher.at(t)
        paid[t] = manager.catalog[eff].cost(q)
        served_on.append(eff)

        for ev in manager.step(q, reorg.current):
            if ev.kind == "add":
                if admit_mode == "replay":
                    counter = float(ev.layout.cost_vector(phase_queries).sum())
                elif admit_mode == "median":
                    counter = reorg.median_counter()
                else:
                    counter = None
                reorg.add_state(ev.name, counter=counter)
            else:
                before = reorg.current
                reorg.remove_state(ev.name)
                if reorg.current != before:
                    switcher.decide(t, reorg.current)
        n_states_max = max(n_states_max, len(reorg.states))

        costs = {s: manager.catalog[s].cost(q) for s in reorg.states}
        before = reorg.current
        after = reorg.observe(costs)
        if after != before:
            switcher.decide(t, after)
        phase_queries.append(q)
        if reorg.n_phases != last_phase:
            last_phase = reorg.n_phases
            phase_queries = []

    return OreoResult(
        method="oreo",
        query_costs=paid,
        reorg_cost=reorg.total_move,
        n_moves=reorg.n_moves,
        layout_per_query=served_on,
        n_phases=reorg.n_phases,
        n_states_max=n_states_max,
        n_candidates=manager.n_generated,
        n_admitted=manager.n_admitted,
    )
