"""The LAYOUT MANAGER: on-the-fly layout generation + ε-admission (paper §V).

Split in two pieces so the online baselines can share candidates with OREO
exactly as in the paper ("the three online approaches utilize the same set
of data layout candidates computed periodically based on a sliding window
of recent queries", §VI-A3):

- :class:`CandidateGenerator` — every ``regen_every`` queries, builds a new
  candidate layout (Qd-tree or Z-order) from the current query sample
  (sliding window, reservoir, or both) on a small data sample, and
  materializes its partition metadata on the full dataset (the stats a real
  reorganization would produce in Parquet footers).
- :class:`LayoutManager` — Algorithm 5: feeds every query to the candidate
  generator and to an R-TBS evaluation reservoir; a new candidate is
  *admitted* to the dynamic state space only if the normalized L1 distance
  between its query-cost vector and that of every existing state (both
  evaluated on the R-TBS sample) is at least ε. When the state space
  exceeds ``max_states``, the non-current state closest to the remainder of
  the space is pruned (a state-removal query to the reorganizer).
"""
from __future__ import annotations

from collections import deque
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.core.rtbs import TimeBiasedReservoir
from repro.layouts.metadata import MaterializedLayout, build_materialized
from repro.layouts.qdtree import build_qdtree
from repro.layouts.zorder import build_zorder
from repro.workload.datasets import DatasetSpec
from repro.workload.queries import Query


@dataclass(frozen=True)
class StateEvent:
    """A state-management query issued to the REORGANIZER."""

    kind: str  # "add" | "remove"
    name: str
    layout: MaterializedLayout | None = None


class CandidateGenerator:
    """Periodic workload-aware layout candidates from recent queries."""

    def __init__(
        self,
        pdf: pd.DataFrame,
        spec: DatasetSpec,
        *,
        k: int,
        layout_kind: str = "qdtree",
        strategy: str = "sw",
        window: int = 200,
        regen_every: int = 100,
        build_sample_rows: int = 4_000,
        seed: int = 0,
    ) -> None:
        if layout_kind not in ("qdtree", "zorder"):
            raise ValueError(f"unknown layout kind {layout_kind!r}")
        if strategy not in ("sw", "rs", "sw+rs"):
            raise ValueError(f"unknown strategy {strategy!r}")
        self.pdf = pdf
        self.spec = spec
        self.k = k
        self.layout_kind = layout_kind
        self.strategy = strategy
        self.window: deque[Query] = deque(maxlen=window)
        self.regen_every = regen_every
        # Candidate-generation reservoir (uniform, lam=0) for the RS strategy.
        self._gen_reservoir = TimeBiasedReservoir(size=window, lam=0.0, seed=seed + 1)
        self.t = 0
        self._seed = seed
        # Data sample for layout construction (paper: 0.1%–1% of the data).
        n = min(len(pdf), build_sample_rows)
        self.sample = pdf.sample(n=n, random_state=seed).reset_index(drop=True)

    def _build(self, queries: list[Query], tag: str) -> MaterializedLayout:
        name = f"{self.layout_kind}:{tag}@{self.t}"
        if self.layout_kind == "qdtree":
            lay = build_qdtree(
                self.sample,
                queries,
                self.k,
                categorical_cols=self.spec.categorical_cols,
                name=name,
                seed=self._seed,
            )
        else:
            lay = build_zorder(
                self.sample,
                queries,
                self.k,
                categorical_cols=self.spec.categorical_cols,
                name=name,
            )
        return build_materialized(
            self.pdf,
            lay.assign(self.pdf),
            name=name,
            categorical_cols=self.spec.categorical_cols,
            layout=lay,
        )

    def step(self, q: Query) -> list[MaterializedLayout]:
        """Observe one query; return newly generated candidates (often none)."""
        self.window.append(q)
        self._gen_reservoir.add(q)
        self.t += 1
        # Wait for at least half a window of history before generating.
        if self.t % self.regen_every != 0 or self.t < max(self.window.maxlen // 2, 1):
            return []
        out = []
        if self.strategy in ("sw", "sw+rs"):
            out.append(self._build(list(self.window), "sw"))
        if self.strategy in ("rs", "sw+rs"):
            out.append(self._build(self._gen_reservoir.sample(), "rs"))
        return out


class LayoutManager:
    """Algorithm 5: admit diverse candidates into the dynamic state space."""

    def __init__(
        self,
        generator: CandidateGenerator,
        initial: MaterializedLayout,
        *,
        epsilon: float = 0.08,
        eval_sample_size: int = 50,
        rtbs_lam: float = 0.01,
        max_states: int = 10,
        seed: int = 0,
    ) -> None:
        if not (0.0 <= epsilon <= 1.0):
            raise ValueError("epsilon must be in [0, 1]")
        self.gen = generator
        self.epsilon = epsilon
        self.max_states = max_states
        self.eval_reservoir: TimeBiasedReservoir[Query] = TimeBiasedReservoir(
            size=eval_sample_size, lam=rtbs_lam, seed=seed + 2
        )
        # catalog: every layout ever admitted (metadata is tiny; kept so the
        # driver can keep serving on a layout during the background-reorg
        # delay even after it left the state space).
        self.catalog: dict[str, MaterializedLayout] = {initial.name: initial}
        # The current dynamic state space (subset of catalog keys).
        self.space: list[str] = [initial.name]
        self.n_generated = 0
        self.n_admitted = 0

    @staticmethod
    def distance(ci: np.ndarray, cj: np.ndarray) -> float:
        """Normalized L1 distance between two query-cost vectors (§V-B)."""
        if len(ci) == 0:
            return 1.0
        return float(np.mean(np.abs(ci - cj)))

    def step(self, q: Query, current_state: str) -> list[StateEvent]:
        """Observe one query; emit add/remove state-management events."""
        self.eval_reservoir.add(q)
        events: list[StateEvent] = []
        for cand in self.gen.step(q):
            self.n_generated += 1
            sample = self.eval_reservoir.sample()
            cv = cand.cost_vector(sample)
            dists = [
                self.distance(cv, self.catalog[s].cost_vector(sample))
                for s in self.space
            ]
            if min(dists, default=1.0) >= self.epsilon:
                self.n_admitted += 1
                self.catalog[cand.name] = cand
                self.space.append(cand.name)
                events.append(StateEvent("add", cand.name, cand))
                events.extend(self._prune(current_state, sample))
        return events

    def _prune(self, current_state: str, sample: list[Query]) -> list[StateEvent]:
        """Remove the most redundant non-current state when over budget."""
        events: list[StateEvent] = []
        while len(self.space) > self.max_states:
            vecs = {s: self.catalog[s].cost_vector(sample) for s in self.space}
            victims = [s for s in self.space if s != current_state]
            # Redundancy of s = distance to its nearest neighbour in the space.
            def nearest(s: str) -> float:
                return min(
                    self.distance(vecs[s], vecs[o]) for o in self.space if o != s
                )

            victim = min(victims, key=lambda s: (nearest(s), s))
            self.space.remove(victim)
            events.append(StateEvent("remove", victim))
        return events
