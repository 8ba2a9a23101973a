"""The REORGANIZER: D-UMTS online algorithm (paper §IV, Algorithms 1–4).

This is the paper's main algorithmic contribution. It extends the classic
randomized algorithm of Borodin, Linial and Saks (BLS) for uniform metrical
task systems:

- Each state (data layout) carries a *counter* that accumulates the service
  cost it would have incurred on every query of the current phase. A state
  whose counter reaches α is "full" and leaves the active set.
- When the current state fills, the algorithm pays the movement cost α and
  jumps to a random non-full state. When every counter is full the phase
  ends: counters reset to 0 and the active set is rebuilt from the *current*
  total state set.
- **Dynamic states (Algorithm 4):** a state added mid-phase is deferred to
  the next phase (the phase behaves as if no addition happened). A state
  removed mid-phase has its counter forced to α; if the removed state is the
  current one, the algorithm transitions as if its counter filled; if no
  active state remains, a new phase starts immediately.
- **Stay-on-reset (§IV-A):** at a phase reset the algorithm keeps its
  current state instead of paying α for the forced initial random move —
  empirically important, asymptotically free.
- **Predictor-biased transitions (§IV-C):** instead of a uniform jump, each
  active state gets weight ∝ (average fraction of data skipped in the last
  phase)^γ; γ=0 recovers the uniform distribution. States with no history
  get the median weight, per the paper.

The reorganizer is deliberately decoupled from layout generation: states are
opaque string keys and service costs arrive from the caller, so the same
class drives simulations, the Spark end-to-end harness, and the pure-MTS
unit tests against the DP optimum.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


@dataclass
class Move:
    """One reorganization decision: at query ``t`` switch ``src`` → ``dst``."""

    t: int
    src: str
    dst: str
    # True when the move was forced by deletion of the current state.
    forced_by_delete: bool = False


class Reorganizer:
    """Online D-UMTS decision maker over an evolving set of layout states."""

    def __init__(
        self,
        initial_states,
        *,
        alpha: float,
        gamma: float = 1.0,
        stay_on_reset: bool = True,
        seed: int = 0,
    ) -> None:
        states = list(dict.fromkeys(initial_states))
        if not states:
            raise ValueError("need at least one initial state")
        if alpha <= 1:
            raise ValueError("alpha must exceed 1 (reorg costlier than a scan)")
        self.alpha = float(alpha)
        self.gamma = float(gamma)
        self.stay_on_reset = stay_on_reset
        self._rng = np.random.default_rng(seed)

        self.states: set[str] = set(states)
        self.active: set[str] = set(states)
        self.counters: dict[str, float] = {s: 0.0 for s in states}
        # Exact per-phase service cost and length, for the γ predictor.
        self._phase_cost: dict[str, float] = {s: 0.0 for s in states}
        self._phase_len: int = 0
        self._last_phase_skip: dict[str, float] = {}

        self.current: str = str(self._rng.choice(sorted(self.states)))
        self.t: int = 0  # queries observed so far
        self.n_phases: int = 1
        self.moves: list[Move] = []
        self.total_service: float = 0.0
        self.total_move: float = 0.0
        self.history: list[str] = [self.current]  # state before each query

    # -- state management queries (the "dynamic" in D-UMTS) -----------------

    def add_state(self, s: str, counter: float | None = None) -> None:
        """Add ``s`` to S.

        With ``counter=None`` the addition is *deferred* exactly as in
        Algorithm 4: the state joins the active set only at the next phase
        reset. With a ``counter`` value, the paper's practical variant
        (§IV-C) is used instead: the state joins the *current* phase with
        its counter pre-filled — either by replaying the phase's queries on
        the new layout or with the median of existing counters, both
        computed by the caller. A pre-filled counter ≥ α joins full.
        """
        if s in self.states:
            return
        self.states.add(s)
        if counter is not None:
            c = float(counter)
            self.counters[s] = c
            self._phase_cost[s] = c
            if c < self.alpha:
                self.active.add(s)

    def median_counter(self) -> float:
        """Median of the active states' counters (the §IV-C fallback init)."""
        vals = [self.counters[s] for s in self.active] or [0.0]
        return float(np.median(vals))

    def remove_state(self, s: str) -> None:
        """Remove ``s`` from S per Algorithm 4 lines 5–11."""
        if s not in self.states:
            return
        if len(self.states) == 1:
            raise ValueError("cannot remove the last remaining state")
        self.states.discard(s)
        self.active.discard(s)
        self.counters[s] = self.alpha  # mark unswitchable for this phase
        if not self.active:
            self._reset_phase()
        if s == self.current:
            # Forced reorganization away from a deleted layout: movement cost.
            dst = self._draw_next()
            self.moves.append(Move(self.t, s, dst, forced_by_delete=True))
            self.total_move += self.alpha
            self.current = dst

    # -- query processing ---------------------------------------------------

    def observe(self, costs: dict[str, float]) -> str:
        """Process one query with per-state service costs ``costs``.

        Pays the service cost of the *current* state, updates every active
        counter (Algorithm 3), and transitions if the current counter fills.
        Returns the state the system is in after the query (the layout the
        next query will be served on).
        """
        served = self.current
        c = costs.get(served)
        if c is None:
            raise KeyError(f"no cost provided for current state {served!r}")
        self.total_service += float(c)

        for s in list(self.active):
            cs = costs.get(s)
            if cs is None:
                raise KeyError(f"no cost provided for active state {s!r}")
            if not (0.0 <= cs <= 1.0):
                raise ValueError(f"service cost must be in [0,1], got {cs}")
            self.counters[s] += float(cs)
            self._phase_cost[s] = self._phase_cost.get(s, 0.0) + float(cs)
        self._phase_len += 1
        self.active = {s for s in self.active if self.counters[s] < self.alpha}

        if served not in self.active:
            if not self.active:
                self._reset_phase()
                if self.stay_on_reset:
                    # Keep the current layout: no movement cost (§IV-A).
                    pass
                else:
                    dst = self._draw_next()
                    if dst != served:
                        self.moves.append(Move(self.t, served, dst))
                        self.total_move += self.alpha
                        self.current = dst
            else:
                dst = self._draw_next()
                self.moves.append(Move(self.t, served, dst))
                self.total_move += self.alpha
                self.current = dst

        self.t += 1
        self.history.append(self.current)
        return self.current

    # -- totals -------------------------------------------------------------

    @property
    def total_cost(self) -> float:
        return self.total_service + self.total_move

    @property
    def n_moves(self) -> int:
        return len(self.moves)

    # -- internals ----------------------------------------------------------

    def _reset_phase(self) -> None:
        """End the phase: record performance, reset counters, rebuild S_A."""
        if self._phase_len > 0:
            self._last_phase_skip = {
                s: 1.0 - self._phase_cost.get(s, 0.0) / self._phase_len
                for s in self.states
                if s in self._phase_cost
            }
        self.counters = {s: 0.0 for s in self.states}
        self.active = set(self.states)
        self._phase_cost = {s: 0.0 for s in self.states}
        self._phase_len = 0
        self.n_phases += 1

    def _weights(self, candidates: list[str]) -> np.ndarray:
        """Transition weights w_s^γ from last-phase skip fractions (§IV-C)."""
        if self.gamma == 0.0 or not self._last_phase_skip:
            return np.ones(len(candidates))
        known = [v for v in self._last_phase_skip.values() if v is not None]
        med = float(np.median(known)) if known else 1.0
        w = np.array(
            [max(1e-6, self._last_phase_skip.get(s, med)) for s in candidates]
        )
        return w**self.gamma

    def _draw_next(self) -> str:
        cands = sorted(self.active)
        if not cands:  # pragma: no cover - guarded by callers
            raise RuntimeError("no active state to transition to")
        w = self._weights(cands)
        p = w / w.sum()
        return str(self._rng.choice(cands, p=p))
