"""OREO core: the paper's contribution.

- ``mts`` — the REORGANIZER: BLS uniform-MTS counters extended to dynamic
  state spaces (D-UMTS, Algorithms 1–4) with the stay-on-reset and
  γ-biased-transition optimizations.
- ``rtbs`` — reservoir-based time-biased query sampling (R-TBS, ref [21]).
- ``layout_manager`` — the LAYOUT MANAGER (Algorithm 5): candidate layout
  generation from sliding windows / reservoir samples and ε-distance
  admission into the dynamic state space.
- ``oreo`` — the end-to-end simulation driver tying both together over a
  query stream, with the background-reorganization delay Δ.
"""
from repro.core.mts import Reorganizer  # noqa: F401
from repro.core.oreo import OreoResult, run_oreo  # noqa: F401
