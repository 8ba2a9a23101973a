"""Reorganization baselines and offline oracles (paper §VI-A3, §VI-C).

Online baselines (no workload knowledge, same candidate layouts as OREO):
``greedy`` switches to any better window-evaluated layout ignoring α;
``regret`` switches when retroactive cumulative savings exceed α.

Offline references: ``static`` builds one layout for the whole workload;
``optimal`` holds the true DP optimum over a fixed state space, the
template-switching Offline Optimal, and the fixed-state MTS Optimal.
"""
from repro.baselines.optimal import offline_opt_dp  # noqa: F401
