"""Regenerates Table II: γ / SW-vs-RS / Δ ablations (logical costs)."""
import pytest

from benchmarks.conftest import save_table
from repro.experiments import table2_ablation


@pytest.mark.benchmark(group="table2")
def test_table2_ablation(benchmark, results_dir):
    results = benchmark.pedantic(table2_ablation.run, rounds=1, iterations=1)
    save_table(results_dir, "table2_ablation", table2_ablation.format_table(results))
    base = results["default (γ=1, SW, Δ=0)"]
    # Guaranteed invariant: Δ is charged at decision time, reorg unchanged.
    for d, v in results["Δ=80"].items():
        assert v["reorg_cost"] == pytest.approx(base[d]["reorg_cost"])
    # Paper shape (in expectation at full scale): Δ=80 raises query cost on
    # average across datasets; small tolerance for seed noise.
    import numpy as np
    deltas = [
        results["Δ=80"][d]["query_cost"] / base[d]["query_cost"] - 1
        for d in results["Δ=80"]
    ]
    assert float(np.mean(deltas)) > -0.02
