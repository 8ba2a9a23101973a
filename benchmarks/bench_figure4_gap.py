"""Regenerates the Figure-4 table: OREO vs MTS Optimal vs Offline Optimal."""
import pytest

from benchmarks.conftest import save_table
from repro.experiments import figure4_gap


@pytest.mark.benchmark(group="figure4")
def test_figure4_gap(benchmark, results_dir):
    rows = benchmark.pedantic(figure4_gap.run, rounds=1, iterations=1)
    gaps = figure4_gap.gaps(rows)
    text = figure4_gap.format_table(rows) + "\n\n" + "\n".join(
        f"{g['dataset']}: query cost {g['vs_mts_optimal_pct']:+.1f}% vs MTS Optimal, "
        f"{g['vs_offline_optimal_pct']:+.1f}% vs Offline Optimal; moves "
        f"oreo={g['moves_oreo']} mts={g['moves_mts_optimal']} offline={g['moves_offline']}"
        for g in gaps
    )
    save_table(results_dir, "figure4_gap", text)
    # Paper shape: the clairvoyant oracle has the lowest query cost.
    for g in gaps:
        assert g["vs_offline_optimal_pct"] > 0
