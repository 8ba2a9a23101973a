"""Regenerates the Figure-5 table: effect of reorganization cost α."""
import pytest

from benchmarks.conftest import save_table
from repro.experiments import figure5_alpha_sweep


@pytest.mark.benchmark(group="figure5")
def test_figure5_alpha_sweep(benchmark, results_dir):
    rows = benchmark.pedantic(figure5_alpha_sweep.run, rounds=1, iterations=1)
    save_table(results_dir, "figure5_alpha_sweep", figure5_alpha_sweep.format_table(rows))
    # Paper shape: layout changes decrease as reorganization gets pricier.
    assert rows[0]["n_moves"] > rows[-1]["n_moves"]
