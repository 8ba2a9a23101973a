"""Regenerates the Figure-6 table: effect of the admission threshold ε."""
import pytest

from benchmarks.conftest import save_table
from repro.experiments import figure6_eps_sweep


@pytest.mark.benchmark(group="figure6")
def test_figure6_eps_sweep(benchmark, results_dir):
    rows = benchmark.pedantic(figure6_eps_sweep.run, rounds=1, iterations=1)
    save_table(results_dir, "figure6_eps_sweep", figure6_eps_sweep.format_table(rows))
    # Paper shape: larger ε shrinks the dynamic state space.
    assert rows[0]["n_states_max"] >= rows[-1]["n_states_max"]
