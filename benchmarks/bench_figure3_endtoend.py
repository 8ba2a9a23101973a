"""Regenerates the Figure-3 table: Static/Greedy/Regret/OREO comparison."""
import pytest

from benchmarks.conftest import save_table
from repro.experiments import figure3_endtoend


@pytest.mark.benchmark(group="figure3")
def test_figure3_method_comparison(benchmark, results_dir):
    rows = benchmark.pedantic(figure3_endtoend.run, rounds=1, iterations=1)
    text = figure3_endtoend.format_table(rows)
    imps = figure3_endtoend.improvement_vs_static(rows)
    text += "\n\n" + "\n".join(
        f"OREO vs static [{i['dataset']}/{i['layout']}]: {i['improvement_pct']:+.1f}%"
        for i in imps
    )
    save_table(results_dir, "figure3_endtoend", text)
    # Headline shape: with Qd-tree layouts, OREO beats the static layout.
    qd = [i for i in imps if i["layout"] == "qdtree"]
    assert max(i["improvement_pct"] for i in qd) > 0
