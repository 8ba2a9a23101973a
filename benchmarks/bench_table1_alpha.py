"""Regenerates Table I: α (reorg/scan cost ratio) vs Parquet file size."""
import pytest

from benchmarks.conftest import save_table
from repro.experiments import table1_alpha


@pytest.mark.benchmark(group="table1")
def test_table1_alpha(benchmark, spark, tmp_path, results_dir):
    rows = benchmark.pedantic(
        lambda: table1_alpha.run(workdir=str(tmp_path), spark=spark),
        rounds=1,
        iterations=1,
    )
    text = table1_alpha.format_table(rows)
    save_table(results_dir, "table1_alpha", text)
    # Sanity: reorganization must be far costlier than a scan at every size.
    for r in rows:
        assert r["alpha"] > 5, r
