"""Entrypoint for Table II (γ / SW-vs-RS / Δ ablations, simulation).

Usage: python jobs/table2_ablation.py   (no Spark needed; logical costs)
Env: REPRO_FAST=1 for a smoke-scale run.
"""
from repro.experiments import table2_ablation


def main() -> None:
    results = table2_ablation.run()
    print(table2_ablation.format_table(results))


if __name__ == "__main__":
    main()
