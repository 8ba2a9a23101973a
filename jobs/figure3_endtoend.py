"""Entrypoint for the Figure-3 table (method comparison, all datasets).

Usage: python jobs/figure3_endtoend.py
Env: REPRO_FAST=1 for a smoke-scale run. To convert logical costs into
end-to-end seconds, run jobs/table1_alpha.py first and use
``figure3_endtoend.to_seconds`` with the measured unit times.
"""
from repro.experiments import figure3_endtoend


def main() -> None:
    rows = figure3_endtoend.run()
    print(figure3_endtoend.format_table(rows))
    print()
    for imp in figure3_endtoend.improvement_vs_static(rows):
        print(
            f"OREO vs static [{imp['dataset']}/{imp['layout']}]: "
            f"{imp['improvement_pct']:+.1f}% total cost"
        )


if __name__ == "__main__":
    main()
