"""Experiment harnesses, one per table of the paper's evaluation section.

Each module exposes a ``run(...)`` returning plain dict/row data and a
``format_table(rows)`` producing the printable table; ``jobs/`` wraps them
for spark-submit and ``benchmarks/`` wraps them for pytest-benchmark.
Scales are container-sized; see DESIGN.md §3 for the substitutions and
EXPERIMENTS.md for paper-vs-measured numbers.
"""
