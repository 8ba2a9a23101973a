"""Benchmark helpers: persist each regenerated table under results/."""
import os
import pathlib

import pytest

RESULTS_DIR = pathlib.Path(__file__).resolve().parent.parent / "results"


@pytest.fixture(scope="session")
def results_dir() -> pathlib.Path:
    RESULTS_DIR.mkdir(exist_ok=True)
    return RESULTS_DIR


def save_table(results_dir: pathlib.Path, name: str, text: str) -> None:
    (results_dir / f"{name}.md").write_text(text + "\n")
    print(f"\n== {name} ==\n{text}\n")
