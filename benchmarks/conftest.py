"""Benchmark helpers: every table benchmark saves its formatted output
under ``benchmarks/results/`` so EXPERIMENTS.md can be assembled from
the exact numbers the benchmark run produced."""
import pathlib

import pytest

RESULTS_DIR = pathlib.Path(__file__).parent / "results"


@pytest.fixture(scope="session")
def save_result():
    """Returns save(name, text): persist + echo one benchmark's table."""
    RESULTS_DIR.mkdir(exist_ok=True)

    def _save(name: str, text: str) -> None:
        (RESULTS_DIR / f"{name}.txt").write_text(text + "\n")
        print(f"\n[{name}]\n{text}")

    return _save
