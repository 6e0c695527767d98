"""Shared state for the benchmark suite.

One session-scoped :class:`Harness` memoises every engine run, so later
exhibits (Fig 7-10) reuse the runs Fig 6 already performed. Each bench
prints its paper-style table and appends it to ``results/<exhibit>.txt``
so EXPERIMENTS.md can be regenerated from a single benchmark run.
"""
from __future__ import annotations

import pathlib

import pytest

from repro.harness.configs import BENCH_INPUT_BATCHES, BENCH_SF
from repro.harness.experiments import Harness, format_rows

RESULTS_DIR = pathlib.Path(__file__).resolve().parent.parent / "results"


@pytest.fixture(scope="session")
def harness() -> Harness:
    return Harness(
        sf=BENCH_SF, input_batches=BENCH_INPUT_BATCHES, check_oracle=True
    )


@pytest.fixture(scope="session")
def emit():
    """emit(name, rows, title): print + persist one exhibit's table."""
    RESULTS_DIR.mkdir(exist_ok=True)

    def _emit(name: str, rows: list[dict], title: str) -> None:
        text = format_rows(rows, title)
        print("\n" + text)
        (RESULTS_DIR / f"{name}.txt").write_text(text + "\n")

    return _emit
