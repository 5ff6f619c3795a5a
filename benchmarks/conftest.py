"""Benchmark plumbing: results directory + a session flag so benches write
their table outputs for EXPERIMENTS.md."""
from __future__ import annotations

import pathlib

import pytest

RESULTS = pathlib.Path(__file__).parent / "results"


@pytest.fixture(scope="session")
def results_dir() -> pathlib.Path:
    RESULTS.mkdir(exist_ok=True)
    return RESULTS
