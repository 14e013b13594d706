"""Benchmark-wide knobs: where result CSVs land, default scale."""
from __future__ import annotations

import os
import pathlib

import pytest

RESULTS_DIR = pathlib.Path(__file__).resolve().parent.parent / "bench_results"


@pytest.fixture(scope="session")
def results_dir() -> pathlib.Path:
    RESULTS_DIR.mkdir(exist_ok=True)
    return RESULTS_DIR


@pytest.fixture(scope="session")
def bench_scale() -> float:
    """Graph scale for benchmarks (1.0 ≈ 1/1000 of the paper's graphs)."""
    return float(os.environ.get("BENCH_SCALE", "1.0"))
