"""Benchmark fixtures: scale comes from BENCH_PAIRS (default 300 aligned
pairs per dataset, ~2× the unit-test scale; the paper's table shapes are
stable from ~150 up)."""
import os

import pytest


@pytest.fixture(scope="session")
def bench_pairs() -> int:
    return int(os.environ.get("BENCH_PAIRS", "300"))
