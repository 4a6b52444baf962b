"""Shared benchmark inputs (generated once per session, outside timing)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.data.datasets import add_outliers, higgs_like, power_like

# Benchmark scale: large enough to exercise the shuffle paths and the
# O(k|T|^2) second round, small enough that every table's bench finishes in
# seconds (the full paper-scale sweeps live in jobs/, not here).
BENCH_N = 4_000
BENCH_K = 10
BENCH_Z = 50


@pytest.fixture(scope="session")
def bench_points() -> np.ndarray:
    return higgs_like(BENCH_N, seed=100)


@pytest.fixture(scope="session")
def bench_points_outliers() -> tuple[np.ndarray, np.ndarray]:
    return add_outliers(power_like(BENCH_N, seed=101), BENCH_Z, seed=102)
