"""Shared fixtures for the test suite (the Spark session fixture lives in
the repo-root conftest.py; these are driver-side numpy datasets)."""
from __future__ import annotations

import numpy as np
import pytest


def planted_clusters(
    n_per: int,
    centers,
    std: float,
    *,
    seed: int = 0,
    dim: int | None = None,
) -> np.ndarray:
    """Well-separated Gaussian blobs — the workhorse test instance: the
    optimal k-center structure is known by construction."""
    g = np.random.default_rng(seed)
    centers = np.asarray(centers, dtype=np.float64)
    if dim is not None and centers.shape[1] != dim:
        raise ValueError("centers dim mismatch")
    return np.vstack(
        [c + g.normal(0.0, std, (n_per, centers.shape[1])) for c in centers]
    )


@pytest.fixture(scope="session")
def three_blobs() -> np.ndarray:
    """90 points in 3 tight, far-apart 2-D clusters (k=3 is obvious)."""
    return planted_clusters(30, [(0, 0), (10, 0), (0, 10)], 0.3, seed=1)


@pytest.fixture(scope="session")
def blobs_with_outliers() -> tuple[np.ndarray, np.ndarray]:
    """three_blobs plus 5 distant outliers; returns (points, outlier_mask)."""
    base = planted_clusters(30, [(0, 0), (10, 0), (0, 10)], 0.3, seed=2)
    far = np.array(
        [[200.0, 200.0], [-180.0, 150.0], [150.0, -170.0],
         [-160.0, -160.0], [250.0, 0.0]]
    )
    pts = np.vstack([base, far])
    mask = np.zeros(len(pts), dtype=bool)
    mask[len(base):] = True
    return pts, mask


@pytest.fixture(scope="session")
def tiny_points() -> np.ndarray:
    """10 points in 2-D, small enough for brute-force optima."""
    g = np.random.default_rng(3)
    return g.uniform(-5, 5, (10, 2))
