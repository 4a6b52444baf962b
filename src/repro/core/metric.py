"""Euclidean-metric primitives shared by every algorithm in the repo.

All algorithms in the paper touch the input only through pairwise Euclidean
distances, so this module is the single place where geometry happens:
chunked distance computation, nearest-center assignment, clustering radii
with and without outliers, and tiny brute-force solvers used as exact
oracles in tests.

Points are ``float64`` numpy arrays of shape ``(n, d)``; centers are either
index arrays into a point set or ``(m, d)`` coordinate arrays.
"""
from __future__ import annotations

from itertools import combinations

import numpy as np

# Cap on the number of scalar distance entries materialized at once by the
# chunked helpers (~64 MB of float64). Keeps the driver comfortable even for
# coreset unions of a few tens of thousands of points.
_CHUNK_ENTRIES = 8_000_000


def as_points(x) -> np.ndarray:
    """Coerce ``x`` to a C-contiguous ``(n, d)`` float64 array."""
    a = np.ascontiguousarray(np.asarray(x, dtype=np.float64))
    if a.ndim == 1:
        a = a.reshape(1, -1)
    if a.ndim != 2:
        raise ValueError(f"points must be 2-D, got shape {a.shape}")
    return a


def cdist(a, b) -> np.ndarray:
    """Dense Euclidean distance matrix of shape ``(len(a), len(b))``.

    Uses the expanded ``|a|^2 + |b|^2 - 2ab`` form (one GEMM) with clipping
    to guard the tiny negative values the expansion can produce.
    """
    a, b = as_points(a), as_points(b)
    sq = (
        (a * a).sum(axis=1)[:, None]
        + (b * b).sum(axis=1)[None, :]
        - 2.0 * (a @ b.T)
    )
    return np.sqrt(np.clip(sq, 0.0, None))


def min_dist(points, centers) -> tuple[np.ndarray, np.ndarray]:
    """Distance from each point to its closest center, plus the argmin.

    Chunked over points so that ``len(points) * len(centers)`` never
    materializes more than ``_CHUNK_ENTRIES`` scalars at once.

    Returns ``(dist, assign)`` with ``dist[i] = d(points[i], centers)`` and
    ``assign[i]`` the index (into ``centers``) of the closest center.
    """
    points, centers = as_points(points), as_points(centers)
    n, m = len(points), len(centers)
    dist = np.empty(n, dtype=np.float64)
    assign = np.empty(n, dtype=np.int64)
    step = max(1, _CHUNK_ENTRIES // max(1, m))
    for lo in range(0, n, step):
        hi = min(n, lo + step)
        d = cdist(points[lo:hi], centers)
        assign[lo:hi] = d.argmin(axis=1)
        dist[lo:hi] = d[np.arange(hi - lo), assign[lo:hi]]
    return dist, assign


def radius(points, centers, z: int = 0) -> float:
    """Radius of the clustering of ``points`` induced by ``centers``,
    ignoring the ``z`` farthest points (the paper's r_{T,Z_T}(S)).

    With ``z = 0`` this is the plain k-center objective r_T(S).
    """
    d, _ = min_dist(points, centers)
    return radius_from_distances(d, z)


def radius_from_distances(dist: np.ndarray, z: int = 0) -> float:
    """z-outlier radius given precomputed closest-center distances.

    The radius excluding the z farthest points is the (z+1)-th largest
    distance; if ``z >= n`` every point may be discarded and the radius is 0.
    """
    n = len(dist)
    if z >= n:
        return 0.0
    if z == 0:
        return float(dist.max(initial=0.0))
    return float(np.partition(dist, n - z - 1)[n - z - 1])


def pairwise_min_gap(points) -> float:
    """Smallest distance between two distinct points (chunked)."""
    points = as_points(points)
    n = len(points)
    if n < 2:
        return 0.0
    best = np.inf
    step = max(1, _CHUNK_ENTRIES // n)
    for lo in range(0, n, step):
        hi = min(n, lo + step)
        d = cdist(points[lo:hi], points)
        # mask the self-distances on the diagonal block
        rows = np.arange(lo, hi)
        d[np.arange(hi - lo), rows] = np.inf
        best = min(best, float(d.min()))
    return best


def diameter_upper_bound(points) -> float:
    """Cheap upper bound on the diameter: 2 * max distance to the centroid."""
    points = as_points(points)
    c = points.mean(axis=0, keepdims=True)
    return 2.0 * float(cdist(points, c).max(initial=0.0))


# ---------------------------------------------------------------------------
# Exact brute-force solvers — test oracles only (exponential in k).
# ---------------------------------------------------------------------------

def brute_force_kcenter(points, k: int) -> tuple[float, tuple[int, ...]]:
    """Exact optimal k-center radius r*_k by enumerating center subsets.

    Only viable for tiny instances (n choose k small); used by tests to
    validate the 2-approximation of GMM and the (2+eps) MR bound.
    """
    points = as_points(points)
    n = len(points)
    if not 0 < k < n:
        raise ValueError(f"need 0 < k < n, got k={k}, n={n}")
    full = cdist(points, points)
    best_r, best_c = np.inf, None
    for comb in combinations(range(n), k):
        r = full[:, comb].min(axis=1).max()
        if r < best_r:
            best_r, best_c = float(r), comb
    return best_r, best_c


def brute_force_kcenter_outliers(
    points, k: int, z: int
) -> tuple[float, tuple[int, ...]]:
    """Exact optimal radius r*_{k,z} with z discardable outliers.

    Enumerates center subsets; for each, the objective is the (z+1)-th
    largest closest-center distance.
    """
    points = as_points(points)
    n = len(points)
    if not 0 < k < n:
        raise ValueError(f"need 0 < k < n, got k={k}, n={n}")
    if not 0 <= z < n:
        raise ValueError(f"need 0 <= z < n, got z={z}, n={n}")
    full = cdist(points, points)
    best_r, best_c = np.inf, None
    for comb in combinations(range(n), k):
        d = full[:, comb].min(axis=1)
        r = radius_from_distances(d, z)
        if r < best_r:
            best_r, best_c = float(r), comb
    return best_r, best_c
