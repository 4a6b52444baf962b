"""CORESETOUTLIERS — the paper's 1-pass streaming algorithm for k-center
with z outliers (Section 4, Theorem 3).

One pass of the weighted doubling algorithm with coreset budget
tau = mu*(k+z) (theory: tau = (k+z)(16/eps_hat)^D), then the same second
stage as the MapReduce algorithm: OutliersCluster on the weighted coreset
under the minimum-feasible-radius search.
"""
from __future__ import annotations

import time

import numpy as np

from repro.core.metric import as_points
from repro.core.search import min_feasible_radius
from repro.streaming.coreset_stream import StreamResult
from repro.streaming.doubling import DoublingCoreset


def coreset_stream_outliers(
    points,
    k: int,
    z: int,
    *,
    tau: int | None = None,
    mu: float = 1.0,
    eps_hat: float = 0.05,
) -> StreamResult:
    """Run CORESETOUTLIERS over ``points`` (the simulated stream).

    ``tau`` defaults to ceil(mu * (k+z)); Figure 5 sweeps mu over
    {1, 2, 4, 8, 16}. ``eps_hat`` parameterizes OutliersCluster and the
    radius-search tolerance, exactly as in the MapReduce second round.
    """
    points = as_points(points)
    if tau is None:
        tau = max(k + z, int(np.ceil(mu * (k + z))))
    if tau < k + z:
        raise ValueError(f"tau must be >= k+z, got tau={tau}, k+z={k + z}")
    coreset = DoublingCoreset(tau, points.shape[1])
    t0 = time.perf_counter()
    coreset.process(points)
    t1 = time.perf_counter()
    T, w, _ = coreset.finalize()
    search = min_feasible_radius(T, w, k, z, eps_hat)
    centers = search.centers(T)
    t2 = time.perf_counter()
    dt = t1 - t0
    return StreamResult(
        centers=centers,
        space=coreset.peak_size,
        throughput=len(points) / dt if dt > 0 else float("inf"),
        n_processed=coreset.n_processed,
        t_stream=dt,
        t_final=t2 - t1,
    )
