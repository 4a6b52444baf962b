"""BASESTREAM — the McCutchen–Khuller [27] (2+eps) streaming algorithm for
k-center without outliers, the Figure 3 baseline.

[27] refines the guess-based doubling scheme of Charikar et al.: run a
bank of parallel instances whose radius guesses are staggered geometrically
so that some instance's guess is always within a (small) factor of the
optimum; each instance keeps at most k centers and, when its guess fails
(a (k+1)-th center appears), doubles its guess and re-clusters its own
centers. Space is m*k for m instances; the approximation approaches 2 as m
grows (the paper's m sweep {1, 2, 4, 8, 16} trades space for accuracy).

At end of stream each instance i holds <= k centers covering every
processed point within 2 * r_i of them; the algorithm reports the centers
of the instance with the smallest current guess, the same selection rule
as [27].
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np

from repro.core.metric import as_points, cdist, pairwise_min_gap
from repro.streaming.coreset_stream import StreamResult


@dataclass
class _Instance:
    """One guess-based instance: <= k centers valid for the current guess r
    (every processed point is within 2r of some center)."""

    k: int
    r: float
    centers: list[np.ndarray] = field(default_factory=list)

    def add(self, p: np.ndarray) -> None:
        if self.centers:
            d = cdist(p[None, :], np.asarray(self.centers))[0]
            if float(d.min()) <= 2.0 * self.r:
                return
        self.centers.append(p)
        while len(self.centers) > self.k:
            self.r *= 2.0
            self._recluster()

    def _recluster(self) -> None:
        """Keep a maximal subset of centers pairwise > 2r apart; dropped
        centers are within 2r of a kept one, so coverage is preserved up to
        the doubled radius."""
        kept: list[np.ndarray] = []
        for c in self.centers:
            if kept:
                d = cdist(c[None, :], np.asarray(kept))[0]
                if float(d.min()) <= 2.0 * self.r:
                    continue
            kept.append(c)
        self.centers = kept


def base_stream_kcenter(points, k: int, *, m: int = 1) -> StreamResult:
    """Run BASESTREAM with ``m`` parallel instances (space m*k).

    Instances are seeded after the first k+1 distinct points with guesses
    g * 2^(i/m), i in [0, m): a geometric ladder of granularity 2^(1/m), so
    larger m gives a finer guess and a tighter radius.
    """
    points = as_points(points)
    if m < 1:
        raise ValueError("m must be >= 1")
    n, _ = points.shape
    t0 = time.perf_counter()
    # Seed: buffer until k+1 distinct points fix a scale for the guesses.
    buf: list[np.ndarray] = []
    instances: list[_Instance] = []
    start = 0
    for start in range(n):
        buf.append(points[start])
        if len(buf) >= k + 1:
            gap = pairwise_min_gap(np.asarray(buf))
            if gap > 0.0:
                base = gap / 2.0
                instances = [
                    _Instance(k=k, r=base * 2.0 ** (i / m)) for i in range(m)
                ]
                for inst in instances:
                    for p in buf:
                        inst.add(p)
                break
    if not instances:
        # Fewer than k+1 distinct points: the distinct points are an exact
        # solution with radius 0.
        uniq = np.unique(np.asarray(buf), axis=0)
        t1 = time.perf_counter()
        dt = t1 - t0
        return StreamResult(
            centers=uniq[:k],
            space=len(buf),
            throughput=n / dt if dt > 0 else float("inf"),
            n_processed=n,
            t_stream=dt,
            t_final=0.0,
        )
    for i in range(start + 1, n):
        p = points[i]
        for inst in instances:
            inst.add(p)
    t1 = time.perf_counter()
    best = min(instances, key=lambda inst: inst.r)
    centers = np.asarray(best.centers)
    t2 = time.perf_counter()
    dt = t1 - t0
    return StreamResult(
        centers=centers,
        space=m * k,
        throughput=n / dt if dt > 0 else float("inf"),
        n_processed=n,
        t_stream=dt,
        t_final=t2 - t1,
    )
