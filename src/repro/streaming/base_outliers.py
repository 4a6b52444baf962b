"""BASEOUTLIERS — the McCutchen–Khuller [27] (4+eps) streaming algorithm
for k-center with z outliers, the Figure 5 baseline.

Per [27], each instance runs a guess-based algorithm with O(k*z) working
memory for its radius guess r:

* a point within 4r of an existing center is *covered* and dropped;
* otherwise it is stored as a *free* point;
* whenever some free point q has >= z+1 free points inside its 2r-ball, q
  must belong to a real cluster: q is promoted to a center and every free
  point within 4r of it is dropped;
* if the instance would need more than k centers, or holds more free
  points than k*z + z (more than z of them can be shown non-outliers),
  the guess fails: r doubles and the stored summary (centers + free
  points) is re-processed under the new guess.

At end of stream the <= k centers cover all but <= k*z + z stored free
points; the final solution completes the centers by running the offline
[16] search (``min_feasible_radius_exact``) over the instance's stored
points. The experiments run m parallel instances on a geometric guess
ladder (space m*k*z) and report the instance with the smallest surviving
guess, mirroring BASESTREAM.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np

from repro.core.metric import as_points, cdist, pairwise_min_gap
from repro.core.search import min_feasible_radius_exact
from repro.streaming.coreset_stream import StreamResult


@dataclass
class _OutlierInstance:
    k: int
    z: int
    r: float
    centers: list[np.ndarray] = field(default_factory=list)
    free: list[np.ndarray] = field(default_factory=list)

    @property
    def free_cap(self) -> int:
        return self.k * self.z + self.z

    def add(self, p: np.ndarray) -> None:
        if self.centers:
            d = cdist(p[None, :], np.asarray(self.centers))[0]
            if float(d.min()) <= 4.0 * self.r:
                return
        self.free.append(p)
        self._consolidate()

    def _consolidate(self) -> None:
        """Promote dense free points to centers; escalate the guess when
        the instance runs out of center or free-point budget."""
        while True:
            self._promote_dense()
            if len(self.centers) <= self.k and len(self.free) <= self.free_cap:
                return
            # Guess failed: double r and re-process the stored summary.
            stored = self.centers + self.free
            self.r *= 2.0
            self.centers, self.free = [], []
            for q in stored:
                if self.centers:
                    d = cdist(q[None, :], np.asarray(self.centers))[0]
                    if float(d.min()) <= 4.0 * self.r:
                        continue
                self.free.append(q)
                self._promote_dense()

    def _promote_dense(self) -> None:
        """While some free point has >= z+1 free points (itself included)
        within 2r and a center slot remains, promote it."""
        while self.free and len(self.centers) < self.k:
            F = np.asarray(self.free)
            D = cdist(F, F)
            support = (D <= 2.0 * self.r).sum(axis=1)
            q = int(support.argmax())
            if support[q] < self.z + 1:
                return
            center = F[q]
            self.centers.append(center)
            dc = cdist(F, center[None, :])[:, 0]
            self.free = [F[i] for i in np.flatnonzero(dc > 4.0 * self.r)]

    def stored_points(self) -> np.ndarray:
        pts = self.centers + self.free
        return np.asarray(pts) if pts else np.empty((0, 0))


def base_stream_outliers(
    points, k: int, z: int, *, m: int = 1
) -> StreamResult:
    """Run BASEOUTLIERS with ``m`` parallel instances (space m*(k*z+z+k)).

    Seeding mirrors BASESTREAM: buffer k+z+1 points to fix the distance
    scale, then start instances on the geometric ladder g * 2^(i/m).
    """
    points = as_points(points)
    if m < 1:
        raise ValueError("m must be >= 1")
    if z < 1:
        raise ValueError("z must be >= 1 (use base_stream_kcenter for z=0)")
    n, _ = points.shape
    t0 = time.perf_counter()
    buf: list[np.ndarray] = []
    instances: list[_OutlierInstance] = []
    start = 0
    for start in range(n):
        buf.append(points[start])
        if len(buf) >= k + z + 1:
            gap = pairwise_min_gap(np.asarray(buf))
            if gap > 0.0:
                base = gap / 2.0
                instances = [
                    _OutlierInstance(k=k, z=z, r=base * 2.0 ** (i / m))
                    for i in range(m)
                ]
                for inst in instances:
                    for p in buf:
                        inst.add(p)
                break
    if not instances:
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
    stored = best.stored_points()
    # Offline completion on the O(k*z) stored points: the [16] search with
    # unit weights yields the final k centers.
    search = min_feasible_radius_exact(
        stored, np.ones(len(stored)), k, min(z, max(0, len(stored) - 1)),
        eps_hat=0.0,
    )
    centers = search.centers(stored)
    t2 = time.perf_counter()
    dt = t1 - t0
    return StreamResult(
        centers=centers,
        space=m * (k * z + z + k),
        throughput=n / dt if dt > 0 else float("inf"),
        n_processed=n,
        t_stream=dt,
        t_final=t2 - t1,
    )
