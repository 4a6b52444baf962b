"""The paper's weighted doubling algorithm (Section 4).

A novel weighted variant of the doubling algorithm of Charikar et al. [15]:
maintain a weighted center set T of at most ``tau`` points and a lower
bound phi on r*_tau(S), preserving the invariants

  (a) |T| <= tau
  (b) every pair of centers is > 4*phi apart
  (c) every processed point is within 8*phi of its proxy center
  (d) w_t = number of processed points whose proxy is t
  (e) phi <= r*_tau(S)

Processing: T is seeded with the first tau+1 points (then merged down);
afterwards, a point within 8*phi of T increments its nearest center's
weight (*update rule*), a farther point becomes a new center, and whenever
|T| exceeds tau the *merge rule* doubles phi and greedily merges centers
closer than 4*phi until invariant (a) holds again.
"""
from __future__ import annotations

import numpy as np

from repro.core.metric import as_points, cdist, pairwise_min_gap


class DoublingCoreset:
    """Streaming weighted coreset of at most ``tau`` centers.

    Feed points with :meth:`update` (or :meth:`process`); read the coreset
    with :attr:`points` / :attr:`weights` / :attr:`phi`. ``peak_size``
    records the largest |T| ever held (the working-memory claim: never more
    than tau + 1).
    """

    def __init__(self, tau: int, dim: int):
        if tau < 1:
            raise ValueError("tau must be >= 1")
        self.tau = tau
        self.dim = dim
        # Preallocated storage for tau+1 centers (the transient overshoot).
        self._pts = np.empty((tau + 1, dim), dtype=np.float64)
        self._w = np.zeros(tau + 1, dtype=np.int64)
        self._m = 0  # current |T|
        self.phi = 0.0
        self.n_processed = 0
        self.peak_size = 0
        self._initialized = False

    # -- views -------------------------------------------------------------

    @property
    def points(self) -> np.ndarray:
        return self._pts[: self._m]

    @property
    def weights(self) -> np.ndarray:
        return self._w[: self._m]

    @property
    def size(self) -> int:
        return self._m

    # -- internals ---------------------------------------------------------

    def _append(self, p: np.ndarray, w: int) -> None:
        self._pts[self._m] = p
        self._w[self._m] = w
        self._m += 1
        self.peak_size = max(self.peak_size, self._m)

    def _merge_rule(self) -> None:
        """phi <- 2*phi, then greedily merge centers within 4*phi, repeated
        until |T| <= tau (each repetition doubles phi again).

        If phi is still 0 (all seed points coincided), it is bootstrapped to
        half the minimum positive pairwise gap — the same lower-bound
        argument as at initialization — after folding exact duplicates.
        """
        while True:
            if self.phi == 0.0:
                self._dedupe_coincident()
                if self._m <= self.tau:
                    return
                gap = pairwise_min_gap(self._pts[: self._m])
                self.phi = gap / 2.0
            self.phi *= 2.0
            self._enforce_separation()
            if self._m <= self.tau:
                return

    def _enforce_separation(self) -> None:
        """Re-establish invariant (b): keep a maximal prefix-greedy subset
        with pairwise distance > 4*phi; fold each discarded center's weight
        into the nearest kept one (the proxy reassignment)."""
        m = self._m
        if m < 2:
            return
        pts, w = self._pts[:m], self._w[:m]
        D = cdist(pts, pts)
        keep: list[int] = []
        merged_into = np.full(m, -1, dtype=np.int64)
        for i in range(m):
            if keep:
                dk = D[i, keep]
                j = int(np.argmin(dk))
                if dk[j] <= 4.0 * self.phi:
                    merged_into[i] = keep[j]
                    continue
            keep.append(i)
        if len(keep) == m:
            return
        new_w = w.copy()
        for i in range(m):
            if merged_into[i] >= 0:
                new_w[merged_into[i]] += new_w[i]
        self._pts[: len(keep)] = pts[keep]
        self._w[: len(keep)] = new_w[keep]
        self._m = len(keep)

    def _init_from_buffer(self, buf: list[np.ndarray]) -> None:
        for p in buf:
            self._append(p, 1)
        gap = pairwise_min_gap(self._pts[: self._m])
        # phi starts at half the min pairwise distance; the prescribed merge
        # is then applied so invariants (a)-(b) hold before the next point.
        self.phi = gap / 2.0 if gap > 0 else 0.0
        if self.phi == 0.0:
            # Coincident seed points: fold duplicates (distance 0 <= 4*phi
            # requires phi > 0, so dedupe explicitly), keep phi = 0.
            self._dedupe_coincident()
            if self._m > self.tau:
                raise AssertionError("dedupe left more than tau centers")
            return
        if self._m > self.tau:
            # phi was set to half the closest seed gap, so after the merge
            # rule doubles it that closest pair is within 4*phi and merges,
            # re-establishing (a) — the paper's prescribed end-of-init step.
            self._merge_rule()
        else:
            self._enforce_separation()

    def _dedupe_coincident(self) -> None:
        m = self._m
        pts, w = self._pts[:m], self._w[:m]
        D = cdist(pts, pts)
        keep: list[int] = []
        merged_into = np.full(m, -1, dtype=np.int64)
        for i in range(m):
            if keep:
                dk = D[i, keep]
                j = int(np.argmin(dk))
                if dk[j] == 0.0:
                    merged_into[i] = keep[j]
                    continue
            keep.append(i)
        new_w = w.copy()
        for i in range(m):
            if merged_into[i] >= 0:
                new_w[merged_into[i]] += new_w[i]
        self._pts[: len(keep)] = pts[keep]
        self._w[: len(keep)] = new_w[keep]
        self._m = len(keep)

    # -- public API --------------------------------------------------------

    def update(self, point) -> None:
        """Process one stream point."""
        p = np.asarray(point, dtype=np.float64).reshape(-1)
        if p.shape != (self.dim,):
            raise ValueError(f"point dim {p.shape} != ({self.dim},)")
        self.n_processed += 1
        if not self._initialized:
            self._append(p, 1)
            if self._m == self.tau + 1:
                m = self._m
                buf = [self._pts[i].copy() for i in range(m)]
                self._m = 0
                self._w[:] = 0
                self.peak_size = max(self.peak_size, m)
                self._init_from_buffer(buf)
                self._initialized = True
            return
        d = cdist(p[None, :], self._pts[: self._m])[0]
        j = int(d.argmin())
        if d[j] <= 8.0 * self.phi:
            self._w[j] += 1  # update rule: p's proxy is center j
            return
        self._append(p, 1)
        if self._m > self.tau:
            self._merge_rule()

    def process(self, points) -> "DoublingCoreset":
        for p in as_points(points):
            self.update(p)
        return self

    def finalize(self) -> tuple[np.ndarray, np.ndarray, float]:
        """Return ``(T, weights, phi)``. If the stream ended before tau+1
        points arrived, the buffered points (weight 1 each, phi = 0) are the
        exact coreset."""
        return self.points.copy(), self.weights.copy(), self.phi
