"""Gonzalez's GMM (farthest-first traversal), run incrementally, and the
paper's two coreset constructions built on it.

GMM is the workhorse of the whole paper: it is a sequential 2-approximation
for k-center (Lemma 1) and, crucially, it is *incremental* — the set of the
first j centers is a prefix of the set of the first j+1 — which is what lets
the MapReduce round-1 reducers grow a coreset until a stopping condition is
met without knowing the doubling dimension D.

Two stopping rules are provided, matching the paper:

* ``gmm_coreset_adaptive``: the theoretical rule — keep selecting centers
  past ``k_base`` until r_{T^tau}(S_i) <= (eps/2) * r_{T^{k_base}}(S_i)
  (Sections 3.1 / 3.2).
* ``gmm_coreset_fixed``: the experimental rule — select exactly ``tau``
  centers (Section 5 fixes tau = mu*k or mu*(k+z) instead of sweeping eps).

Both return *weighted* coresets: each selected center carries the number of
input points whose closest center (proxy, in the paper's terminology) it is.
The k-center MR algorithm ignores the weights; the outliers MR/Streaming
algorithms require them.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.metric import as_points, cdist


@dataclass(frozen=True)
class GmmResult:
    """Output of an incremental GMM run on a point set ``X``.

    ``centers_idx``  indices into X of the selected centers, in selection
                     order (so any prefix is itself a valid GMM run).
    ``assign``       assign[i] = position in ``centers_idx`` of the closest
                     selected center of X[i] (the proxy function p).
    ``dist``         dist[i] = d(X[i], T) for the final center set T.
    ``radii``        radii[j] = r_{T^{j+1}}(X), the radius of X w.r.t. the
                     first j+1 centers — non-increasing by construction.
    """

    centers_idx: np.ndarray
    assign: np.ndarray
    dist: np.ndarray
    radii: np.ndarray

    @property
    def tau(self) -> int:
        return len(self.centers_idx)

    def weights(self) -> np.ndarray:
        """Proxy weights: w[t] = number of points assigned to center t."""
        return np.bincount(self.assign, minlength=self.tau).astype(np.int64)

    def centers(self, X) -> np.ndarray:
        return as_points(X)[self.centers_idx]


def gmm(X, tau: int, *, first: int = 0, stop=None) -> GmmResult:
    """Run up to ``tau`` iterations of farthest-first traversal on ``X``.

    ``first`` is the (arbitrary, per Gonzalez) initial center index; the
    experiments shuffle the input between runs, which is equivalent to
    randomizing ``first``.

    ``stop``, if given, is called as ``stop(j, radii_so_far)`` after the
    j-th center (1-based) has been added and the radius recorded; returning
    True ends the run early. Used to implement the adaptive stopping rule
    without paying for centers past the stopping point.
    """
    X = as_points(X)
    n = len(X)
    if n == 0:
        raise ValueError("empty point set")
    tau = min(tau, n)
    if not 0 <= first < n:
        raise ValueError(f"first index {first} out of range for n={n}")

    centers = np.empty(tau, dtype=np.int64)
    centers[0] = first
    dist = cdist(X, X[first : first + 1])[:, 0]
    assign = np.zeros(n, dtype=np.int64)
    radii = np.empty(tau, dtype=np.float64)
    radii[0] = dist.max(initial=0.0)
    j = 1
    if stop is not None and stop(1, radii[:1]):
        j = 1
    else:
        while j < tau:
            nxt = int(dist.argmax())
            if dist[nxt] == 0.0:
                # All points coincide with an existing center: the coreset is
                # the full distinct point set, nothing more to select.
                break
            centers[j] = nxt
            nd = cdist(X, X[nxt : nxt + 1])[:, 0]
            closer = nd < dist
            dist[closer] = nd[closer]
            assign[closer] = j
            radii[j] = dist.max(initial=0.0)
            j += 1
            if stop is not None and stop(j, radii[:j]):
                break
    return GmmResult(
        centers_idx=centers[:j].copy(),
        assign=assign,
        dist=dist,
        radii=radii[:j].copy(),
    )


def gmm_coreset_fixed(X, tau: int, *, first: int = 0):
    """Coreset of exactly ``tau`` centers (fewer only if X has fewer
    distinct points), with proxy weights — the experimental construction.

    Returns ``(coreset_points, weights, result)``.
    """
    res = gmm(X, tau, first=first)
    return res.centers(X), res.weights(), res


def gmm_coreset_adaptive(
    X, k_base: int, eps: float, *, first: int = 0, max_tau: int | None = None
):
    """The paper's theoretical stopping rule (Sections 3.1/3.2).

    Runs GMM past ``k_base`` centers until the first iteration
    ``tau >= k_base`` with r_{T^tau}(X) <= (eps/2) * r_{T^{k_base}}(X).
    ``k_base`` is k for plain k-center, k+z (or k+z') for the outliers
    variants. Returns ``(coreset_points, weights, result)``.
    """
    if eps <= 0:
        raise ValueError("eps must be positive")
    X = as_points(X)
    n = len(X)
    cap = n if max_tau is None else min(n, max_tau)

    def stop(j: int, radii: np.ndarray) -> bool:
        if j < k_base or j < 1:
            return False
        return radii[j - 1] <= (eps / 2.0) * radii[min(k_base, len(radii)) - 1]

    res = gmm(X, cap, first=first, stop=stop)
    return res.centers(X), res.weights(), res
