"""Tests for repro.streaming.doubling — the weighted doubling algorithm's
invariants (a)-(e) of Section 4, checked after every processed point."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.metric import brute_force_kcenter, cdist, min_dist
from repro.streaming.doubling import DoublingCoreset
from tests.conftest import planted_clusters


def check_invariants(dc: DoublingCoreset, seen: np.ndarray) -> None:
    """Invariants (a)-(d) (plus coverage) against the processed prefix."""
    T, w = dc.points, dc.weights
    # (a) |T| <= tau
    assert dc.size <= dc.tau
    # (b) pairwise distance > 4*phi
    if dc.size >= 2:
        D = cdist(T, T)
        off = D[~np.eye(dc.size, dtype=bool)]
        assert off.min() > 4.0 * dc.phi - 1e-9
    # (c) every processed point within 8*phi of T
    d, _ = min_dist(seen, T)
    assert d.max() <= 8.0 * dc.phi + 1e-9
    # (d) weights total the processed count
    assert w.sum() == len(seen)
    assert (w >= 1).all()


class TestInvariants:
    @pytest.mark.parametrize("tau", [3, 5, 10])
    @pytest.mark.parametrize("seed", range(3))
    def test_after_every_point(self, tau, seed):
        g = np.random.default_rng(seed)
        pts = g.uniform(-10, 10, (60, 2))
        dc = DoublingCoreset(tau, 2)
        for i in range(len(pts)):
            dc.update(pts[i])
            if dc._initialized:
                check_invariants(dc, pts[: i + 1])

    @settings(max_examples=20, deadline=None)
    @given(st.integers(0, 10**6), st.integers(2, 8))
    def test_invariants_hypothesis(self, seed, tau):
        g = np.random.default_rng(seed)
        pts = g.normal(size=(40, 3))
        dc = DoublingCoreset(tau, 3).process(pts)
        check_invariants(dc, pts)

    def test_invariant_e_phi_lower_bounds_opt(self):
        """(e): phi <= r*_tau(S), verified against brute force."""
        g = np.random.default_rng(5)
        pts = g.uniform(-1, 1, (12, 2))
        tau = 3
        dc = DoublingCoreset(tau, 2).process(pts)
        opt, _ = brute_force_kcenter(pts, tau)
        assert dc.phi <= opt + 1e-9


class TestMechanics:
    def test_peak_size_bounded(self):
        pts = planted_clusters(50, [(0, 0), (20, 0), (0, 20)], 1.0, seed=1)
        dc = DoublingCoreset(6, 2).process(pts)
        assert dc.peak_size <= 7  # tau + 1 transient

    def test_short_stream_kept_exactly(self):
        pts = np.arange(8, dtype=float).reshape(4, 2)
        dc = DoublingCoreset(10, 2).process(pts)
        T, w, phi = dc.finalize()
        assert len(T) == 4 and (w == 1).all() and phi == 0.0

    def test_weights_sum_large_stream(self):
        pts = planted_clusters(200, [(0, 0), (50, 50)], 2.0, seed=2)
        dc = DoublingCoreset(8, 2).process(pts)
        assert dc.weights.sum() == 400 == dc.n_processed

    def test_all_duplicate_points(self):
        pts = np.tile([[1.0, 2.0]], (20, 1))
        dc = DoublingCoreset(3, 2).process(pts)
        T, w, phi = dc.finalize()
        assert len(T) == 1 and w[0] == 20 and phi == 0.0

    def test_duplicates_then_distinct(self):
        pts = np.vstack([np.tile([[0.0, 0.0]], (5, 1)),
                         [[10.0, 0]], [[0.0, 10]], [[10.0, 10]]])
        dc = DoublingCoreset(2, 2).process(pts)
        assert dc.size <= 2 and dc.weights.sum() == 8

    def test_dim_mismatch_rejected(self):
        dc = DoublingCoreset(3, 2)
        with pytest.raises(ValueError):
            dc.update([1.0, 2.0, 3.0])

    def test_invalid_tau(self):
        with pytest.raises(ValueError):
            DoublingCoreset(0, 2)

    def test_finalize_copies(self):
        pts = np.random.default_rng(0).normal(size=(30, 2))
        dc = DoublingCoreset(5, 2).process(pts)
        T, w, _ = dc.finalize()
        T[:] = 0.0
        assert not np.allclose(dc.points, 0.0)


class TestCoresetQuality:
    def test_coverage_within_8phi_final(self):
        """Corollary of the invariants: after the stream, every point is
        within 8*phi <= 8*r*_tau(S) of the coreset."""
        pts = planted_clusters(100, [(0, 0), (30, 0), (0, 30), (30, 30)], 1.0,
                               seed=3)
        tau = 16
        dc = DoublingCoreset(tau, 2).process(pts)
        d, _ = min_dist(pts, dc.points)
        assert d.max() <= 8 * dc.phi + 1e-9

    def test_larger_tau_smaller_phi(self):
        pts = planted_clusters(100, [(0, 0), (30, 0), (0, 30)], 1.5, seed=4)
        phi_small = DoublingCoreset(4, 2).process(pts).phi
        phi_large = DoublingCoreset(32, 2).process(pts).phi
        assert phi_large <= phi_small + 1e-12

    def test_order_insensitive_weight_total(self):
        pts = planted_clusters(80, [(0, 0), (40, 40)], 2.0, seed=5)
        g = np.random.default_rng(6)
        shuffled = pts[g.permutation(len(pts))]
        a = DoublingCoreset(6, 2).process(pts)
        b = DoublingCoreset(6, 2).process(shuffled)
        assert a.weights.sum() == b.weights.sum() == len(pts)
