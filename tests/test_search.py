"""Tests for repro.core.search — the minimum-feasible-radius searches and
the CHARIKARETAL baseline."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.gmm import gmm_coreset_fixed
from repro.core.metric import (
    brute_force_kcenter_outliers,
    min_dist,
    radius,
)
from repro.core.search import (
    charikar,
    default_delta,
    min_feasible_radius,
    min_feasible_radius_exact,
)


class TestDelta:
    def test_paper_formula(self):
        eps = 0.3
        assert default_delta(eps) == pytest.approx(eps / (3 + 4 * eps))

    def test_zero_eps(self):
        assert default_delta(0.0) == 0.0


class TestGeometricSearch:
    def test_returns_feasible(self, blobs_with_outliers):
        pts, mask = blobs_with_outliers
        z = int(mask.sum())
        res = min_feasible_radius(pts, np.ones(len(pts)), 3, z, 0.1)
        assert res.cluster.uncovered_weight <= z

    def test_feasible_radius_close_to_optimum(self, blobs_with_outliers):
        """The search radius is within tolerance of r*_{k,z}: at the planted
        scale, not at the outlier scale."""
        pts, mask = blobs_with_outliers
        z = int(mask.sum())
        res = min_feasible_radius(pts, np.ones(len(pts)), 3, z, 0.1)
        assert res.r < 5.0  # planted blob scale, NOT the ~200 outlier scale

    def test_evaluation_count_logarithmic(self, blobs_with_outliers):
        pts, mask = blobs_with_outliers
        z = int(mask.sum())
        res = min_feasible_radius(pts, np.ones(len(pts)), 3, z, 0.1)
        # binary search over the geometric grid: far fewer than grid size
        assert res.evaluations <= 64

    def test_weighted_feasibility(self, blobs_with_outliers):
        pts, mask = blobs_with_outliers
        z = int(mask.sum())
        T, w, _ = gmm_coreset_fixed(pts, 3 + z + 6)
        res = min_feasible_radius(T, w.astype(float), 3, z, 0.1)
        assert res.cluster.uncovered_weight <= z

    def test_z_total_weight_gives_zero(self, three_blobs):
        w = np.ones(len(three_blobs))
        res = min_feasible_radius(three_blobs, w, 2, len(three_blobs), 0.1)
        assert res.r == 0.0

    def test_rejects_nonpositive_delta(self, three_blobs):
        with pytest.raises(ValueError):
            min_feasible_radius(
                three_blobs, np.ones(len(three_blobs)), 2, 1, 0.0
            )

    def test_explicit_delta_grid_tolerance(self, blobs_with_outliers):
        """Smaller delta → finer grid → radius no larger (up to grid
        placement), and both remain feasible."""
        pts, mask = blobs_with_outliers
        z = int(mask.sum())
        w = np.ones(len(pts))
        coarse = min_feasible_radius(pts, w, 3, z, 0.1, delta=0.5)
        fine = min_feasible_radius(pts, w, 3, z, 0.1, delta=0.01)
        assert fine.cluster.uncovered_weight <= z
        assert fine.r <= coarse.r * 1.5 + 1e-9


class TestExactSearch:
    def test_returns_feasible_candidate(self, blobs_with_outliers):
        pts, mask = blobs_with_outliers
        z = int(mask.sum())
        res = min_feasible_radius_exact(pts, np.ones(len(pts)), 3, z)
        assert res.cluster.uncovered_weight <= z

    def test_charikar_three_approx(self):
        """[16] guarantee: measured z-outlier radius <= 3 * r*_{k,z}."""
        for seed in range(6):
            g = np.random.default_rng(seed)
            pts = g.uniform(-1, 1, (9, 2))
            k, z = 2, 2
            opt, _ = brute_force_kcenter_outliers(pts, k, z)
            res = charikar(pts, k, z)
            got = radius(pts, pts[res.cluster.centers_idx], z)
            assert got <= 3.0 * opt + 1e-9

    @settings(max_examples=20, deadline=None)
    @given(st.integers(0, 10**6))
    def test_charikar_three_approx_hypothesis(self, seed):
        g = np.random.default_rng(seed)
        pts = g.normal(size=(8, 2))
        k, z = 2, 1
        opt, _ = brute_force_kcenter_outliers(pts, k, z)
        res = charikar(pts, k, z)
        got = radius(pts, pts[res.cluster.centers_idx], z)
        assert got <= 3.0 * opt + 1e-9

    def test_charikar_excludes_planted_outliers(self, blobs_with_outliers):
        pts, mask = blobs_with_outliers
        z = int(mask.sum())
        res = charikar(pts, 3, z)
        C = pts[res.cluster.centers_idx]
        d, _ = min_dist(pts, C)
        # the z farthest points must be exactly the planted outliers
        far = np.argsort(d)[-z:]
        assert set(far) == set(np.flatnonzero(mask))

    def test_grid_radius_within_tolerance_of_exact(self, blobs_with_outliers):
        """The grid search's tolerance guarantee relative to the exact
        search: grid.r <= (1+delta) * exact.r (the grid may legitimately
        land *below* the smallest feasible pairwise-distance candidate,
        since feasibility thresholds are scaled by (1+2e)/(3+4e))."""
        pts, mask = blobs_with_outliers
        z = int(mask.sum())
        w = np.ones(len(pts))
        eps_hat = 0.1
        exact = min_feasible_radius_exact(pts, w, 3, z, eps_hat=eps_hat)
        grid = min_feasible_radius(pts, w, 3, z, eps_hat)
        delta = default_delta(eps_hat)
        assert grid.r <= (1 + delta) * exact.r + 1e-9
