"""Tests for repro.core.outliers_cluster — Algorithm 1 semantics and the
Lemma 5 guarantee."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.gmm import gmm_coreset_fixed
from repro.core.metric import brute_force_kcenter_outliers, cdist, min_dist
from repro.core.outliers_cluster import outliers_cluster


class TestMechanics:
    def test_at_most_k_centers(self, three_blobs):
        res = outliers_cluster(three_blobs, np.ones(len(three_blobs)), 3, 1.0, 0.1)
        assert res.n_centers <= 3

    def test_stops_when_all_covered(self, three_blobs):
        # Huge radius: the first center's ball covers everything.
        res = outliers_cluster(three_blobs, np.ones(len(three_blobs)), 3, 1e6, 0.1)
        assert res.n_centers == 1
        assert not res.uncovered.any()

    def test_covered_points_within_big_ball(self, blobs_with_outliers):
        pts, _ = blobs_with_outliers
        w = np.ones(len(pts))
        r, eps = 1.0, 0.1
        res = outliers_cluster(pts, w, 3, r, eps)
        C = pts[res.centers_idx]
        d, _ = min_dist(pts, C)
        covered = ~res.uncovered
        assert (d[covered] <= (3 + 4 * eps) * r + 1e-9).all()

    def test_uncovered_points_outside_big_ball(self, blobs_with_outliers):
        pts, _ = blobs_with_outliers
        w = np.ones(len(pts))
        r, eps = 1.0, 0.1
        res = outliers_cluster(pts, w, 3, r, eps)
        if res.uncovered.any():
            C = pts[res.centers_idx]
            d, _ = min_dist(pts, C)
            assert (d[res.uncovered] > (3 + 4 * eps) * r - 1e-9).all()

    def test_uncovered_weight_consistent(self, blobs_with_outliers):
        pts, _ = blobs_with_outliers
        g = np.random.default_rng(0)
        w = g.integers(1, 5, len(pts)).astype(float)
        res = outliers_cluster(pts, w, 3, 1.0, 0.1)
        assert res.uncovered_weight == pytest.approx(w[res.uncovered].sum())

    def test_greedy_picks_max_weight_ball_first(self):
        # Two groups; one has far larger aggregate weight: its area must
        # host the first center.
        pts = np.array([[0.0, 0], [0.1, 0], [50.0, 0], [50.1, 0]])
        w = np.array([1.0, 1.0, 100.0, 100.0])
        res = outliers_cluster(pts, w, 1, 1.0, 0.0)
        assert pts[res.centers_idx[0]][0] >= 49.0

    def test_center_need_not_be_uncovered(self):
        """After round 1 covers a region, a later center may still be a
        covered point if its ball has max uncovered weight."""
        pts = np.array([[0.0, 0], [7.0, 0], [14.0, 0]])
        w = np.array([1.0, 5.0, 1.0])
        res = outliers_cluster(pts, w, 2, 1.0, 0.0)
        assert res.n_centers <= 2  # smoke: selection ran with ties fine

    def test_zero_radius(self, three_blobs):
        w = np.ones(len(three_blobs))
        res = outliers_cluster(three_blobs, w, 2, 0.0, 0.1)
        # r=0 covers only coincident points: at most 2 covered "locations".
        assert res.n_centers == 2

    def test_validation(self, three_blobs):
        w = np.ones(len(three_blobs))
        with pytest.raises(ValueError):
            outliers_cluster(three_blobs, w[:-1], 2, 1.0, 0.1)
        with pytest.raises(ValueError):
            outliers_cluster(three_blobs, w, 0, 1.0, 0.1)
        with pytest.raises(ValueError):
            outliers_cluster(three_blobs, w, 2, -1.0, 0.1)
        with pytest.raises(ValueError):
            outliers_cluster(
                three_blobs, w, 2, 1.0, 0.1, dist_matrix=np.zeros((2, 2))
            )

    def test_precomputed_matrix_matches(self, blobs_with_outliers):
        pts, _ = blobs_with_outliers
        w = np.ones(len(pts))
        D = cdist(pts, pts)
        a = outliers_cluster(pts, w, 3, 1.0, 0.1)
        b = outliers_cluster(pts, w, 3, 1.0, 0.1, dist_matrix=D)
        np.testing.assert_array_equal(a.centers_idx, b.centers_idx)
        np.testing.assert_array_equal(a.uncovered, b.uncovered)


class TestLemma5:
    """At any r >= r*_{k,z}(S): the points of S whose proxies remain
    uncovered number at most z."""

    @pytest.mark.parametrize("seed", range(6))
    def test_unit_weights_uncovered_at_most_z(self, seed):
        g = np.random.default_rng(seed)
        pts = g.uniform(-1, 1, (9, 2))
        k, z = 2, 2
        opt, _ = brute_force_kcenter_outliers(pts, k, z)
        res = outliers_cluster(pts, np.ones(len(pts)), k, opt, 0.0)
        assert res.uncovered_weight <= z

    @settings(max_examples=25, deadline=None)
    @given(st.integers(0, 10**6), st.floats(0.0, 0.3))
    def test_unit_weights_hypothesis(self, seed, eps_hat):
        g = np.random.default_rng(seed)
        pts = g.normal(size=(8, 2))
        k, z = 2, 1
        opt, _ = brute_force_kcenter_outliers(pts, k, z)
        res = outliers_cluster(pts, np.ones(len(pts)), k, opt, eps_hat)
        assert res.uncovered_weight <= z

    def test_weighted_coreset_s_tprime_bound(self, blobs_with_outliers):
        """The full Lemma 5 statement over a *weighted coreset*: S_{T'} =
        {s : p(s) in T'} has size <= z when r >= r*_{k,z}(S)."""
        pts, mask = blobs_with_outliers
        k, z = 3, int(mask.sum())
        # weighted coreset from GMM with proxy weights
        T, w, res_gmm = gmm_coreset_fixed(pts, k + z + 5)
        # r*_{k,z}(S) upper bound: radius of planted solution
        opt_ub = 2.0  # blobs have std 0.3 around known centers
        res = outliers_cluster(T, w.astype(float), k, opt_ub, 0.1)
        # |S_{T'}|: points whose proxy is uncovered
        s_tprime = res.uncovered[res_gmm.assign].sum()
        assert s_tprime <= z

    def test_radius_larger_means_feasible(self, blobs_with_outliers):
        pts, mask = blobs_with_outliers
        w = np.ones(len(pts))
        k, z = 3, int(mask.sum())
        opt, _ = brute_force_kcenter_outliers(pts[::4], k, 2)  # rough scale
        res = outliers_cluster(pts, w, k, 10.0, 0.1)
        assert res.uncovered_weight <= z
