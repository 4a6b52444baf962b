"""Tests for repro.core.gmm — farthest-first traversal and the coreset
constructions (Lemma 1, Lemma 2's stopping rule, proxy weights)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.gmm import gmm, gmm_coreset_adaptive, gmm_coreset_fixed
from repro.core.metric import (
    brute_force_kcenter,
    cdist,
    min_dist,
    radius,
)
from tests.conftest import planted_clusters


class TestGmmBasics:
    def test_first_center_is_first_point(self, three_blobs):
        res = gmm(three_blobs, 3)
        assert res.centers_idx[0] == 0

    def test_requested_tau(self, three_blobs):
        res = gmm(three_blobs, 7)
        assert res.tau == 7

    def test_tau_capped_at_n(self, tiny_points):
        res = gmm(tiny_points, 50)
        assert res.tau == len(tiny_points)
        # GEMM-form distances carry ~1e-8 cancellation noise at zero.
        assert res.radii[-1] == pytest.approx(0.0, abs=1e-6)

    def test_radii_non_increasing(self, three_blobs):
        res = gmm(three_blobs, 20)
        assert (np.diff(res.radii) <= 1e-12).all()

    def test_final_dist_matches_radius(self, three_blobs):
        res = gmm(three_blobs, 5)
        assert res.radii[-1] == pytest.approx(res.dist.max())

    def test_assignment_is_nearest_center(self, three_blobs):
        res = gmm(three_blobs, 6)
        C = res.centers(three_blobs)
        d, a = min_dist(three_blobs, C)
        np.testing.assert_allclose(res.dist, d, atol=1e-9)
        # argmin ties can differ; distances must agree exactly.
        np.testing.assert_allclose(
            np.linalg.norm(three_blobs - C[res.assign], axis=1), d, atol=1e-9
        )

    def test_prefix_property(self, three_blobs):
        """Incrementality: the first j centers of a longer run equal a
        shorter run's output — the property the MR round-1 rule relies on."""
        long = gmm(three_blobs, 10)
        short = gmm(three_blobs, 4)
        np.testing.assert_array_equal(long.centers_idx[:4], short.centers_idx)

    def test_anticover(self, three_blobs):
        """Selected centers are pairwise farther apart than the final
        radius — the greedy-choice property used in Lemma 1's proof."""
        res = gmm(three_blobs, 5)
        C = res.centers(three_blobs)
        D = cdist(C, C)
        off = D[~np.eye(len(C), dtype=bool)]
        assert off.min() >= res.radii[-1] - 1e-9

    def test_three_centers_hit_three_blobs(self, three_blobs):
        res = gmm(three_blobs, 3)
        C = res.centers(three_blobs)
        # One center per planted blob: radius must be ~ the blob spread.
        assert radius(three_blobs, C) < 2.0

    def test_duplicate_points_stop_early(self):
        pts = np.array([[0.0, 0]] * 5 + [[1.0, 1]] * 5)
        res = gmm(pts, 6)
        assert res.tau == 2  # only two distinct locations exist
        assert res.radii[-1] == pytest.approx(0.0)

    def test_empty_rejected(self):
        with pytest.raises(ValueError):
            gmm(np.zeros((0, 2)), 1)

    def test_bad_first_rejected(self, tiny_points):
        with pytest.raises(ValueError):
            gmm(tiny_points, 2, first=len(tiny_points))

    @pytest.mark.parametrize("first", [0, 3, 9])
    def test_first_center_choice_respected(self, tiny_points, first):
        res = gmm(tiny_points, 3, first=first)
        assert res.centers_idx[0] == first


class TestLemma1:
    """r_{T_X}(X) <= 2 * r*_k(S) for X subset of S (here X = S)."""

    @pytest.mark.parametrize("seed", range(8))
    @pytest.mark.parametrize("k", [1, 2, 3])
    def test_two_approx_random(self, seed, k):
        g = np.random.default_rng(seed)
        pts = g.uniform(-1, 1, (10, 2))
        opt, _ = brute_force_kcenter(pts, k)
        res = gmm(pts, k)
        assert res.radii[-1] <= 2.0 * opt + 1e-9

    @settings(max_examples=30, deadline=None)
    @given(st.integers(0, 10**6), st.integers(1, 3), st.integers(5, 9))
    def test_two_approx_hypothesis(self, seed, k, n):
        g = np.random.default_rng(seed)
        pts = g.normal(size=(n, 2))
        opt, _ = brute_force_kcenter(pts, k)
        res = gmm(pts, k, first=int(g.integers(0, n)))
        assert res.radii[-1] <= 2.0 * opt + 1e-9

    def test_subset_bound(self):
        """Lemma 1 proper: GMM on a subset X still 2-approximates r*_k(S)."""
        g = np.random.default_rng(11)
        S = g.uniform(-1, 1, (12, 2))
        X = S[::2]
        k = 2
        opt_S, _ = brute_force_kcenter(S, k)
        res = gmm(X, k)
        assert res.radii[-1] <= 2.0 * opt_S + 1e-9


class TestWeights:
    def test_weights_sum_to_n(self, three_blobs):
        _, w, _ = gmm_coreset_fixed(three_blobs, 7)
        assert w.sum() == len(three_blobs)

    def test_weights_positive(self, three_blobs):
        _, w, _ = gmm_coreset_fixed(three_blobs, 7)
        assert (w >= 1).all()

    def test_weight_counts_match_assignment(self, three_blobs):
        C, w, res = gmm_coreset_fixed(three_blobs, 5)
        for t in range(len(C)):
            assert w[t] == (res.assign == t).sum()

    def test_proxy_distance_bounded_by_radius(self, three_blobs):
        """d(s, p(s)) <= r_T(S_i) for every point — the proxy property."""
        C, _, res = gmm_coreset_fixed(three_blobs, 6)
        d = np.linalg.norm(three_blobs - C[res.assign], axis=1)
        assert d.max() <= res.radii[-1] + 1e-9


class TestFixedCoreset:
    @pytest.mark.parametrize("tau", [3, 5, 10, 30])
    def test_size(self, three_blobs, tau):
        C, w, _ = gmm_coreset_fixed(three_blobs, tau)
        assert len(C) == tau and len(w) == tau

    def test_larger_tau_smaller_residual(self, three_blobs):
        _, _, r1 = gmm_coreset_fixed(three_blobs, 3)
        _, _, r2 = gmm_coreset_fixed(three_blobs, 12)
        assert r2.radii[-1] <= r1.radii[-1] + 1e-12


class TestAdaptiveCoreset:
    def test_stopping_condition_met(self, three_blobs):
        """On stop at tau: r_tau <= (eps/2) * r_k (Section 3.1's rule)."""
        k, eps = 3, 0.5
        _, _, res = gmm_coreset_adaptive(three_blobs, k, eps)
        assert res.tau >= k
        assert res.radii[-1] <= (eps / 2.0) * res.radii[k - 1] + 1e-12

    def test_minimality(self, three_blobs):
        """tau is the *first* iteration >= k meeting the rule."""
        k, eps = 3, 0.5
        _, _, res = gmm_coreset_adaptive(three_blobs, k, eps)
        if res.tau > k:
            assert res.radii[res.tau - 2] > (eps / 2.0) * res.radii[k - 1]

    @pytest.mark.parametrize("eps", [1.0, 0.5, 0.25])
    def test_smaller_eps_larger_coreset(self, eps):
        pts = planted_clusters(40, [(0, 0), (6, 0), (0, 6), (6, 6)], 1.0, seed=9)
        _, _, res = gmm_coreset_adaptive(pts, 4, eps)
        _, _, res_big = gmm_coreset_adaptive(pts, 4, eps / 2)
        assert res_big.tau >= res.tau

    def test_lemma2_proxy_bound(self):
        """Lemma 2: d(s, p(s)) <= eps * r*_k(S) when run on a subset."""
        g = np.random.default_rng(21)
        S = g.uniform(-1, 1, (12, 2))
        k, eps = 2, 0.5
        opt, _ = brute_force_kcenter(S, k)
        X = S[:6]
        C, _, res = gmm_coreset_adaptive(X, k, eps)
        d = np.linalg.norm(X - C[res.assign], axis=1)
        assert d.max() <= eps * opt + 1e-9

    def test_weights_sum(self, three_blobs):
        _, w, _ = gmm_coreset_adaptive(three_blobs, 3, 0.5)
        assert w.sum() == len(three_blobs)

    def test_invalid_eps(self, three_blobs):
        with pytest.raises(ValueError):
            gmm_coreset_adaptive(three_blobs, 3, 0.0)

    def test_max_tau_cap(self, three_blobs):
        _, _, res = gmm_coreset_adaptive(three_blobs, 3, 1e-9, max_tau=10)
        assert res.tau <= 10


class TestDoublingDimensionBound:
    def test_lemma3_bound_low_dimension(self):
        """Lemma 3: |T_i| <= k * (4/eps)^D. For points on a line (D = 1)
        the adaptive coreset must stay small."""
        g = np.random.default_rng(30)
        x = np.sort(g.uniform(0, 100, 500))
        pts = np.stack([x, np.zeros_like(x)], axis=1)
        k, eps = 4, 0.5
        _, _, res = gmm_coreset_adaptive(pts, k, eps)
        # D=1 bound with slack for the discrete-sample deviation.
        assert res.tau <= k * int(4 / eps) * 4
