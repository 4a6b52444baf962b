"""Unit tests for repro.core.metric — distances, radii, brute-force oracles."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import metric


def naive_cdist(a, b):
    return np.sqrt(((a[:, None, :] - b[None, :, :]) ** 2).sum(-1))


class TestAsPoints:
    def test_list_input(self):
        assert metric.as_points([[1, 2], [3, 4]]).shape == (2, 2)

    def test_1d_promoted(self):
        assert metric.as_points([1.0, 2.0, 3.0]).shape == (1, 3)

    def test_3d_rejected(self):
        with pytest.raises(ValueError):
            metric.as_points(np.zeros((2, 2, 2)))

    def test_dtype_is_float64(self):
        assert metric.as_points([[1, 2]]).dtype == np.float64

    def test_contiguous(self):
        x = np.zeros((4, 6))[:, ::2]
        assert metric.as_points(x).flags["C_CONTIGUOUS"]


class TestCdist:
    @pytest.mark.parametrize("seed", range(5))
    @pytest.mark.parametrize("dim", [1, 2, 7, 50])
    def test_matches_naive(self, seed, dim):
        g = np.random.default_rng(seed)
        a, b = g.normal(size=(8, dim)), g.normal(size=(5, dim))
        np.testing.assert_allclose(
            metric.cdist(a, b), naive_cdist(a, b), atol=1e-9
        )

    def test_self_distance_zero(self):
        g = np.random.default_rng(0)
        a = g.normal(size=(6, 3))
        d = metric.cdist(a, a)
        np.testing.assert_allclose(np.diag(d), 0.0, atol=1e-6)

    def test_symmetry(self):
        g = np.random.default_rng(1)
        a = g.normal(size=(7, 4))
        d = metric.cdist(a, a)
        np.testing.assert_allclose(d, d.T, atol=1e-9)

    def test_no_negative_under_clip(self):
        a = np.full((3, 2), 1e8)
        assert (metric.cdist(a, a) >= 0).all()

    def test_triangle_inequality(self):
        g = np.random.default_rng(2)
        p = g.normal(size=(5, 3))
        d = metric.cdist(p, p)
        for i in range(5):
            for j in range(5):
                for k in range(5):
                    assert d[i, j] <= d[i, k] + d[k, j] + 1e-9


class TestMinDist:
    @pytest.mark.parametrize("seed", range(3))
    def test_matches_full_matrix(self, seed):
        g = np.random.default_rng(seed)
        pts, ctr = g.normal(size=(40, 3)), g.normal(size=(6, 3))
        d, a = metric.min_dist(pts, ctr)
        full = naive_cdist(pts, ctr)
        np.testing.assert_allclose(d, full.min(axis=1), atol=1e-9)
        np.testing.assert_array_equal(a, full.argmin(axis=1))

    def test_chunking_consistent(self, monkeypatch):
        monkeypatch.setattr(metric, "_CHUNK_ENTRIES", 10)
        g = np.random.default_rng(4)
        pts, ctr = g.normal(size=(23, 2)), g.normal(size=(4, 2))
        d, a = metric.min_dist(pts, ctr)
        full = naive_cdist(pts, ctr)
        np.testing.assert_allclose(d, full.min(axis=1), atol=1e-9)
        np.testing.assert_array_equal(a, full.argmin(axis=1))

    def test_point_on_center(self):
        ctr = np.array([[0.0, 0.0], [5.0, 5.0]])
        d, a = metric.min_dist(ctr, ctr)
        np.testing.assert_allclose(d, 0.0, atol=1e-9)
        np.testing.assert_array_equal(a, [0, 1])


class TestRadius:
    def test_plain_radius(self, three_blobs):
        ctr = np.array([[0, 0], [10, 0], [0, 10]], dtype=float)
        r = metric.radius(three_blobs, ctr)
        d, _ = metric.min_dist(three_blobs, ctr)
        assert r == pytest.approx(d.max())

    @pytest.mark.parametrize("z", [0, 1, 3, 5])
    def test_outlier_radius_drops_farthest(self, z):
        dist = np.array([1.0, 2.0, 3.0, 4.0, 5.0, 6.0])
        assert metric.radius_from_distances(dist, z) == 6.0 - z

    def test_z_ge_n_gives_zero(self):
        assert metric.radius_from_distances(np.array([1.0, 2.0]), 2) == 0.0
        assert metric.radius_from_distances(np.array([1.0, 2.0]), 5) == 0.0

    def test_outliers_excluded(self, blobs_with_outliers):
        pts, mask = blobs_with_outliers
        ctr = np.array([[0, 0], [10, 0], [0, 10]], dtype=float)
        r_all = metric.radius(pts, ctr, 0)
        r_z = metric.radius(pts, ctr, int(mask.sum()))
        assert r_z < 5.0 < 100.0 < r_all

    def test_empty_centers_rejected(self):
        with pytest.raises(Exception):
            metric.radius(np.zeros((3, 2)), np.zeros((0, 2)))


class TestGapsAndDiameter:
    def test_pairwise_min_gap(self):
        pts = np.array([[0.0, 0], [1.0, 0], [5.0, 0]])
        assert metric.pairwise_min_gap(pts) == pytest.approx(1.0)

    def test_min_gap_single_point(self):
        assert metric.pairwise_min_gap(np.zeros((1, 2))) == 0.0

    def test_min_gap_duplicates(self):
        pts = np.array([[1.0, 1], [1.0, 1], [3.0, 3]])
        assert metric.pairwise_min_gap(pts) == 0.0

    def test_diameter_bound_covers(self):
        g = np.random.default_rng(5)
        pts = g.normal(size=(50, 4))
        true_diam = metric.cdist(pts, pts).max()
        assert metric.diameter_upper_bound(pts) >= true_diam - 1e-9


class TestBruteForce:
    def test_kcenter_known_instance(self):
        pts = np.array([[0.0, 0], [1.0, 0], [10.0, 0], [11.0, 0]])
        r, c = metric.brute_force_kcenter(pts, 2)
        assert r == pytest.approx(1.0)

    def test_kcenter_outliers_known_instance(self):
        pts = np.array([[0.0, 0], [1.0, 0], [10.0, 0], [11.0, 0], [99.0, 99]])
        r, _ = metric.brute_force_kcenter_outliers(pts, 2, 1)
        assert r == pytest.approx(1.0)

    def test_outliers_relax_objective(self, tiny_points):
        r0, _ = metric.brute_force_kcenter_outliers(tiny_points, 3, 0)
        r2, _ = metric.brute_force_kcenter_outliers(tiny_points, 3, 2)
        assert r2 <= r0

    def test_eq1_rkz_vs_rkplusz(self, tiny_points):
        # Equation (1) of the paper: r*_{k+z}(S) <= r*_{k,z}(S).
        k, z = 2, 2
        r_kz, _ = metric.brute_force_kcenter_outliers(tiny_points, k, z)
        r_kpz, _ = metric.brute_force_kcenter(tiny_points, k + z)
        assert r_kpz <= r_kz + 1e-12

    def test_invalid_k(self, tiny_points):
        with pytest.raises(ValueError):
            metric.brute_force_kcenter(tiny_points, 0)
        with pytest.raises(ValueError):
            metric.brute_force_kcenter(tiny_points, len(tiny_points))

    def test_invalid_z(self, tiny_points):
        with pytest.raises(ValueError):
            metric.brute_force_kcenter_outliers(tiny_points, 2, -1)

    @settings(max_examples=25, deadline=None)
    @given(st.integers(0, 10_000), st.integers(1, 3))
    def test_kcenter_radius_is_achievable(self, seed, k):
        g = np.random.default_rng(seed)
        pts = g.uniform(-1, 1, (7, 2))
        r, c = metric.brute_force_kcenter(pts, k)
        assert metric.radius(pts, pts[list(c)]) == pytest.approx(r)
