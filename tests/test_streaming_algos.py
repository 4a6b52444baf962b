"""Tests for the four end-to-end streaming algorithms: CORESETSTREAM,
BASESTREAM, CORESETOUTLIERS, BASEOUTLIERS, and the 2-pass variant."""
import numpy as np
import pytest

from repro.core.metric import brute_force_kcenter_outliers, radius
from repro.streaming.base_outliers import base_stream_outliers
from repro.streaming.base_stream import base_stream_kcenter
from repro.streaming.coreset_outliers import coreset_stream_outliers
from repro.streaming.coreset_stream import coreset_stream_kcenter
from repro.streaming.two_pass import two_pass_outliers
from tests.conftest import planted_clusters


@pytest.fixture(scope="module")
def stream_blobs():
    """4 well-separated blobs; optimum for k=4 is ~ the blob spread (<2),
    while any 3-center solution pays the ~40 separation."""
    pts = planted_clusters(
        60, [(0, 0), (40, 0), (0, 40), (40, 40)], 0.5, seed=10
    )
    g = np.random.default_rng(11)
    return pts[g.permutation(len(pts))]


@pytest.fixture(scope="module")
def stream_blobs_outliers():
    pts = planted_clusters(60, [(0, 0), (40, 0), (0, 40)], 0.5, seed=12)
    far = np.array([[500.0, 500], [-400.0, 300], [300.0, -500], [-450.0, -450]])
    allpts = np.vstack([pts, far])
    g = np.random.default_rng(13)
    return allpts[g.permutation(len(allpts))], len(far)


class TestCoresetStream:
    def test_recovers_planted_clusters(self, stream_blobs):
        res = coreset_stream_kcenter(stream_blobs, 4, mu=4)
        assert radius(stream_blobs, res.centers) < 5.0

    def test_space_bound(self, stream_blobs):
        res = coreset_stream_kcenter(stream_blobs, 4, mu=4)
        assert res.space <= 4 * 4 + 1

    def test_returns_k_centers(self, stream_blobs):
        res = coreset_stream_kcenter(stream_blobs, 4, mu=2)
        assert len(res.centers) == 4

    @pytest.mark.parametrize("mu", [1, 2, 4, 8])
    def test_throughput_positive(self, stream_blobs, mu):
        res = coreset_stream_kcenter(stream_blobs, 4, mu=mu)
        assert res.throughput > 0 and res.n_processed == len(stream_blobs)

    def test_tau_below_k_rejected(self, stream_blobs):
        with pytest.raises(ValueError):
            coreset_stream_kcenter(stream_blobs, 4, tau=2)

    def test_larger_mu_no_worse_radius(self, stream_blobs):
        r1 = radius(stream_blobs,
                    coreset_stream_kcenter(stream_blobs, 4, mu=1).centers)
        r8 = radius(stream_blobs,
                    coreset_stream_kcenter(stream_blobs, 4, mu=8).centers)
        assert r8 <= r1 * 1.5 + 1e-9  # monotone in expectation, slack for ties


class TestBaseStream:
    def test_recovers_planted_clusters(self, stream_blobs):
        res = base_stream_kcenter(stream_blobs, 4, m=4)
        assert radius(stream_blobs, res.centers) < 10.0

    def test_at_most_k_centers(self, stream_blobs):
        res = base_stream_kcenter(stream_blobs, 4, m=2)
        assert 1 <= len(res.centers) <= 4

    def test_space_reported(self, stream_blobs):
        res = base_stream_kcenter(stream_blobs, 4, m=8)
        assert res.space == 8 * 4

    def test_invalid_m(self, stream_blobs):
        with pytest.raises(ValueError):
            base_stream_kcenter(stream_blobs, 4, m=0)

    def test_degenerate_few_distinct(self):
        pts = np.tile([[1.0, 1.0]], (10, 1))
        res = base_stream_kcenter(pts, 3, m=2)
        assert radius(pts, res.centers) == pytest.approx(0.0, abs=1e-9)

    def test_more_instances_finer_radius(self, stream_blobs):
        """m=16's guess ladder is finer than m=1's: final radius should not
        be substantially worse."""
        r1 = radius(stream_blobs,
                    base_stream_kcenter(stream_blobs, 4, m=1).centers)
        r16 = radius(stream_blobs,
                     base_stream_kcenter(stream_blobs, 4, m=16).centers)
        assert r16 <= r1 * 2.0 + 1e-9


class TestCoresetOutliers:
    def test_excludes_planted_outliers(self, stream_blobs_outliers):
        pts, z = stream_blobs_outliers
        res = coreset_stream_outliers(pts, 3, z, mu=2)
        assert radius(pts, res.centers, z) < 5.0

    def test_space_bound(self, stream_blobs_outliers):
        pts, z = stream_blobs_outliers
        res = coreset_stream_outliers(pts, 3, z, mu=2)
        assert res.space <= 2 * (3 + z) + 1

    def test_theorem3_bound_small_instance(self):
        """(3+eps)-approximation against the brute-force optimum."""
        g = np.random.default_rng(20)
        pts = g.uniform(-1, 1, (10, 2))
        k, z = 2, 1
        opt, _ = brute_force_kcenter_outliers(pts, k, z)
        # generous coreset (mu large) -> near-sequential quality
        res = coreset_stream_outliers(pts, k, z, tau=9, eps_hat=0.1)
        got = radius(pts, res.centers, z)
        assert got <= (3 + 6 * 0.1) * opt + 1e-6

    def test_tau_validation(self, stream_blobs_outliers):
        pts, z = stream_blobs_outliers
        with pytest.raises(ValueError):
            coreset_stream_outliers(pts, 3, z, tau=2)


class TestBaseOutliers:
    def test_excludes_planted_outliers(self, stream_blobs_outliers):
        pts, z = stream_blobs_outliers
        res = base_stream_outliers(pts, 3, z, m=2)
        assert radius(pts, res.centers, z) < 20.0

    def test_at_most_k_centers(self, stream_blobs_outliers):
        pts, z = stream_blobs_outliers
        res = base_stream_outliers(pts, 3, z, m=1)
        assert 1 <= len(res.centers) <= 3

    def test_space_larger_than_coreset_stream(self, stream_blobs_outliers):
        """The paper's central space comparison: BASEOUTLIERS burns ~k*z
        memory where CORESETOUTLIERS uses ~(k+z)."""
        pts, z = stream_blobs_outliers
        base = base_stream_outliers(pts, 3, z, m=1)
        ours = coreset_stream_outliers(pts, 3, z, mu=1)
        assert base.space > ours.space

    def test_invalid_params(self, stream_blobs_outliers):
        pts, z = stream_blobs_outliers
        with pytest.raises(ValueError):
            base_stream_outliers(pts, 3, z, m=0)
        with pytest.raises(ValueError):
            base_stream_outliers(pts, 3, 0, m=1)


class TestTwoPass:
    def test_excludes_planted_outliers(self, stream_blobs_outliers):
        pts, z = stream_blobs_outliers
        res = two_pass_outliers(pts, 3, z, eps=0.6)
        assert radius(pts, res.centers, z) < 5.0

    def test_processes_twice(self, stream_blobs_outliers):
        pts, z = stream_blobs_outliers
        res = two_pass_outliers(pts, 3, z)
        assert res.n_processed == 2 * len(pts)

    def test_theorem_bound_small_instance(self):
        g = np.random.default_rng(21)
        pts = g.uniform(-1, 1, (10, 2))
        k, z = 2, 1
        opt, _ = brute_force_kcenter_outliers(pts, k, z)
        res = two_pass_outliers(pts, k, z, eps=0.6)
        assert radius(pts, res.centers, z) <= (3 + 0.6) * opt + 1e-6

    def test_space_bound_low_dimension(self):
        """|T| <= (k+z)(96/eps)^D with D~1 for collinear data (loose)."""
        x = np.sort(np.random.default_rng(22).uniform(0, 100, 400))
        pts = np.stack([x, np.zeros_like(x)], axis=1)
        k, z, eps = 3, 2, 1.0
        res = two_pass_outliers(pts, k, z, eps=eps)
        assert res.space <= (k + z) * 96 * 4  # D=1 bound with sampling slack
