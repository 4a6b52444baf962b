"""Tests for repro.data.datasets — generators, outlier injection (Section
5.2 procedure), inflation (Section 5.3), Spark conversion."""
import numpy as np
import pytest

from repro.core.metric import cdist
from repro.data import datasets as ds


class TestGenerators:
    @pytest.mark.parametrize("name,dim", [("higgs", 7), ("power", 7), ("wiki", 50)])
    def test_shape(self, name, dim):
        X = ds.DATASETS[name](500, seed=0)
        assert X.shape == (500, dim)

    @pytest.mark.parametrize("name", ["higgs", "power", "wiki"])
    def test_deterministic(self, name):
        a = ds.DATASETS[name](200, seed=7)
        b = ds.DATASETS[name](200, seed=7)
        np.testing.assert_array_equal(a, b)

    @pytest.mark.parametrize("name", ["higgs", "power", "wiki"])
    def test_seed_changes_data(self, name):
        a = ds.DATASETS[name](200, seed=1)
        b = ds.DATASETS[name](200, seed=2)
        assert not np.array_equal(a, b)

    def test_finite(self):
        for name in ds.DATASETS:
            assert np.isfinite(ds.DATASETS[name](300)).all()

    def test_clustered_structure(self):
        """higgs_like must be clusterable: GMM with the generator's cluster
        count should give a much smaller radius than a single center."""
        from repro.core.gmm import gmm

        X = ds.higgs_like(2000, seed=3)
        r1 = gmm(X, 1).radii[-1]
        r40 = gmm(X, 40).radii[-1]
        assert r40 < 0.5 * r1


class TestMeb:
    def test_covers_all_points(self):
        X = ds.higgs_like(500)
        c, r = ds.meb_approx(X)
        assert (cdist(X, c[None, :]) <= r + 1e-9).all()

    def test_single_point(self):
        c, r = ds.meb_approx(np.array([[3.0, 4.0]]))
        np.testing.assert_allclose(c, [3.0, 4.0])
        assert r == 0.0


class TestAddOutliers:
    def test_z_zero_identity(self):
        X = ds.higgs_like(100)
        Y, mask = ds.add_outliers(X, 0)
        np.testing.assert_array_equal(X, Y)
        assert not mask.any()

    @pytest.mark.parametrize("name", ["higgs", "power", "wiki"])
    def test_paper_distance_properties(self, name):
        """Section 5.2: each injected point is >= 99*r_MEB from every
        original point, and injected points are pairwise >= 10*r_MEB."""
        X = ds.DATASETS[name](400, seed=4)
        _, r = ds.meb_approx(X)
        Y, mask = ds.add_outliers(X, 12, seed=5)
        out, orig = Y[mask], Y[~mask]
        assert (cdist(out, orig).min(axis=1) >= 99 * r).all()
        D = cdist(out, out)
        off = D[~np.eye(len(out), dtype=bool)]
        assert off.min() >= 10 * r

    def test_mask_and_count(self):
        X = ds.power_like(300)
        Y, mask = ds.add_outliers(X, 7, seed=1)
        assert len(Y) == 307 and mask.sum() == 7
        np.testing.assert_array_equal(Y[:300], X)

    def test_deterministic(self):
        X = ds.wiki_like(200)
        a, _ = ds.add_outliers(X, 5, seed=9)
        b, _ = ds.add_outliers(X, 5, seed=9)
        np.testing.assert_array_equal(a, b)


class TestInflate:
    def test_factor_one_copy(self):
        X = ds.higgs_like(100)
        Y = ds.inflate(X, 1)
        np.testing.assert_array_equal(X, Y)
        assert Y is not X

    @pytest.mark.parametrize("h", [2, 3, 5])
    def test_size(self, h):
        X = ds.higgs_like(100)
        assert len(ds.inflate(X, h)) == 100 * h

    def test_originals_preserved(self):
        X = ds.higgs_like(100)
        Y = ds.inflate(X, 3, seed=2)
        np.testing.assert_array_equal(Y[:100], X)

    def test_perturbation_scale(self):
        """New points stay near the base cloud: noise sigma is 10% of the
        coordinate range, so inflation must not explode the bounding box."""
        X = ds.higgs_like(500, seed=6)
        Y = ds.inflate(X, 4, seed=3)
        rng_x = X.max(axis=0) - X.min(axis=0)
        assert (Y.max(axis=0) <= X.max(axis=0) + rng_x).all()
        assert (Y.min(axis=0) >= X.min(axis=0) - rng_x).all()

    def test_invalid_factor(self):
        with pytest.raises(ValueError):
            ds.inflate(ds.higgs_like(10), 0)


class TestSparkConversion:
    def test_round_trip(self, spark):
        X = ds.higgs_like(200, seed=8)
        df = ds.to_spark(spark, X)
        Y = ds.from_spark(df)
        np.testing.assert_allclose(X, Y)

    def test_schema(self, spark):
        df = ds.to_spark(spark, ds.power_like(50))
        assert [f.name for f in df.schema.fields] == ["id", "pid", "features"]

    def test_pids_carried(self, spark):
        X = ds.higgs_like(60)
        pids = np.arange(60) % 4
        df = ds.to_spark(spark, X, pids=pids)
        got = {r.id: r.pid for r in df.select("id", "pid").collect()}
        assert all(got[i] == i % 4 for i in range(60))
