"""Smoke + sanity tests for the seven table harnesses (T1-T7) at tiny
scale: each must run end-to-end, return the expected row structure, and
satisfy basic invariants (ratios >= 1, expected sweep cells present)."""
import numpy as np
import pytest

from repro.experiments import (
    table1_mr_kcenter,
    table2_stream_kcenter,
    table3_mr_outliers,
    table4_stream_outliers,
    table5_scale_size,
    table6_scale_procs,
    table7_sequential,
)
from repro.experiments.common import add_ratio, make_datasets, shuffled

TINY_K = {"higgs": 5, "power": 5, "wiki": 5}


class TestCommon:
    def test_add_ratio_min_is_one(self):
        import pandas as pd

        df = pd.DataFrame(
            {"dataset": ["a", "a", "b", "b"], "radius": [2.0, 4.0, 1.0, 3.0]}
        )
        out = add_ratio(df, ["dataset"])
        assert out[out.dataset == "a"].ratio.min() == 1.0
        assert out[out.dataset == "b"].ratio.max() == 3.0

    def test_make_datasets_masks(self):
        data = make_datasets(300, z=5, names=("higgs",), seed=1)
        X, mask = data["higgs"]
        assert len(X) == 305 and mask.sum() == 5

    def test_shuffled_is_permutation(self):
        X = np.arange(20, dtype=float).reshape(10, 2)
        Y = shuffled(X, 3)
        assert sorted(map(tuple, Y.tolist())) == sorted(map(tuple, X.tolist()))


class TestT1(object):
    def test_runs_and_ratios(self, spark):
        df = table1_mr_kcenter.run(
            spark, n=600, k_map=TINY_K, mus=(1, 2), ells=(2,),
            names=("higgs",),
        )
        assert set(df.columns) >= {"dataset", "ell", "mu", "radius", "ratio"}
        assert len(df) == 2
        assert (df.ratio >= 1.0 - 1e-12).all()
        assert (df.coreset_size > 0).all()


class TestT2:
    def test_runs_and_structure(self):
        df = table2_stream_kcenter.run(
            n=500, k_map=TINY_K, mus=(1, 2), ms=(1, 2), names=("power",)
        )
        assert set(df.algo) == {"CORESETSTREAM", "BASESTREAM"}
        assert len(df) == 4
        assert (df.throughput > 0).all()
        assert (df.ratio >= 1.0 - 1e-12).all()


class TestT3:
    def test_runs_both_variants(self, spark):
        df = table3_mr_outliers.run(
            spark, n=600, k=3, z=8, ell=4, mus=(1, 2), names=("higgs",)
        )
        assert set(df.variant) == {"deterministic", "randomized"}
        assert len(df) == 4
        assert (df.t_total > 0).all()
        assert (df.ratio >= 1.0 - 1e-12).all()


class TestT4:
    def test_runs_and_space_ordering(self):
        df = table4_stream_outliers.run(
            n=500, k=3, z=8, mus=(1, 2), ms=(1,), names=("wiki",)
        )
        ours = df[df.algo == "CORESETOUTLIERS"]
        base = df[df.algo == "BASEOUTLIERS"]
        # the paper's central claim: baseline burns more space at m=1 than
        # ours at mu in {1,2}
        assert base.space.min() > ours.space.max()


class TestT5:
    def test_runs_and_sizes(self, spark):
        df = table5_scale_size.run(
            spark, base_n=300, hs=(1, 2), k=3, z=5, ell=2, mu=2,
            names=("higgs",),
        )
        assert list(df.h) == [1, 2]
        assert df.n.iloc[1] == 2 * 300 + 5
        assert (df.t_total > 0).all()


class TestT6:
    def test_runs_fixed_union(self, spark):
        df = table6_scale_procs.run(
            spark, n=600, ells=(1, 2), k=3, z=5, mu=2, ell_max=2,
            names=("power",),
        )
        assert list(df.ell) == [1, 2]
        assert (df.t_coreset > 0).all() and (df.t_cluster > 0).all()


class TestT7:
    def test_runs_all_algorithms(self):
        df = table7_sequential.run(
            n=250, k=3, z=5, mus=(1, 2), names=("higgs",)
        )
        assert set(df.algo) == {"CHARIKARETAL", "MALKOMESETAL", "OURS(mu=2)"}
        assert (df.time_s > 0).all()
        assert (df.ratio >= 1.0 - 1e-12).all()

    def test_coreset_speedup_over_charikar(self):
        """The Figure 8 headline at small scale: coreset preprocessing is
        faster than CHARIKARETAL on the full sample."""
        df = table7_sequential.run(
            n=600, k=3, z=10, mus=(1,), names=("power",)
        )
        t_ck = df[df.algo == "CHARIKARETAL"].time_s.iloc[0]
        t_mk = df[df.algo == "MALKOMESETAL"].time_s.iloc[0]
        assert t_mk < t_ck
