"""Benchmarks for T6 (Figure 7): fixed union-of-coresets size, varying
parallelism ell — coreset-construction time should drop superlinearly with
ell while the round-2 OutliersCluster time stays flat.
Full sweep: jobs/table6_scale_procs.py.
"""
import math

import pytest

from benchmarks.conftest import BENCH_K, BENCH_Z
from repro.mapreduce.kcenter_outliers import mr_kcenter_outliers

UNION = 2 * (8 * BENCH_K + 6 * BENCH_Z)  # mu=2, ell_max=8 shape


@pytest.mark.parametrize("ell", [1, 8])
def test_bench_mr_outliers_fixed_union(
    benchmark, spark, bench_points_outliers, ell
):
    pts, _ = bench_points_outliers
    tau = min(math.ceil(UNION / ell), len(pts) // ell)
    res = benchmark.pedantic(
        lambda: mr_kcenter_outliers(
            spark, pts, BENCH_K, BENCH_Z, ell, tau=tau, randomized=True,
        ),
        rounds=2,
        iterations=1,
    )
    assert res.coreset_size <= UNION + ell
