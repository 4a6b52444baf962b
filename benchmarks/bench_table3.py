"""Benchmarks for T3 (Figure 4): MapReduce k-center with z outliers —
deterministic (adversarial partitioning) vs randomized variant at mu = 2.
The figure's bottom panel is running time: the randomized variant's
smaller coreset should be visibly faster here too.
Full sweep: jobs/table3_mr_outliers.py.
"""
from benchmarks.conftest import BENCH_K, BENCH_Z
from repro.mapreduce.kcenter_outliers import experiment_tau, mr_kcenter_outliers

ELL = 8


def test_bench_mr_outliers_deterministic_mu2(
    benchmark, spark, bench_points_outliers
):
    pts, mask = bench_points_outliers
    tau = experiment_tau(2, BENCH_K, BENCH_Z, ELL, randomized=False)
    res = benchmark.pedantic(
        lambda: mr_kcenter_outliers(
            spark, pts, BENCH_K, BENCH_Z, ELL, tau=tau,
            partition_mode="adversarial", outlier_mask=mask,
        ),
        rounds=2,
        iterations=1,
    )
    assert res.coreset_weight == len(pts)


def test_bench_mr_outliers_randomized_mu2(
    benchmark, spark, bench_points_outliers
):
    pts, _ = bench_points_outliers
    tau = experiment_tau(2, BENCH_K, BENCH_Z, ELL, randomized=True)
    res = benchmark.pedantic(
        lambda: mr_kcenter_outliers(
            spark, pts, BENCH_K, BENCH_Z, ELL, tau=tau, randomized=True,
        ),
        rounds=2,
        iterations=1,
    )
    assert res.coreset_weight == len(pts)
