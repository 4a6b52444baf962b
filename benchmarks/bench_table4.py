"""Benchmarks for T4 (Figure 5): streaming k-center with z outliers —
CORESETOUTLIERS (space mu*(k+z)) vs BASEOUTLIERS (space ~k*z). The paper's
throughput gap (>= 1 order of magnitude at matched quality) shows up as
the runtime gap between these two benches.
Full sweep: jobs/table4_stream_outliers.py.
"""
from benchmarks.conftest import BENCH_K, BENCH_Z
from repro.streaming.base_outliers import base_stream_outliers
from repro.streaming.coreset_outliers import coreset_stream_outliers


def test_bench_coresetoutliers_mu2(benchmark, bench_points_outliers):
    pts, _ = bench_points_outliers
    res = benchmark.pedantic(
        lambda: coreset_stream_outliers(pts, BENCH_K, BENCH_Z, mu=2),
        rounds=3,
        iterations=1,
    )
    assert len(res.centers) <= BENCH_K


def test_bench_baseoutliers_m1(benchmark, bench_points_outliers):
    pts, _ = bench_points_outliers
    res = benchmark.pedantic(
        lambda: base_stream_outliers(pts, BENCH_K, BENCH_Z, m=1),
        rounds=2,
        iterations=1,
    )
    assert len(res.centers) <= BENCH_K
