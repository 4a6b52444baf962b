"""Benchmark for T1 (Figure 2): one representative cell of the MapReduce
k-center sweep — coreset size mu*k per partition, union GMM in round 2.
The full (dataset x ell x mu) table is produced by jobs/table1_mr_kcenter.py.
"""
from benchmarks.conftest import BENCH_K
from repro.mapreduce.kcenter import mr_kcenter


def test_bench_mr_kcenter_mu4_ell4(benchmark, spark, bench_points):
    res = benchmark.pedantic(
        lambda: mr_kcenter(
            spark, bench_points, k=BENCH_K, ell=4, tau=4 * BENCH_K
        ),
        rounds=2,
        iterations=1,
    )
    assert res.radius > 0
