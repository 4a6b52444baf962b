"""Benchmark for T5 (Figure 6): the randomized MR outliers algorithm on an
inflated (2x) instance — the linear-in-|S| scaling claim is verified by
comparing this bench against bench_table3's un-inflated randomized cell.
Full sweep: jobs/table5_scale_size.py.
"""
import pytest

from benchmarks.conftest import BENCH_K, BENCH_Z
from repro.data.datasets import add_outliers, inflate, power_like
from repro.mapreduce.kcenter_outliers import experiment_tau, mr_kcenter_outliers

ELL = 8


@pytest.fixture(scope="module")
def inflated_points():
    base = inflate(power_like(4_000, seed=101), 2, seed=103)
    return add_outliers(base, BENCH_Z, seed=104)[0]


def test_bench_mr_outliers_inflated_2x(benchmark, spark, inflated_points):
    tau = experiment_tau(2, BENCH_K, BENCH_Z, ELL, randomized=True)
    res = benchmark.pedantic(
        lambda: mr_kcenter_outliers(
            spark, inflated_points, BENCH_K, BENCH_Z, ELL, tau=tau,
            randomized=True,
        ),
        rounds=2,
        iterations=1,
    )
    assert res.coreset_weight == len(inflated_points)
