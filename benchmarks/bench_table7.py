"""Benchmarks for T7 (Figure 8): sequential algorithms — CHARIKARETAL
(the O(k|S|^2 log|S|) baseline) vs the paper's coreset pipeline at mu = 2.
The order-of-magnitude gap between these two benches is the figure's
headline. Full sweep: jobs/table7_sequential.py.
"""
import pytest

from repro.core.search import charikar
from repro.data.datasets import add_outliers, higgs_like
from repro.mapreduce.kcenter_outliers import sequential_coreset_outliers

N, K, Z = 1_500, 10, 30


@pytest.fixture(scope="module")
def seq_points():
    return add_outliers(higgs_like(N, seed=110), Z, seed=111)[0]


def test_bench_charikaretal(benchmark, seq_points):
    res = benchmark.pedantic(
        lambda: charikar(seq_points, K, Z), rounds=2, iterations=1
    )
    assert res.cluster.uncovered_weight <= Z


def test_bench_ours_mu2(benchmark, seq_points):
    res = benchmark.pedantic(
        lambda: sequential_coreset_outliers(
            seq_points, K, Z, tau=2 * (K + Z)
        ),
        rounds=3,
        iterations=1,
    )
    assert len(res[0]) <= K
