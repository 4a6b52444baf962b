"""Benchmarks for T2 (Figure 3): streaming k-center — CORESETSTREAM vs
BASESTREAM at matched space (mu = m = 4). Throughput is the figure's
bottom panel; these benches time the same pass.
Full sweep: jobs/table2_stream_kcenter.py.
"""
from benchmarks.conftest import BENCH_K
from repro.streaming.base_stream import base_stream_kcenter
from repro.streaming.coreset_stream import coreset_stream_kcenter


def test_bench_coresetstream_mu4(benchmark, bench_points):
    res = benchmark.pedantic(
        lambda: coreset_stream_kcenter(bench_points, BENCH_K, mu=4),
        rounds=3,
        iterations=1,
    )
    assert len(res.centers) == BENCH_K


def test_bench_basestream_m4(benchmark, bench_points):
    res = benchmark.pedantic(
        lambda: base_stream_kcenter(bench_points, BENCH_K, m=4),
        rounds=3,
        iterations=1,
    )
    assert len(res.centers) <= BENCH_K
