"""Benchmark: BG vs AG vs GR wall-clock (the Figs. 7/8 claim).

Each algorithm is its own benchmark so the report shows the gap directly.
"""
import pytest

from repro.algorithms.advanced_greedy import advanced_greedy
from repro.algorithms.baseline import baseline_greedy
from repro.algorithms.greedy_replace import greedy_replace
from repro.experiments.harness import build_workload

B = 2
THETA = 200
R_BG = 60


@pytest.fixture(scope="module")
def wl(spark):
    return build_workload(spark, "EmailCore", "TR", n_seeds=10, seed=0)


@pytest.mark.benchmark(group="efficiency")
def test_bench_bg(benchmark, spark, wl):
    out = benchmark.pedantic(
        lambda: baseline_greedy(wl.graph, B, r=R_BG, seed=0, spark=spark),
        rounds=1,
        iterations=1,
    )
    assert len(out) == B


@pytest.mark.benchmark(group="efficiency")
def test_bench_ag(benchmark, spark, wl):
    out = benchmark.pedantic(
        lambda: advanced_greedy(wl.graph, B, theta=THETA, seed=0, spark=spark),
        rounds=1,
        iterations=1,
    )
    assert len(out) == B


@pytest.mark.benchmark(group="efficiency")
def test_bench_gr(benchmark, spark, wl):
    out = benchmark.pedantic(
        lambda: greedy_replace(wl.graph, B, theta=THETA, seed=0, spark=spark),
        rounds=1,
        iterations=1,
    )
    assert len(out) == B
