"""Benchmark: Table IV dataset generation + statistics at default scale."""
import pytest

from repro.experiments.tables import table4


@pytest.mark.benchmark(group="table4")
def test_bench_table4(benchmark):
    df = benchmark.pedantic(
        lambda: table4(seed=0), rounds=1, iterations=1
    )
    assert len(df) == 8
