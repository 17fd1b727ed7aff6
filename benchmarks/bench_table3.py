"""Benchmark: Table III harness (toy graph, all three heuristics)."""
import pytest

from repro.experiments.tables import table3


@pytest.mark.benchmark(group="table3")
def test_bench_table3(benchmark):
    df = benchmark.pedantic(
        lambda: table3(theta=400, seed=0), rounds=3, iterations=1
    )
    assert df["E (b=2)"].min() == pytest.approx(1.0)
