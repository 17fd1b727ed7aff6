"""Benchmark: one Table VII cell (EmailCore × both models, b ∈ {10, 20})."""
import pytest

from repro.experiments.tables import table7_cell


@pytest.mark.benchmark(group="table7")
@pytest.mark.parametrize("model", ["TR", "WC"])
def test_bench_table7_emailcore(benchmark, spark, model):
    df = benchmark.pedantic(
        lambda: table7_cell(
            spark,
            "EmailCore",
            model,
            budgets=(10, 20),
            theta=200,
            r_eval=1000,
            seed=0,
        ),
        rounds=1,
        iterations=1,
    )
    assert (df["GR"] <= df["RA"]).all()
