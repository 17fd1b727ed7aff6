"""Benchmark: Table V harness (Exact vs GR, TR model, reduced grid)."""
import pytest

from repro.experiments.tables import exact_vs_gr


@pytest.mark.benchmark(group="table5")
def test_bench_table5(benchmark, spark):
    df = benchmark.pedantic(
        lambda: exact_vs_gr(
            spark,
            "TR",
            n_subgraphs=2,
            n_target=18,
            n_seeds=3,
            budgets=(1, 2, 3),
            theta=150,
            theta_eval=600,
            gr_theta=300,
            seed=0,
        ),
        rounds=1,
        iterations=1,
    )
    ratios = df["Ratio"].str.rstrip("%").astype(float)
    assert (ratios > 90).all()
