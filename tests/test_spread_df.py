"""Tests for the pure-DataFrame (Catalyst) iterative spread path."""
import pytest
from pyspark.sql import functions as F

from repro.core.spread import mcs_spread
from repro.core.spread_df import reachable_df, sampled_edges_df, spread_df
from repro.graphs.localgraph import LocalGraph
from repro.graphs.toy import TOY_SEED, toy_edges_df, toy_local_graph
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def toy(spark):
    return toy_edges_df(spark).cache()


def test_sampled_edges_keep_certain_edges(spark, toy):
    sampled = sampled_edges_df(spark, toy, theta=8, seed=0)
    # the 7 p=1 edges must appear in every one of the 8 samples
    certain = sampled.join(
        toy.where(F.col("p") >= 1.0).select("src", "dst"), ["src", "dst"]
    )
    assert certain.count() == 7 * 8


def test_sampled_edges_deterministic(spark, toy):
    a = sampled_edges_df(spark, toy, theta=4, seed=3).orderBy("sample", "src", "dst").collect()
    b = sampled_edges_df(spark, toy, theta=4, seed=3).orderBy("sample", "src", "dst").collect()
    assert a == b


def test_sampled_edges_never_include_p0(spark):
    df = spark.createDataFrame([(1, 2, 0.0), (1, 3, 1.0)], ["src", "dst", "p"])
    sampled = sampled_edges_df(spark, df, theta=32, seed=1)
    assert sampled.where(F.col("dst") == 2).count() == 0
    assert sampled.where(F.col("dst") == 3).count() == 32


def test_reachability_matches_duckdb_recursive_cte(spark):
    """Deterministic graph: DataFrame BFS vs DuckDB WITH RECURSIVE."""
    edges = spark.createDataFrame(
        [(1, 2, 1.0), (2, 3, 1.0), (3, 1, 1.0), (4, 5, 1.0), (2, 4, 0.0)],
        ["src", "dst", "p"],
    )
    sampled = sampled_edges_df(spark, edges, theta=1, seed=0)
    reached = reachable_df(spark, sampled, 1, theta=1).select("v")
    assert_equivalent(
        reached,
        """
        WITH RECURSIVE reach(v) AS (
            SELECT 1 AS v
            UNION
            SELECT e.dst FROM edges e JOIN reach r ON e.src = r.v
            WHERE e.p >= 1.0
        )
        SELECT v FROM reach
        """,
        edges=edges,
    )


def test_spread_df_deterministic_graph(spark):
    edges = spark.createDataFrame(
        [(0, 1, 1.0), (1, 2, 1.0), (5, 6, 1.0)], ["src", "dst", "p"]
    )
    assert spread_df(spark, edges, 0, theta=3, seed=0) == pytest.approx(3.0)


def test_spread_df_toy_close_to_exact(spark, toy):
    """Hash-sampled Catalyst path agrees with exact spread statistically."""
    est = spread_df(spark, toy, TOY_SEED, theta=400, seed=7)
    assert est == pytest.approx(7.66, abs=0.25)


def test_spread_df_cross_validates_kernel_path(spark, toy):
    """Catalyst path vs mapInPandas-kernel path: independent randomness,
    same target quantity."""
    catalyst = spread_df(spark, toy, TOY_SEED, theta=500, seed=1)
    kernel = mcs_spread(toy_local_graph(), r=20_000, seed=2)
    assert catalyst == pytest.approx(kernel, abs=0.3)
