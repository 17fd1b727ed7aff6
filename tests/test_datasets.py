"""Tests for the Table IV dataset registry and its synthetic equivalents."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.graphs.datasets import DATASETS, generate_edges, load, stats_row
from repro.oracle import assert_equivalent

PAPER_ORDER = [
    "EmailCore", "Facebook", "Wiki-Vote", "EmailAll",
    "DBLP", "Twitter", "Stanford", "Youtube",
]


def test_registry_matches_paper_table4():
    assert list(DATASETS) == PAPER_ORDER
    # spot-check the transcribed paper statistics
    assert DATASETS["EmailCore"].n == 1_005 and DATASETS["EmailCore"].m == 25_571
    assert DATASETS["Youtube"].n == 1_134_890 and DATASETS["Youtube"].m == 2_987_624
    assert not DATASETS["Facebook"].directed
    assert DATASETS["Stanford"].directed


@pytest.mark.parametrize("name", PAPER_ORDER)
def test_scaled_sizes_positive(name):
    n, m = DATASETS[name].scaled(0.01)
    assert n >= 16 and m >= 16


@pytest.mark.parametrize("name", ["EmailCore", "DBLP", "Twitter"])
def test_generate_edges_deterministic(name):
    n1, e1 = generate_edges(name, scale=0.01, seed=7)
    n2, e2 = generate_edges(name, scale=0.01, seed=7)
    assert n1 == n2
    np.testing.assert_array_equal(e1, e2)


@pytest.mark.parametrize("name", ["EmailCore", "Facebook"])
def test_stats_row_shape(name):
    row = stats_row(name, scale=0.02, seed=0)
    spec = DATASETS[name]
    n, m = spec.scaled(0.02)
    assert row["n"] == n
    assert row["m"] == m
    assert row["Type"] == ("Directed" if spec.directed else "Undirected")
    assert row["d_avg"] == pytest.approx(2 * m / n, rel=0.05)


def test_undirected_dataset_has_reverse_edges():
    _, edges = generate_edges("Facebook", scale=0.01, seed=0)
    fwd = {(int(u), int(v)) for u, v in edges}
    assert all((v, u) in fwd for u, v in fwd)


def test_load_dataframe_degrees_match_duckdb(spark):
    """Out-degree query on a loaded dataset, checked against DuckDB."""
    df = load(spark, "EmailCore", scale=0.05, seed=1)
    got = df.groupBy("src").agg(F.count("*").alias("d_out"))
    assert_equivalent(
        got,
        "SELECT src, count(*) AS d_out FROM edges GROUP BY src",
        edges=df,
    )


def test_load_row_count_matches_generator(spark):
    n, edges = generate_edges("Wiki-Vote", scale=0.02, seed=3)
    df = load(spark, "Wiki-Vote", scale=0.02, seed=3)
    assert df.count() == edges.shape[0]
