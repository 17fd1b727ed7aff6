"""Tests for seed merging, vertex blocking and degree queries."""
import math

import pytest
from pyspark.sql import functions as F

from repro.graphs.toy import TOY_SEED, toy_edges_df, toy_local_graph
from repro.graphs.transform import (
    SUPER_SEED,
    block_vertices,
    merge_seeds,
    out_degrees,
    out_neighbors,
)
from repro.core.spread import exact_spread
from repro.graphs.localgraph import LocalGraph
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def toy(spark):
    return toy_edges_df(spark).cache()


def test_merge_single_seed_keeps_structure(spark, toy):
    merged = merge_seeds(toy, [TOY_SEED])
    rows = {(r["src"], r["dst"]): r["p"] for r in merged.collect()}
    assert (SUPER_SEED, 2) in rows and (SUPER_SEED, 4) in rows
    assert rows[(SUPER_SEED, 2)] == pytest.approx(1.0)
    assert (5, 8) in rows and rows[(5, 8)] == pytest.approx(0.5)
    assert merged.count() == toy.count()  # v1 had 2 out-edges -> 2 merged


def test_merge_combines_parallel_seed_edges(spark):
    """Two seeds pointing at u merge to p' = 1 - (1-p1)(1-p2)."""
    pdf = spark.createDataFrame(
        [(1, 10, 0.3), (2, 10, 0.4), (10, 11, 0.5)], ["src", "dst", "p"]
    )
    merged = merge_seeds(pdf, [1, 2])
    rows = {(r["src"], r["dst"]): r["p"] for r in merged.collect()}
    assert rows[(SUPER_SEED, 10)] == pytest.approx(1 - 0.7 * 0.6)
    assert rows[(10, 11)] == pytest.approx(0.5)
    assert len(rows) == 2


def test_merge_with_certain_edge_gives_one(spark):
    pdf = spark.createDataFrame(
        [(1, 10, 1.0), (2, 10, 0.4)], ["src", "dst", "p"]
    )
    merged = merge_seeds(pdf, [1, 2])
    rows = {(r["src"], r["dst"]): r["p"] for r in merged.collect()}
    assert rows[(SUPER_SEED, 10)] == pytest.approx(1.0)


def test_merge_drops_seed_to_seed_and_into_seed_edges(spark):
    pdf = spark.createDataFrame(
        [(1, 2, 0.5), (3, 1, 0.9), (1, 10, 0.2), (10, 3, 0.7)],
        ["src", "dst", "p"],
    )
    merged = merge_seeds(pdf, [1, 2])
    rows = {(r["src"], r["dst"]) for r in merged.collect()}
    assert rows == {(SUPER_SEED, 10), (10, 3)}


def test_merge_preserves_expected_spread_on_toy(spark, toy):
    """Merging a single seed must not change the expected spread."""
    merged = merge_seeds(toy, [TOY_SEED])
    g = LocalGraph.from_edges(merged, SUPER_SEED)
    assert exact_spread(g) == pytest.approx(7.66)


def test_merge_multi_seed_spread_formula(spark):
    """E(S) = |S| - 1 + E({s'}) on a two-seed diamond."""
    pdf = spark.createDataFrame(
        [(1, 10, 0.5), (2, 10, 0.5), (10, 11, 1.0)], ["src", "dst", "p"]
    )
    g = LocalGraph.from_edges(merge_seeds(pdf, [1, 2]), SUPER_SEED)
    # P(10) = 1 - 0.25 = 0.75; P(11) = 0.75; sigma' = 1 + 1.5
    assert exact_spread(g) == pytest.approx(2.5)
    total = (2 - 1) + exact_spread(g)
    assert total == pytest.approx(3.5)


def test_block_vertices_removes_incident_edges(spark, toy):
    left = block_vertices(toy, [5])
    rows = {(r["src"], r["dst"]) for r in left.collect()}
    assert rows == {(1, 2), (1, 4), (9, 8), (8, 7)}


def test_block_vertices_empty_is_noop(spark, toy):
    assert block_vertices(toy, []).count() == toy.count()


def test_block_then_spread_matches_paper(spark, toy):
    """Blocking v5 on the toy graph gives E = 3 (Example 1)."""
    g = LocalGraph.from_edges(block_vertices(toy, [5]), TOY_SEED)
    assert exact_spread(g) == pytest.approx(3.0)


def test_out_degrees_oracle(spark, toy):
    assert_equivalent(
        out_degrees(toy),
        "SELECT src AS vertex, count(*) AS d_out FROM edges GROUP BY src",
        edges=toy,
    )


def test_out_neighbors_toy(spark, toy):
    assert out_neighbors(toy, 1) == [2, 4]
    assert out_neighbors(toy, 5) == [3, 6, 8, 9]
    assert out_neighbors(toy, 7) == []
