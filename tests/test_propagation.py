"""Tests for the TR / WC propagation-probability models."""
import pytest
from pyspark.sql import functions as F

from repro.graphs.datasets import load
from repro.graphs.propagation import TR_PROBS, assign_tr, assign_wc
from repro.graphs.toy import toy_edges_df
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def edges(spark):
    return load(spark, "EmailCore", scale=0.1, seed=0).cache()


def test_tr_values_in_trivalency_set(spark, edges):
    vals = {r["p"] for r in assign_tr(edges, seed=0).select("p").distinct().collect()}
    assert vals <= set(TR_PROBS)
    assert len(vals) == 3  # all three buckets hit on a non-trivial graph


def test_tr_deterministic(spark, edges):
    a = assign_tr(edges, seed=5).orderBy("src", "dst").collect()
    b = assign_tr(edges, seed=5).orderBy("src", "dst").collect()
    assert a == b


def test_tr_seed_changes_assignment(spark, edges):
    a = assign_tr(edges, seed=0).orderBy("src", "dst").select("p").collect()
    b = assign_tr(edges, seed=1).orderBy("src", "dst").select("p").collect()
    assert a != b


def test_tr_roughly_uniform_buckets(spark, edges):
    counts = (
        assign_tr(edges, seed=0).groupBy("p").count().collect()
    )
    total = sum(r["count"] for r in counts)
    for r in counts:
        assert r["count"] / total == pytest.approx(1 / 3, abs=0.05)


def test_tr_preserves_edges(spark, edges):
    out = assign_tr(edges, seed=0)
    assert out.count() == edges.count()
    assert_equivalent(
        out.select("src", "dst"),
        "SELECT src, dst FROM edges",
        edges=edges,
    )


def test_wc_probability_is_inverse_indegree(spark, edges):
    got = assign_wc(edges)
    assert_equivalent(
        got,
        """
        SELECT e.src, e.dst, 1.0 / d.din AS p
        FROM edges e
        JOIN (SELECT dst, count(*) AS din FROM edges GROUP BY dst) d
        USING (dst)
        """,
        edges=edges,
    )


def test_wc_toy_graph_values(spark):
    """v8 has in-degree 2 -> p = 0.5 on both incoming edges."""
    toy = toy_edges_df(spark).select("src", "dst")
    rows = {(r["src"], r["dst"]): r["p"] for r in assign_wc(toy).collect()}
    assert rows[(5, 8)] == pytest.approx(0.5)
    assert rows[(9, 8)] == pytest.approx(0.5)
    assert rows[(1, 2)] == pytest.approx(1.0)


def test_wc_probs_in_unit_interval(spark, edges):
    row = assign_wc(edges).agg(
        F.min("p").alias("lo"), F.max("p").alias("hi")
    ).collect()[0]
    assert 0 < row["lo"] and row["hi"] <= 1.0
