"""Tests for neighborhood-ball extraction (Tables V/VI substrate)."""
import numpy as np
import pytest

from repro.experiments.subgraphs import extract_ball, induced_edges
from repro.graphs.datasets import generate_edges


@pytest.fixture(scope="module")
def email():
    n, edges = generate_edges("EmailCore", seed=0)
    return n, edges


def test_ball_contains_start_and_grows(email):
    n, edges = email
    ball = extract_ball(edges, n, start=0, n_target=25)
    assert 0 in ball
    assert len(ball) >= min(25, 1)


def test_ball_respects_target_roughly(email):
    n, edges = email
    ball = extract_ball(edges, n, start=5, n_target=25)
    # may exceed by at most the last popped vertex's neighborhood tail
    assert 25 <= len(ball) <= 25 + 1 or len(ball) < 25  # exhausted component


def test_ball_deterministic(email):
    n, edges = email
    a = extract_ball(edges, n, start=3, n_target=20)
    b = extract_ball(edges, n, start=3, n_target=20)
    np.testing.assert_array_equal(a, b)


def test_ball_is_connected_neighborhood(email):
    """Every non-start ball vertex has an (undirected) neighbor in the ball."""
    n, edges = email
    ball = extract_ball(edges, n, start=11, n_target=30)
    bset = set(ball.tolist())
    und = {}
    for u, v in edges:
        und.setdefault(int(u), set()).add(int(v))
        und.setdefault(int(v), set()).add(int(u))
    for v in ball:
        if int(v) != 11:
            assert und.get(int(v), set()) & bset


def test_isolated_start_gives_singleton():
    edges = np.array([[1, 2], [2, 3]])
    ball = extract_ball(edges, 5, start=4, n_target=10)
    assert ball.tolist() == [4]


def test_induced_edges_both_endpoints_in_ball(email):
    n, edges = email
    ball = extract_ball(edges, n, start=7, n_target=25)
    sub = induced_edges(edges, ball)
    bset = set(ball.tolist())
    assert len(sub) > 0
    assert sub["src"].isin(bset).all() and sub["dst"].isin(bset).all()
    # every qualifying edge is present
    expect = sum(1 for u, v in edges if int(u) in bset and int(v) in bset)
    assert len(sub) == expect
