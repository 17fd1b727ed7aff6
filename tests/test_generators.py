"""Unit tests for the synthetic power-law graph generators."""
import numpy as np
import pytest

from repro.graphs.generators import degree_stats, powerlaw_edges, _zipf_weights


@pytest.mark.parametrize("n,m", [(10, 20), (50, 200), (200, 1000), (1000, 5000)])
def test_directed_edge_count(n, m):
    edges = powerlaw_edges(n, m, seed=1)
    assert edges.shape == (m, 2)


@pytest.mark.parametrize("n,m", [(10, 15), (100, 400), (500, 2000)])
def test_undirected_has_both_orientations(n, m):
    edges = powerlaw_edges(n, m, directed=False, seed=2)
    assert edges.shape == (2 * m, 2)
    fwd = {(int(u), int(v)) for u, v in edges}
    assert all((v, u) in fwd for u, v in fwd)


@pytest.mark.parametrize("seed", [0, 1, 2, 3])
def test_deterministic_in_seed(seed):
    a = powerlaw_edges(100, 500, seed=seed)
    b = powerlaw_edges(100, 500, seed=seed)
    np.testing.assert_array_equal(a, b)


def test_different_seeds_differ():
    a = powerlaw_edges(100, 500, seed=0)
    b = powerlaw_edges(100, 500, seed=1)
    assert not np.array_equal(a, b)


@pytest.mark.parametrize("directed", [True, False])
def test_no_self_loops_no_duplicates(directed):
    edges = powerlaw_edges(80, 300, directed=directed, seed=3)
    assert (edges[:, 0] != edges[:, 1]).all()
    codes = edges[:, 0] * 10_000 + edges[:, 1]
    assert np.unique(codes).size == codes.size


def test_vertex_ids_in_range():
    edges = powerlaw_edges(64, 256, seed=4)
    assert edges.min() >= 0 and edges.max() < 64


def test_skew_increases_dmax():
    """Higher alpha must concentrate degree on hubs."""
    flat = degree_stats(powerlaw_edges(500, 3000, alpha=0.05, seed=5), 500)
    skew = degree_stats(powerlaw_edges(500, 3000, alpha=1.0, seed=5), 500)
    assert skew["d_max"] > flat["d_max"]


def test_degree_stats_match_handcount():
    edges = np.array([[0, 1], [0, 2], [1, 2], [2, 0]])
    st = degree_stats(edges, 3)
    assert st == {"n": 3, "m": 4, "d_avg": pytest.approx(8 / 3), "d_max": 3}


def test_zipf_weights_normalized():
    w = _zipf_weights(100, 0.9)
    assert w.sum() == pytest.approx(1.0)
    assert (np.diff(w) < 0).all()


def test_m_exceeding_simple_graph_limit_raises():
    with pytest.raises(ValueError):
        powerlaw_edges(5, 100, seed=0)


def test_tiny_graph_guard():
    with pytest.raises(ValueError):
        powerlaw_edges(1, 0, seed=0)
