"""Tests for lazy sampled-reachable-subgraph generation."""
import numpy as np
import pytest
from hypothesis import given, settings, strategies as st

from repro.core.sampling import (
    reachable_from,
    sample_full,
    sample_reachable,
    sample_rng,
)
from repro.graphs.localgraph import LocalGraph
from repro.graphs.toy import toy_local_graph
import pandas as pd


def test_deterministic_per_sample_id():
    g = toy_local_graph()
    v1, e1 = sample_reachable(g, sample_rng(0, 7))
    v2, e2 = sample_reachable(g, sample_rng(0, 7))
    np.testing.assert_array_equal(v1, v2)
    np.testing.assert_array_equal(e1, e2)


def test_different_sample_ids_vary():
    g = toy_local_graph()
    counts = {
        sample_reachable(g, sample_rng(0, i))[0].shape[0] for i in range(64)
    }
    assert len(counts) > 1  # v8/v7 membership varies


def test_certain_edges_always_present():
    g = toy_local_graph()
    for i in range(20):
        verts, edges = sample_reachable(g, sample_rng(1, i))
        pairs = {(int(u), int(v)) for u, v in edges}
        # v1->v2 (p=1) in local ids: 0 -> 1
        assert (0, 1) in pairs and (0, 3) in pairs
        assert verts.shape[0] >= 7  # v1..v6, v9 always reached


def test_seed_first_in_order():
    g = toy_local_graph()
    verts, _ = sample_reachable(g, sample_rng(0, 3))
    assert verts[0] == g.seed


def test_blocked_vertices_never_reached():
    g = toy_local_graph()
    blocked = np.zeros(g.n, dtype=bool)
    blocked[g.to_local(5)] = True
    for i in range(20):
        verts, edges = sample_reachable(g, sample_rng(2, i), blocked)
        assert g.to_local(5) not in set(verts.tolist())
        assert set(g.orig_ids[verts].tolist()) == {1, 2, 4}


def test_blocking_seed_raises():
    g = toy_local_graph()
    blocked = np.zeros(g.n, dtype=bool)
    blocked[g.seed] = True
    with pytest.raises(ValueError):
        sample_reachable(g, sample_rng(0, 0), blocked)


def test_toy_reach_distribution_matches_exact():
    """Mean σ over many samples ≈ 7.66 (Lemma 1 on the toy graph)."""
    g = toy_local_graph()
    r = 40_000
    total = sum(
        sample_reachable(g, sample_rng(3, i))[0].shape[0] for i in range(r)
    )
    assert total / r == pytest.approx(7.66, abs=0.05)


def test_sample_full_matches_lazy_reachable_distribution():
    """Lazy sampling and full-graph sampling induce the same σ distribution."""
    g = toy_local_graph()
    r = 20_000
    lazy = np.array(
        [sample_reachable(g, sample_rng(5, i))[0].shape[0] for i in range(r)]
    )
    full = np.empty(r)
    for i in range(r):
        edges = sample_full(g, sample_rng(6, i))
        full[i] = reachable_from(g.n, edges, g.seed).sum()
    assert lazy.mean() == pytest.approx(full.mean(), abs=0.05)
    # distribution support is identical on this tiny graph
    assert set(np.unique(lazy)) == set(np.unique(full))


@st.composite
def random_prob_graph(draw):
    n = draw(st.integers(min_value=2, max_value=8))
    m = draw(st.integers(min_value=1, max_value=2 * n))
    rows = []
    for _ in range(m):
        u = draw(st.integers(min_value=0, max_value=n - 1))
        v = draw(st.integers(min_value=0, max_value=n - 1))
        p = draw(st.sampled_from([0.0, 0.3, 0.7, 1.0]))
        if u != v:
            rows.append((u, v, p))
    if not rows:
        rows = [(0, 1, 1.0)]
    pdf = pd.DataFrame(rows, columns=["src", "dst", "p"]).drop_duplicates(
        ["src", "dst"]
    )
    return LocalGraph.from_pandas(pdf, seed_vertex=0)


@given(random_prob_graph(), st.integers(min_value=0, max_value=50))
@settings(max_examples=150, deadline=None)
def test_sampled_edges_are_subset_with_correct_reachability(g, sid):
    verts, edges = sample_reachable(g, sample_rng(9, sid))
    vset = set(verts.tolist())
    # every edge tail is reached, every edge head is reached
    for u, v in edges:
        assert int(u) in vset and int(v) in vset
    # reachability over the returned edges reproduces the vertex set
    reach = reachable_from(g.n, edges, g.seed)
    assert set(np.nonzero(reach)[0].tolist()) == vset
    # p=0 edges never sampled, and all sampled edges exist in the graph
    pairs = {(int(u), int(v)) for u, v in edges}
    real = set()
    for u in range(g.n):
        heads, probs = g.out_edges(u)
        for h, p in zip(heads, probs):
            if p > 0:
                real.add((u, int(h)))
    assert pairs <= real
