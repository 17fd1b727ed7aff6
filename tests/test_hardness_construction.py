"""Tests that exercise the paper's Theorem 1 DKS-reduction construction.

We build the IMIN instance G' from a small undirected DKS instance
exactly as in the proof (parts C and D, all probabilities 1) and verify
the claimed equivalence: blocking the C-vertices of a k-subset A
decreases the expected spread by |A| + (#edges induced by A).
"""
import itertools

import numpy as np
import pandas as pd
import pytest

from repro.core.spread import exact_spread
from repro.graphs.localgraph import LocalGraph

#: The 4-vertex, 4-edge DKS instance of Fig. 2 (a path/cycle-ish graph).
DKS_VERTICES = [1, 2, 3, 4]
DKS_EDGES = [(1, 2), (2, 3), (3, 4), (4, 1)]


def build_imin_instance():
    """G' of the reduction: S -> c_i for all i; c_x, c_y -> d_i per edge."""
    rows = []
    seed = 0
    c = {v: 100 + v for v in DKS_VERTICES}
    d = {i: 200 + i for i in range(len(DKS_EDGES))}
    for v in DKS_VERTICES:
        rows.append((seed, c[v], 1.0))
    for i, (x, y) in enumerate(DKS_EDGES):
        rows.append((c[x], d[i], 1.0))
        rows.append((c[y], d[i], 1.0))
    pdf = pd.DataFrame(rows, columns=["src", "dst", "p"])
    return LocalGraph.from_pandas(pdf, seed), c, d


def induced_edge_count(A):
    return sum(1 for x, y in DKS_EDGES if x in A and y in A)


def test_unblocked_spread_counts_everything():
    g, c, d = build_imin_instance()
    # seed + 4 C-vertices + 4 D-vertices, all reachable with p=1
    assert exact_spread(g) == pytest.approx(9.0)


@pytest.mark.parametrize("k", [1, 2, 3])
def test_blocking_C_vertices_decreases_by_A_plus_induced_edges(k):
    g, c, d = build_imin_instance()
    base = exact_spread(g)
    for A in itertools.combinations(DKS_VERTICES, k):
        blocked = np.zeros(g.n, dtype=bool)
        for v in A:
            blocked[g.to_local(c[v])] = True
        got = base - exact_spread(g, blocked)
        assert got == pytest.approx(len(A) + induced_edge_count(A)), f"A={A}"


def test_blocking_D_vertex_only_removes_itself():
    g, c, d = build_imin_instance()
    base = exact_spread(g)
    blocked = np.zeros(g.n, dtype=bool)
    blocked[g.to_local(d[0])] = True
    assert base - exact_spread(g, blocked) == pytest.approx(1.0)


def test_optimal_blockers_solve_dks():
    """The IMIN optimum at b=k corresponds to the densest k-subgraph."""
    from repro.algorithms.exact import exact_blockers

    g, c, d = build_imin_instance()
    k = 2
    # densest 2-subgraph of the 4-cycle = any edge -> 1 induced edge
    B, _ = exact_blockers(g, k, theta=64, seed=0)
    origs = {int(g.orig_ids[u]) for u in B}
    A = {v for v, cv in c.items() if cv in origs}
    assert len(A) == k
    assert induced_edge_count(A) == 1
