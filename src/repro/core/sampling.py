"""Sampled-graph generation (Definition 4) via lazy reachable-subgraph BFS.

A random sampled graph keeps each edge ``(u, v)`` with probability
``p(u, v)``. Everything the algorithms need from a sample — ``σ(s, g)``
(Lemma 1) and the dominator tree from the seed (Theorem 6) — depends only
on the subgraph *induced by the vertices reachable from the seed*. That
subgraph is fully determined by sampling the out-edges of reached vertices
only, so we sample lazily during the BFS: edges out of never-reached
vertices are never drawn. This is why the cost per sample tracks the
spread, which the paper leans on in §VI-C ("the running time of Algorithm 2
is highly related to the size of sampled graphs").
"""
from __future__ import annotations

import numpy as np

from repro.graphs.localgraph import LocalGraph


def sample_reachable(
    g: LocalGraph,
    rng: np.random.Generator,
    blocked: np.ndarray | None = None,
) -> tuple[np.ndarray, np.ndarray]:
    """One sampled graph, restricted to vertices reachable from the seed.

    Args:
        g: the graph (CSR).
        rng: per-sample random generator.
        blocked: optional ``(n,)`` bool mask of blocked vertices; edges into
            blocked vertices are dropped (Definition 2). The seed must not
            be blocked.

    Returns:
        ``(vertices, edges)``: reached vertex ids (seed first, BFS order)
        and the sampled edges among them as an ``(k, 2)`` array. Both use
        the graph's local ids. Every sampled edge whose endpoints are both
        reached is included (parallel paths matter for dominators).
    """
    seed = g.seed
    if blocked is not None and blocked[seed]:
        raise ValueError("seed cannot be blocked")
    reached = np.zeros(g.n, dtype=bool)
    reached[seed] = True
    order = [seed]
    frontier = [seed]
    edges_src: list[np.ndarray] = []
    edges_dst: list[np.ndarray] = []
    while frontier:
        next_frontier: list[int] = []
        for u in frontier:
            heads, probs = g.out_edges(u)
            if heads.size == 0:
                continue
            keep = rng.random(heads.size) < probs
            if blocked is not None:
                keep &= ~blocked[heads]
            heads = heads[keep]
            if heads.size == 0:
                continue
            edges_src.append(np.full(heads.size, u, dtype=np.int64))
            edges_dst.append(heads)
            new = heads[~reached[heads]]
            if new.size:
                # np.unique: a vertex may appear twice in one batch
                new = np.unique(new)
                reached[new] = True
                order.extend(int(v) for v in new)
                next_frontier.extend(int(v) for v in new)
        frontier = next_frontier
    verts = np.asarray(order, dtype=np.int64)
    if edges_src:
        es = np.concatenate(edges_src)
        ed = np.concatenate(edges_dst)
        edges = np.stack([es, ed], axis=1)
    else:
        edges = np.empty((0, 2), dtype=np.int64)
    return verts, edges


def sample_full(
    g: LocalGraph,
    rng: np.random.Generator,
    blocked: np.ndarray | None = None,
) -> np.ndarray:
    """Sample *every* edge of the graph (reference implementation).

    Returns the kept edges as an ``(k, 2)`` array of local ids. Used by
    tests to validate that lazy sampling yields the same reachable
    subgraph distribution; algorithms use :func:`sample_reachable`.
    """
    keep = rng.random(g.m) < g.probs
    src = np.repeat(np.arange(g.n), np.diff(g.indptr))
    edges = np.stack([src[keep], g.indices[keep]], axis=1)
    if blocked is not None:
        edges = edges[~blocked[edges[:, 0]] & ~blocked[edges[:, 1]]]
    return edges


def reachable_from(n: int, edges: np.ndarray, root: int) -> np.ndarray:
    """Bool mask of vertices reachable from ``root`` over ``edges``."""
    adj: list[list[int]] = [[] for _ in range(n)]
    for u, v in edges:
        adj[int(u)].append(int(v))
    seen = np.zeros(n, dtype=bool)
    seen[root] = True
    stack = [root]
    while stack:
        u = stack.pop()
        for v in adj[u]:
            if not seen[v]:
                seen[v] = True
                stack.append(v)
    return seen


def sample_rng(master_seed: int, sample_id: int) -> np.random.Generator:
    """The canonical per-sample generator: deterministic in both keys."""
    return np.random.default_rng((master_seed, sample_id))
