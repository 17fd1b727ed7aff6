"""Small-subgraph extraction for the Exact-comparison tables (V/VI).

Paper §VI-B: "we extract small datasets by iteratively extracting a vertex
and all its neighbors, until the number of extracted vertices reaches
[the target]" — i.e. a neighborhood ball grown one vertex at a time over
the underlying undirected structure. We reproduce that procedure on the
synthetic EmailCore graph.
"""
from __future__ import annotations

from collections import deque

import numpy as np
import pandas as pd


def extract_ball(
    edges: np.ndarray, n: int, *, start: int, n_target: int
) -> np.ndarray:
    """Grow a neighborhood ball from ``start`` to ~``n_target`` vertices.

    Expansion is breadth-first over the undirected adjacency; a popped
    vertex contributes *all* its neighbors (in- and out-), matching the
    paper's "a vertex and all its neighbors". Returns the sorted vertex
    ids of the ball (may exceed ``n_target`` by the last vertex's
    neighborhood, and may be smaller if the component is exhausted).
    """
    nbrs: list[set[int]] = [set() for _ in range(n)]
    for u, v in edges:
        nbrs[int(u)].add(int(v))
        nbrs[int(v)].add(int(u))
    selected: set[int] = {int(start)}
    queue: deque[int] = deque([int(start)])
    while queue and len(selected) < n_target:
        v = queue.popleft()
        for u in sorted(nbrs[v]):
            if u not in selected:
                selected.add(u)
                queue.append(u)
            if len(selected) >= n_target:
                break
    return np.asarray(sorted(selected), dtype=np.int64)


def induced_edges(edges: np.ndarray, vertices: np.ndarray) -> pd.DataFrame:
    """Edge frame ``(src, dst)`` of the subgraph induced by ``vertices``."""
    vset = np.zeros(int(edges.max()) + 2, dtype=bool)
    vset[vertices] = True
    keep = vset[edges[:, 0]] & vset[edges[:, 1]]
    sub = edges[keep]
    return pd.DataFrame({"src": sub[:, 0], "dst": sub[:, 1]})
