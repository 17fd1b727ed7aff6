"""The Fig. 1 toy graph — ground truth for Examples 1-4 and Table III.

Reconstructed from the paper's worked numbers: seed ``v1``; out-neighbours
of the seed are ``{v2, v4}`` (Table III "OutNeighbors"); all paths to
``v5`` go through ``v2`` or ``v4``; ``v5`` reaches ``v3, v6, v9`` and
``v8`` (p=0.5); ``v9 -> v8`` (p=0.2); ``v8 -> v7`` (p=0.1); every other
edge has probability 1. This reproduces every number in Examples 1-2
(E = 7.66; blocking v5 -> 3; blocking v2 or v4 -> 6.66; Δ(v5) = 4.66,
Δ(v9) = 1.11, Δ(v8) = 0.66, Δ(v7) = 0.06) and the Theorem 2
supermodularity counterexample. Note the paper's Example 2 prose lists
"blocking v7, v8 ... lead to 0.66, 0.06" with v7/v8 transposed relative
to its own Example 1 arithmetic (P(v7) = 0.06, P(v8) = 0.6); we follow
the arithmetic.
"""
from __future__ import annotations

import pandas as pd

#: (src, dst, p) of Fig. 1; vertices are 1..9, seed is 1.
TOY_EDGES: list[tuple[int, int, float]] = [
    (1, 2, 1.0),
    (1, 4, 1.0),
    (2, 5, 1.0),
    (4, 5, 1.0),
    (5, 3, 1.0),
    (5, 6, 1.0),
    (5, 9, 1.0),
    (5, 8, 0.5),
    (9, 8, 0.2),
    (8, 7, 0.1),
]

TOY_SEED = 1

#: Exact expected spread of the unblocked toy graph (Example 1).
TOY_EXPECTED_SPREAD = 7.66


def toy_pandas() -> pd.DataFrame:
    """Edge frame ``(src, dst, p)`` of the toy graph."""
    return pd.DataFrame(TOY_EDGES, columns=["src", "dst", "p"])


def toy_edges_df(spark):
    """Spark edge DataFrame of the toy graph."""
    return spark.createDataFrame(toy_pandas())


def toy_local_graph():
    """The toy graph as a ``LocalGraph`` (seed = v1)."""
    from repro.graphs.localgraph import LocalGraph

    return LocalGraph.from_pandas(toy_pandas(), TOY_SEED)
