"""The 8 evaluation datasets (Table IV) as synthetic equivalents.

The paper uses SNAP graphs; offline we generate power-law graphs matched to
each dataset's ``n``, ``m``, directedness and (roughly) degree skew, at a
per-dataset default scale chosen so the whole evaluation grid is feasible on
this substrate (DESIGN.md §5.1-5.2). ``load`` returns a Spark DataFrame of
directed edges ``(src, dst)`` — undirected datasets are materialized with
both orientations, matching the paper's "each edge as bi-directional".
"""
from __future__ import annotations

import zlib
from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.graphs.generators import degree_stats, powerlaw_edges


@dataclass(frozen=True)
class DatasetSpec:
    """Paper-side statistics of one Table IV dataset plus generator knobs."""

    name: str
    n: int          # paper vertex count
    m: int          # paper edge count (undirected edges counted once)
    d_avg: float    # paper average total degree
    d_max: int      # paper max total degree
    directed: bool
    alpha: float            # Zipf skew for the synthetic equivalent
    default_scale: float    # scale applied to n and m by default

    def scaled(self, scale: float | None = None) -> tuple[int, int]:
        """(n, m) after applying ``scale`` (None → the dataset default).

        ``m`` is capped at 60% of the simple-graph limit so tiny test
        scales (where m shrinks linearly but the n² limit shrinks
        quadratically) stay generable.
        """
        s = self.default_scale if scale is None else scale
        n = max(16, int(self.n * s))
        m = max(16, int(self.m * s))
        limit = n * (n - 1) if self.directed else n * (n - 1) // 2
        return n, min(m, int(limit * 0.6))


#: Table IV, in paper order (ordered by edge count).
DATASETS: dict[str, DatasetSpec] = {
    s.name: s
    for s in [
        DatasetSpec("EmailCore", 1_005, 25_571, 49.6, 544, True, 0.75, 1.0),
        DatasetSpec("Facebook", 4_039, 88_234, 43.7, 1_045, False, 0.70, 1.0),
        DatasetSpec("Wiki-Vote", 7_115, 103_689, 29.1, 1_167, True, 0.85, 1.0),
        DatasetSpec("EmailAll", 265_214, 420_045, 3.2, 7_636, True, 0.95, 0.1),
        DatasetSpec("DBLP", 317_080, 1_049_866, 6.6, 343, False, 0.40, 0.1),
        DatasetSpec("Twitter", 81_306, 1_768_149, 59.5, 10_336, True, 0.90, 0.1),
        DatasetSpec("Stanford", 281_903, 2_312_497, 16.4, 38_626, True, 0.95, 0.1),
        DatasetSpec("Youtube", 1_134_890, 2_987_624, 5.3, 28_754, False, 0.90, 0.05),
    ]
}


def generate_edges(name: str, *, scale: float | None = None, seed: int = 0):
    """Numpy ``(rows, 2)`` directed edge array for a named dataset."""
    spec = DATASETS[name]
    n, m = spec.scaled(scale)
    # zlib.crc32 is a stable cross-process name hash (str.hash is salted).
    salt = zlib.crc32(name.encode()) & 0xFFFF
    return n, powerlaw_edges(
        n, m, alpha=spec.alpha, directed=spec.directed, seed=salt + seed * 7919
    )


def load(
    spark: SparkSession, name: str, *, scale: float | None = None, seed: int = 0
) -> DataFrame:
    """Directed edge DataFrame ``(src: long, dst: long)`` for a dataset."""
    _, edges = generate_edges(name, scale=scale, seed=seed)
    pdf = pd.DataFrame({"src": edges[:, 0], "dst": edges[:, 1]})
    return spark.createDataFrame(pdf)


def stats_row(name: str, *, scale: float | None = None, seed: int = 0) -> dict:
    """Measured Table IV row for the synthetic equivalent of ``name``.

    ``m`` follows SNAP convention: undirected edges counted once.
    """
    spec = DATASETS[name]
    n, edges = generate_edges(name, scale=scale, seed=seed)
    st = degree_stats(edges, n)
    m_rows = st["m"]
    # Undirected graphs are stored bidirectionally; SNAP convention counts
    # each undirected edge once (m) and once per endpoint (degree).
    div = 1 if spec.directed else 2
    return {
        "Dataset": name,
        "n": st["n"],
        "m": m_rows // div,
        "d_avg": round(st["d_avg"] / div, 1),
        "d_max": st["d_max"] // div,
        "Type": "Undirected" if not spec.directed else "Directed",
    }
