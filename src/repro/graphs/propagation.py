"""Propagation-probability models (paper §VI-A) as DataFrame transforms.

* **Trivalency (TR)**: each edge gets ``p`` uniformly chosen from
  ``{0.1, 0.01, 0.001}``. We derive the choice from a deterministic hash of
  ``(src, dst, seed)`` so the assignment is reproducible and identical
  between Spark and the DuckDB oracle.
* **Weighted cascade (WC)**: ``p(u, v) = 1 / d_in(v)``.

Both take and return an edge DataFrame; output schema ``(src, dst, p)``.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

#: The three trivalency probabilities, in hash-bucket order.
TR_PROBS = (0.1, 0.01, 0.001)


def assign_tr(edges: DataFrame, *, seed: int = 0) -> DataFrame:
    """Trivalency model: p ∈ {0.1, 0.01, 0.001} per edge, hash-seeded."""
    bucket = F.pmod(F.xxhash64("src", "dst", F.lit(seed)), F.lit(3))
    arr = F.array(*[F.lit(p) for p in TR_PROBS])
    return edges.select("src", "dst", F.element_at(arr, (bucket + 1).cast("int")).alias("p"))


def assign_wc(edges: DataFrame) -> DataFrame:
    """Weighted-cascade model: p(u,v) = 1 / d_in(v)."""
    indeg = edges.groupBy("dst").agg(F.count("*").alias("_din"))
    return (
        edges.join(indeg, "dst")
        .select("src", "dst", (F.lit(1.0) / F.col("_din")).alias("p"))
    )
