"""Vertex-level graph reduction G_R -> Ḡ_R (paper Section III-B).

Given the unlabeled reduced graph ``G_R`` and its SCC assignment, each
SCC becomes one vertex of the condensation; edges inside an SCC (and
self-loop edges) become a self-loop on that vertex, and all same-
direction edges between two SCCs collapse into one edge — exactly the
definition of ``Ḡ_R``. Keeping the self-loops is what makes
``TC(Ḡ_R)`` carry Kleene-*plus* semantics through Theorem 1: an SCC
vertex reaches itself iff some (equivalently every) member vertex lies
on an R-cycle.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def condense(edges: DataFrame, scc: DataFrame) -> DataFrame:
    """Condensation edges ``(src, dst)`` over SCC ids.

    ``edges``: unlabeled ``(src, dst)``; ``scc``: assignment ``(v, s)``.
    A multi-vertex SCC always yields a self-loop (its internal edges map
    to (s, s)); a singleton yields one only if the original vertex has a
    self-loop edge.
    """
    return (
        edges.join(
            scc.select(F.col("v").alias("src"), F.col("s").alias("s_src")),
            "src",
        )
        .join(
            scc.select(F.col("v").alias("dst"), F.col("s").alias("s_dst")),
            "dst",
        )
        .select(
            F.col("s_src").alias("src"), F.col("s_dst").alias("dst")
        )
        .distinct()
    )
