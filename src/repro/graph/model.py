"""Edge-labeled directed multigraph as a pair of DataFrames.

Schema conventions used across the whole codebase:

- labeled edges:   ``(src: long, label: string, dst: long)``
- unlabeled edges: ``(src: long, dst: long)``
- vertex pairs (RPQ results): ``(start_v: long, end_v: long)``
- SCC assignment:  ``(v: long, s: long)``
- RTC:             ``(start_s: long, end_s: long)``
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import cached_property

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

PAIR_COLS = ("start_v", "end_v")
EDGE_COLS = ("src", "label", "dst")


@dataclass
class LabeledGraph:
    """An edge-labeled directed multigraph G = (V, E, f, Σ, l).

    ``edges`` must follow the ``(src, label, dst)`` schema. Parallel
    edges between the same pair must carry distinct labels (the data
    model of Section II-A); ``from_edges`` enforces this by dedup.
    """

    edges: DataFrame

    @classmethod
    def from_edges(cls, edges: DataFrame) -> "LabeledGraph":
        missing = [c for c in EDGE_COLS if c not in edges.columns]
        if missing:
            raise ValueError(f"edge DataFrame missing columns {missing}")
        e = (
            edges.select(
                F.col("src").cast("long"),
                F.col("label").cast("string"),
                F.col("dst").cast("long"),
            )
            .dropna()
            .dropDuplicates(list(EDGE_COLS))
        )
        return cls(edges=e)

    @classmethod
    def from_pandas(
        cls, spark: SparkSession, pdf: pd.DataFrame
    ) -> "LabeledGraph":
        return cls.from_edges(spark.createDataFrame(pdf))

    @classmethod
    def from_triples(
        cls, spark: SparkSession, triples: list[tuple[int, str, int]]
    ) -> "LabeledGraph":
        pdf = pd.DataFrame(triples, columns=list(EDGE_COLS))
        return cls.from_pandas(spark, pdf)

    @property
    def spark(self) -> SparkSession:
        return self.edges.sparkSession

    @cached_property
    def vertices(self) -> DataFrame:
        """All vertex ids appearing as an endpoint, as ``(v: long)``."""
        return (
            self.edges.select(F.col("src").alias("v"))
            .union(self.edges.select(F.col("dst").alias("v")))
            .distinct()
        )

    @cached_property
    def labels(self) -> list[str]:
        return [
            r["label"]
            for r in self.edges.select("label").distinct().collect()
        ]

    def edges_for_label(self, label: str) -> DataFrame:
        """Unlabeled edge relation of one label, as ``(src, dst)``."""
        return self.edges.filter(F.col("label") == label).select("src", "dst")

    def stats(self) -> dict[str, float]:
        """|V|, |E|, |Σ| and the paper's vertex degree per label."""
        n_v = self.vertices.count()
        n_e = self.edges.count()
        n_l = len(self.labels)
        return {
            "n_vertices": n_v,
            "n_edges": n_e,
            "n_labels": n_l,
            "degree_per_label": n_e / (n_v * n_l) if n_v and n_l else 0.0,
        }

    def to_pandas(self) -> pd.DataFrame:
        return self.edges.toPandas()

    def triples(self) -> list[tuple[int, str, int]]:
        """Collect edges as python triples (driver-side oracles only)."""
        return [
            (int(r["src"]), str(r["label"]), int(r["dst"]))
            for r in self.edges.collect()
        ]


def identity_pairs(vertices: DataFrame) -> DataFrame:
    """The identity relation {(v, v)} over a vertex DataFrame ``(v)``."""
    return vertices.select(
        F.col("v").alias("start_v"), F.col("v").alias("end_v")
    )


def empty_pairs(spark: SparkSession) -> DataFrame:
    """An empty ``(start_v, end_v)`` DataFrame."""
    return spark.createDataFrame([], "start_v long, end_v long")
