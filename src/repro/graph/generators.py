"""Synthetic edge-labeled multigraph datasets (Table IV substitutes).

The container has no network access, so the paper's four real datasets
are replaced by deterministic synthetic graphs that preserve the
quantity the evaluation varies — the average vertex degree per label
``|E| / (|V|·|Σ|)`` — and the structural property the paper's results
hinge on: the SCC sizes of the reduced graph ``G_R``.

- Trust/social networks (Robots, Advogato, Youtube) reciprocate edges,
  which is what creates SCCs even at sub-critical density; the
  ``reciprocity`` knob adds the reverse edge with that probability.
- Knowledge bases (Yago2s) are hierarchy-like and nearly acyclic; the
  ``forward_bias`` knob orients every edge from lower to higher vertex
  id, pinning the average SCC size of ``G_R`` to ~1.00 — the paper's
  degenerate case where reduction cannot help.

See DESIGN.md §4 for the paper→built mapping and scale factors.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.graph.model import LabeledGraph


def labeled_multigraph(
    spark: SparkSession,
    *,
    n_vertices: int,
    n_labels: int,
    degree_per_label: float,
    reciprocity: float = 0.0,
    forward_bias: bool = False,
    label_skew: float = 0.0,
    seed: int = 0,
) -> LabeledGraph:
    """Random edge-labeled directed multigraph.

    Per label, draws ``n_vertices * degree_per_label`` uniform (src, dst)
    pairs (self-loops dropped, per-label duplicates collapsed — the data
    model allows parallel edges only with distinct labels). Labels are
    ``l0 .. l{n_labels-1}``.

    ``label_skew`` > 0 makes label frequencies Zipfian with that
    exponent while keeping the *average* degree per label at
    ``degree_per_label`` — knowledge bases like Yago2s have a few
    dominant predicates and a long tail, which is what makes some of
    the paper's random ``R``s non-trivial there despite the tiny
    average degree.
    """
    g = np.random.default_rng(seed)
    frames: list[pd.DataFrame] = []
    # Reciprocated edges add ~reciprocity x extra edges; compensate so
    # the final |E|/(|V||Σ|) lands on the Table IV target.
    total = max(
        1,
        int(
            round(
                n_vertices * degree_per_label * n_labels / (1.0 + reciprocity)
            )
        ),
    )
    if label_skew > 0.0:
        weights = 1.0 / np.arange(1, n_labels + 1) ** label_skew
        weights /= weights.sum()
        per_label = np.maximum(1, np.round(total * weights)).astype(int)
    else:
        per_label = np.full(n_labels, max(1, round(total / n_labels)))
    for li in range(n_labels):
        m = int(per_label[li])
        src = g.integers(0, n_vertices, m)
        dst = g.integers(0, n_vertices, m)
        if forward_bias:
            lo = np.minimum(src, dst)
            hi = np.maximum(src, dst)
            src, dst = lo, hi
        keep = src != dst
        src, dst = src[keep], dst[keep]
        if reciprocity > 0.0:
            flip = g.random(len(src)) < reciprocity
            rev_src, rev_dst = dst[flip], src[flip]
            src = np.concatenate([src, rev_src])
            dst = np.concatenate([dst, rev_dst])
        frames.append(
            pd.DataFrame({"src": src, "label": f"l{li}", "dst": dst})
        )
    pdf = pd.concat(frames, ignore_index=True).drop_duplicates()
    return LabeledGraph.from_pandas(spark, pdf)


@dataclass(frozen=True)
class DatasetSpec:
    """A Table-IV dataset substitute plus the paper's reported numbers."""

    name: str
    n_vertices: int
    n_labels: int
    degree_per_label: float
    reciprocity: float
    forward_bias: bool
    label_skew: float
    seed: int
    paper_n_vertices: int
    paper_n_edges: int
    paper_n_labels: int
    paper_degree: float

    def build(self, spark: SparkSession) -> LabeledGraph:
        return labeled_multigraph(
            spark,
            n_vertices=self.n_vertices,
            n_labels=self.n_labels,
            degree_per_label=self.degree_per_label,
            reciprocity=self.reciprocity,
            forward_bias=self.forward_bias,
            label_skew=self.label_skew,
            seed=self.seed,
        )


# Ordered by vertex degree per label, as in Table IV.
DATASETS: dict[str, DatasetSpec] = {
    "yago2s_lite": DatasetSpec(
        name="yago2s_lite",
        n_vertices=20_000,
        n_labels=104,
        degree_per_label=0.02,
        reciprocity=0.0,
        forward_bias=True,
        label_skew=1.0,
        seed=42,
        paper_n_vertices=108_048_761,
        paper_n_edges=244_796_155,
        paper_n_labels=104,
        paper_degree=0.02,
    ),
    "robots_lite": DatasetSpec(
        name="robots_lite",
        n_vertices=1_725,
        n_labels=4,
        degree_per_label=0.52,
        reciprocity=0.35,
        forward_bias=False,
        label_skew=0.0,
        seed=43,
        paper_n_vertices=1_725,
        paper_n_edges=3_596,
        paper_n_labels=4,
        paper_degree=0.52,
    ),
    "advogato_lite": DatasetSpec(
        name="advogato_lite",
        n_vertices=2_000,
        n_labels=3,
        degree_per_label=2.61,
        reciprocity=0.30,
        forward_bias=False,
        label_skew=0.0,
        seed=44,
        paper_n_vertices=6_541,
        paper_n_edges=51_127,
        paper_n_labels=3,
        paper_degree=2.61,
    ),
    "youtube_lite": DatasetSpec(
        name="youtube_lite",
        n_vertices=500,
        n_labels=5,
        degree_per_label=11.42,
        reciprocity=0.50,
        forward_bias=False,
        label_skew=0.0,
        seed=45,
        paper_n_vertices=1_600,
        paper_n_edges=91_343,
        paper_n_labels=5,
        paper_degree=11.42,
    ),
}
