"""EvalBatchUnit (Algorithm 2): the optimized join pipeline (6)–(10).

The batch unit ``Pre · R{+,*} · Post`` is evaluated as the relational
algebra expression of Theorem 2 / equations (6)–(10)::

    Pre_G ⋈ SCC ⋈ RTC ⋈ SCC ⋈ Post_G

with the paper's four optimizations expressed directly in the plan:

- *useless-1* eliminated by seeding the pipeline with ``Pre_G`` (only
  SCCs reachable from Pre endpoints are expanded) — eq (7);
- *redundant-1* eliminated by ``distinct`` after ``Pre_G ⋈ SCC``
  (ResEq7) — many Pre pairs ending in one SCC collapse to one row;
- *redundant-2* eliminated by ``distinct`` after ``⋈ RTC`` (ResEq8) —
  many source SCCs reaching one target SCC collapse to one row;
- *useless-2* eliminated by **not** deduplicating after the final
  ``⋈ SCC`` (ResEq9): SCC vertex sets are disjoint, so rows are unique
  by construction and a duplicate check would be wasted work.

``Post`` is evaluated *restricted* to the end vertices of ResEq9
(EvalRestrictedRPQ), and the Kleene-star zero-iteration branch routes
``Pre_G`` through the same Post join (Algorithm 2 line 11).

The FullSharing variant evaluates the same batch unit with the shared
``R+_G`` and a plain pair-level join — the unoptimized pipeline the
paper compares against (it performs the redundant/useless work by
construction).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.edge_reduction import eval_kleene_free
from repro.core.rtc import RTC
from repro.core.timing import PhaseTimings
from repro.graph.iterate import materialize, release
from repro.graph.model import LabeledGraph, identity_pairs
from repro.rpq.ast import Epsilon, Regex


def _apply_star_and_post(
    graph: LabeledGraph,
    pairs: DataFrame,
    pre_g: DataFrame | None,
    kind: str,
    post: Regex,
    timings: PhaseTimings,
) -> DataFrame:
    """Shared tail of both pipelines: star zero-branch + Post join (10)."""
    with timings.phase("remainder"):
        if kind == "*":
            zero = (
                pre_g
                if pre_g is not None
                else identity_pairs(graph.vertices)
            )
            pairs = pairs.union(zero)
        if isinstance(post, Epsilon):
            return materialize(pairs.distinct())
        seeds = pairs.select(F.col("end_v").alias("v")).distinct()
        post_g = eval_kleene_free(graph, post, seeds=seeds)
        out = (
            pairs.join(
                post_g.select(
                    F.col("start_v").alias("end_v"),
                    F.col("end_v").alias("post_end_v"),
                ),
                "end_v",
            )
            .select("start_v", F.col("post_end_v").alias("end_v"))
            .distinct()
        )
        return materialize(out)


def eval_batch_unit_rtc(
    graph: LabeledGraph,
    pre_g: DataFrame | None,
    rtc: RTC,
    kind: str,
    post: Regex,
    timings: PhaseTimings,
) -> DataFrame:
    """Algorithm 2 over DataFrames. ``pre_g is None`` means Pre = ε,
    in which case ResEq7 is the SCC relation itself (Theorem 2)."""
    with timings.phase("pre_join"):
        if pre_g is None:
            # Every vertex of G_R paired with its SCC; unique by
            # construction (one SCC per vertex).
            res_eq7 = rtc.scc.select(
                F.col("v").alias("start_v"), F.col("s")
            )
        else:
            # (7): Pre_G ⋈ SCC, distinct — eliminates redundant-1 ops.
            res_eq7 = (
                pre_g.join(
                    rtc.scc.withColumnRenamed("v", "end_v"), "end_v"
                )
                .select("start_v", "s")
                .distinct()
            )
        # (8): ⋈ RTC, distinct — eliminates redundant-2 ops. useless-1
        # ops never happen: only SCCs present in res_eq7 are expanded.
        res_eq8 = (
            res_eq7.join(
                rtc.rtc.withColumnRenamed("start_s", "s"), "s"
            )
            .select("start_v", F.col("end_s").alias("s"))
            .distinct()
        )
        # (9): ⋈ SCC with NO duplicate check — useless-2 elimination
        # (SCC vertex sets are mutually disjoint). The join key ``s``
        # has very few distinct values when SCCs are large (the whole
        # point of the reduction), which would leave the output in a
        # handful of partitions — repartition by start vertex so the
        # downstream Post join runs parallel.
        res_eq9 = materialize(
            res_eq8.join(
                rtc.scc.select(
                    F.col("s"), F.col("v").alias("end_v")
                ),
                "s",
            )
            .select("start_v", "end_v")
            .repartition("start_v")
        )
    out = _apply_star_and_post(graph, res_eq9, pre_g, kind, post, timings)
    if out is not res_eq9:
        release(res_eq9)
    return out


def eval_batch_unit_full(
    graph: LabeledGraph,
    pre_g: DataFrame | None,
    r_plus: DataFrame,
    kind: str,
    post: Regex,
    timings: PhaseTimings,
) -> DataFrame:
    """FullSharing batch unit: plain ``Pre_G ⋈ R+_G`` at the vertex-pair
    level — the unoptimized pipeline of [8] used as the baseline."""
    with timings.phase("pre_join"):
        if pre_g is None:
            joined = r_plus
        else:
            joined = (
                pre_g.join(
                    r_plus.select(
                        F.col("start_v").alias("end_v"),
                        F.col("end_v").alias("plus_end_v"),
                    ),
                    "end_v",
                )
                .select(
                    "start_v", F.col("plus_end_v").alias("end_v")
                )
                .distinct()
            )
        joined = materialize(joined)
    out = _apply_star_and_post(graph, joined, pre_g, kind, post, timings)
    if out is not joined and pre_g is not None:
        # pre_g is None shares the cached r_plus as ``joined`` — keep it.
        release(joined)
    return out
