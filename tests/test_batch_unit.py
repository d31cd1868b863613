"""Tests for EvalBatchUnit (repro.core.batch_unit): RTC vs Full pipelines.

Every combination of {Pre present/ε} × {+,*} × {Post present/ε} is
checked: the two pipelines must agree with each other, with the pure-
Python reference, and (spot checks) with the DuckDB recursive oracle.
"""
import pytest
from pyspark.sql import functions as F

from repro.core.batch_unit import eval_batch_unit_full, eval_batch_unit_rtc
from repro.core.edge_reduction import eval_kleene_free
from repro.core.rtc import compute_rtc
from repro.core.timing import PhaseTimings
from repro.graph.closure import transitive_closure
from repro.graph.iterate import materialize
from repro.oracle import assert_equivalent
from repro.pyref import eval_rpq_python
from repro.rpq.ast import EPSILON
from repro.rpq.parser import parse
from tests.helpers import PAPER_EDGES, batch_unit_sql, edges_pdf


def rows(df):
    return {(r.start_v, r.end_v) for r in df.collect()}


@pytest.fixture(scope="module")
def shared(paper_graph):
    """R = b.c: the RTC and the full R+_G, computed once."""
    r_g = eval_kleene_free(paper_graph, parse("b.c"))
    rtc = compute_rtc(r_g)
    r_plus = materialize(
        transitive_closure(
            r_g.selectExpr("start_v as src", "end_v as dst")
        ).selectExpr("src as start_v", "dst as end_v")
    )
    return rtc, r_plus


CASES = [
    # (pre, kind, post) — regex texts, None for ε
    ("d", "+", "c"),
    ("d", "+", None),
    (None, "+", "c"),
    (None, "+", None),
    ("d", "*", "c"),
    ("d", "*", None),
    (None, "*", None),
    ("e.d", "+", "c.e"),
]


def full_query_text(pre, kind, post):
    mid = f"(b.c){kind}"
    parts = [p for p in (pre, mid, post) if p]
    return ".".join(parts)


@pytest.mark.parametrize("pre,kind,post", CASES)
def test_rtc_vs_full_vs_pyref(paper_graph, shared, pre, kind, post):
    rtc, r_plus = shared
    t = PhaseTimings()
    pre_g = (
        None if pre is None else eval_kleene_free(paper_graph, parse(pre))
    )
    post_ast = EPSILON if post is None else parse(post)
    got_rtc = rows(
        eval_batch_unit_rtc(paper_graph, pre_g, rtc, kind, post_ast, t)
    )
    got_full = rows(
        eval_batch_unit_full(paper_graph, pre_g, r_plus, kind, post_ast, t)
    )
    want = eval_rpq_python(
        PAPER_EDGES, parse(full_query_text(pre, kind, post))
    )
    assert got_rtc == want, "RTC pipeline diverges from reference"
    assert got_full == want, "Full pipeline diverges from reference"


@pytest.mark.parametrize(
    "pre,kind,post",
    [("d", "+", "c"), (None, "+", None), ("d", "*", "c")],
)
def test_vs_duckdb_oracle(paper_graph, shared, pre, kind, post):
    rtc, _ = shared
    t = PhaseTimings()
    pre_g = (
        None if pre is None else eval_kleene_free(paper_graph, parse(pre))
    )
    post_ast = EPSILON if post is None else parse(post)
    got = eval_batch_unit_rtc(paper_graph, pre_g, rtc, kind, post_ast, t)
    sql = batch_unit_sql(
        [pre] if pre else [],
        ["b", "c"],
        kind,
        [post] if post else [],
    )
    assert_equivalent(
        got.select("start_v", "end_v").distinct(),
        sql,
        edges=edges_pdf(PAPER_EDGES),
    )


def test_timings_populated(paper_graph, shared):
    rtc, _ = shared
    t = PhaseTimings()
    pre_g = eval_kleene_free(paper_graph, parse("d"))
    eval_batch_unit_rtc(paper_graph, pre_g, rtc, "+", parse("c"), t)
    assert t.pre_join > 0
    assert t.remainder > 0
    assert t.shared_data == 0  # batch unit itself never computes shared data


def test_result_distinct(paper_graph, shared):
    rtc, _ = shared
    t = PhaseTimings()
    pre_g = eval_kleene_free(paper_graph, parse("d"))
    out = eval_batch_unit_rtc(paper_graph, pre_g, rtc, "+", parse("c"), t)
    assert out.count() == out.distinct().count()


def test_res_eq9_has_no_duplicates_by_construction(paper_graph, shared):
    """useless-2 elimination is sound: the (9) join output is duplicate-
    free without a distinct, because SCC vertex sets are disjoint."""
    rtc, _ = shared
    pre_g = eval_kleene_free(paper_graph, parse("d"))
    e7 = (
        pre_g.join(rtc.scc.withColumnRenamed("v", "end_v"), "end_v")
        .select("start_v", "s")
        .distinct()
    )
    e8 = (
        e7.join(rtc.rtc.withColumnRenamed("start_s", "s"), "s")
        .select("start_v", F.col("end_s").alias("s"))
        .distinct()
    )
    e9 = e8.join(
        rtc.scc.select("s", F.col("v").alias("end_v")), "s"
    ).select("start_v", "end_v")
    assert e9.count() == e9.distinct().count()
