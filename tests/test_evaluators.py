"""End-to-end differential tests for the three multi-RPQ evaluators.

RTCSharing, FullSharing, and NoSharing must return identical results —
equal to the pure-Python reference and to the independent automaton
evaluator — on the paper graph and random graphs, across closure-free,
single-closure, star, union, and nested-closure queries (Example 7).
"""
import pytest

from repro.core import (
    FullSharingEvaluator,
    NoSharingEvaluator,
    PhaseTimings,
    RTCSharingEvaluator,
)
from repro.core.edge_reduction import eval_rpq_automaton
from repro.oracle import assert_equivalent
from repro.pyref import eval_rpq_python
from repro.rpq.parser import parse
from tests.helpers import (
    PAPER_EDGES,
    batch_unit_sql,
    edges_pdf,
    random_labeled_edges,
)

ALL_EVALUATORS = [RTCSharingEvaluator, FullSharingEvaluator, NoSharingEvaluator]


def rows(df):
    return {(r.start_v, r.end_v) for r in df.collect()}


PAPER_QUERIES = [
    "b",
    "b.c",
    "(b.c)+",
    "(b.c)*",
    "d.(b.c)+.c",
    "d.(b.c)*.c",
    "d.(b.c)+",
    "(b.c)+.c",
    "b.c|d",
    "d.(b.c)+.c | e.d",
    "(b|c)+",
    "d.b+.c",
]


@pytest.mark.parametrize("text", PAPER_QUERIES)
def test_three_methods_agree_with_reference(paper_graph, text):
    want = eval_rpq_python(PAPER_EDGES, parse(text))
    for cls in ALL_EVALUATORS:
        got = rows(cls(paper_graph).evaluate(text))
        assert got == want, (cls.__name__, text)


@pytest.mark.parametrize("text", ["d.(b.c)+.c", "(b.c)+", "(b|c)+"])
def test_methods_agree_with_automaton(paper_graph, text):
    auto = rows(eval_rpq_automaton(paper_graph, parse(text)))
    rtc = rows(RTCSharingEvaluator(paper_graph).evaluate(text))
    assert rtc == auto


@pytest.mark.parametrize("seed", range(3))
@pytest.mark.parametrize("text", ["a.(a.b)+.b", "(a.b)*.a", "b.(a|b)+.a"])
def test_random_graphs(make_graph, seed, text):
    edges = random_labeled_edges(
        n_vertices=9, n_edges=20, labels="ab", seed=100 + seed
    )
    g = make_graph(edges)
    want = eval_rpq_python(edges, parse(text))
    for cls in ALL_EVALUATORS:
        assert rows(cls(g).evaluate(text)) == want, (cls.__name__, text)


def test_oracle_full_batch_unit(paper_graph):
    got = RTCSharingEvaluator(paper_graph).evaluate("d.(b.c)+.c")
    assert_equivalent(
        got,
        batch_unit_sql(["d"], ["b", "c"], "+", ["c"]),
        edges=edges_pdf(PAPER_EDGES),
    )


def test_oracle_star(paper_graph):
    got = RTCSharingEvaluator(paper_graph).evaluate("d.(b.c)*.c")
    assert_equivalent(
        got,
        batch_unit_sql(["d"], ["b", "c"], "*", ["c"]),
        edges=edges_pdf(PAPER_EDGES),
    )


class TestExample7Recursion:
    """Example 7: nested closures evaluate recursively; RTCs are reused."""

    def test_nested_closures(self, make_graph):
        edges = random_labeled_edges(
            n_vertices=7, n_edges=16, labels="abc", seed=11
        )
        g = make_graph(edges)
        text = "(a.b)*.b+.(a.b+.c)+"
        want = eval_rpq_python(edges, parse(text))
        for cls in ALL_EVALUATORS:
            assert rows(cls(g).evaluate(text)) == want, cls.__name__

    def test_rtc_cache_reused_across_queries(self, paper_graph):
        ev = RTCSharingEvaluator(paper_graph)
        ev.evaluate("d.(b.c)+.c")
        assert set(ev._rtc_cache) == {"(b.c)"}
        first = ev._rtc_cache["(b.c)"]
        ev.evaluate("(b.c)+")  # same R: must reuse, not recompute
        assert ev._rtc_cache["(b.c)"] is first
        ev.evaluate("(b.c)*.c")  # star over same R reuses the + RTC too
        assert ev._rtc_cache["(b.c)"] is first
        assert len(ev._rtc_cache) == 1

    def test_nested_pre_closure_populates_cache(self, paper_graph):
        ev = RTCSharingEvaluator(paper_graph)
        ev.evaluate("(b.c)*.d+.c")  # Pre=(b.c)*, R=d
        assert set(ev._rtc_cache) == {"(b.c)", "d"}

    def test_full_sharing_caches_r_plus(self, paper_graph):
        ev = FullSharingEvaluator(paper_graph)
        ev.evaluate("d.(b.c)+.c")
        ev.evaluate("(b.c)+.c")
        assert set(ev._plus_cache) == {"(b.c)"}

    def test_no_sharing_never_caches(self, paper_graph):
        ev = NoSharingEvaluator(paper_graph)
        t = PhaseTimings()
        ev.evaluate("d.(b.c)+.c", timings=t)
        first_shared = t.shared_data
        ev.evaluate("(b.c)+.c", timings=t)
        # Second query recomputed the closure: shared time grew.
        assert t.shared_data > first_shared
        assert ev.shared_data_size() == 0


class TestTimingAttribution:
    def test_phases_cover_work(self, paper_graph):
        t = PhaseTimings()
        RTCSharingEvaluator(paper_graph).evaluate("d.(b.c)+.c", timings=t)
        assert t.shared_data > 0
        assert t.pre_join > 0
        assert t.remainder > 0

    def test_shared_data_only_first_query(self, paper_graph):
        ev = RTCSharingEvaluator(paper_graph)
        t1 = PhaseTimings()
        ev.evaluate("d.(b.c)+.c", timings=t1)
        t2 = PhaseTimings()
        ev.evaluate("e.(b.c)+.c", timings=t2)
        assert t1.shared_data > 0
        assert t2.shared_data == 0  # cache hit: no shared-data work

    def test_no_nested_double_count(self, paper_graph):
        t = PhaseTimings()
        with t.phase("remainder"):
            with t.phase("pre_join"):
                pass
        assert t.pre_join == 0  # inner phase suppressed


def test_shared_data_size_rtc_smaller_than_full(paper_graph):
    """Fig. 11's point: |RTC| < |R+_G| whenever SCCs collapse vertices."""
    rtc_ev = RTCSharingEvaluator(paper_graph)
    full_ev = FullSharingEvaluator(paper_graph)
    rtc_ev.evaluate("d.(b.c)+.c")
    full_ev.evaluate("d.(b.c)+.c")
    assert 0 < rtc_ev.shared_data_size() < full_ev.shared_data_size()
