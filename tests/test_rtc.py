"""Tests for Compute_RTC (repro.core.rtc) — paper Examples 4–6, Theorem 1."""
import random

import pandas as pd
import pytest

from repro.core.edge_reduction import eval_kleene_free
from repro.core.rtc import compute_rtc
from repro.pyref import eval_rpq_python, transitive_closure_python
from repro.rpq.parser import parse
from tests.helpers import PAPER_EDGES


@pytest.fixture(scope="module")
def paper_rtc(paper_graph):
    r_g = eval_kleene_free(paper_graph, parse("b.c"))
    return compute_rtc(r_g)


class TestPaperExamples:
    def test_example5_scc_relation(self, paper_rtc):
        scc = {(r.v, r.s) for r in paper_rtc.scc.collect()}
        assert scc == {(2, 2), (4, 2), (3, 3), (5, 3), (6, 6)}

    def test_example6_rtc(self, paper_rtc):
        """TC(Ḡ_{b.c}) = {(s0,s0),(s0,s1),(s2,s2)} — 3 pairs, with
        min-vertex ids {(2,2),(2,6),(3,3)}."""
        rtc = {(r.start_s, r.end_s) for r in paper_rtc.rtc.collect()}
        assert rtc == {(2, 2), (2, 6), (3, 3)}

    def test_n_pairs(self, paper_rtc):
        assert paper_rtc.n_pairs() == 3

    def test_theorem1_reconstruction(self, paper_rtc):
        """SCC ⋈ RTC ⋈ SCC reproduces (b.c)+_G of Example 4."""
        scc = {r.v: r.s for r in paper_rtc.scc.collect()}
        rtc = {(r.start_s, r.end_s) for r in paper_rtc.rtc.collect()}
        got = {
            (vi, vj)
            for (sk, sl) in rtc
            for vi in scc
            if scc[vi] == sk
            for vj in scc
            if scc[vj] == sl
        }
        assert got == eval_rpq_python(PAPER_EDGES, parse("(b.c)+"))

    def test_rtc_much_smaller_than_r_plus(self, paper_rtc):
        r_plus = eval_rpq_python(PAPER_EDGES, parse("(b.c)+"))
        assert paper_rtc.n_pairs() < len(r_plus)


@pytest.mark.parametrize("seed", range(4))
def test_theorem1_random_graphs(spark, make_graph, seed):
    """Theorem 1 on random graphs: reconstruct R+_G from the RTC."""
    from tests.helpers import random_labeled_edges

    edges = random_labeled_edges(
        n_vertices=10, n_edges=24, labels="ab", seed=seed
    )
    g = make_graph(edges)
    r_g = eval_kleene_free(g, parse("a.b"))
    rtc = compute_rtc(r_g)
    scc = {r.v: r.s for r in rtc.scc.collect()}
    rtc_pairs = {(r.start_s, r.end_s) for r in rtc.rtc.collect()}
    got = {
        (vi, vj)
        for (sk, sl) in rtc_pairs
        for vi, si in scc.items()
        if si == sk
        for vj, sj in scc.items()
        if sj == sl
    }
    want = transitive_closure_python(
        sorted({(r.start_v, r.end_v) for r in r_g.collect()})
    )
    assert got == want


def test_lemma1_r_plus_equals_tc_of_gr(spark, paper_graph):
    """Lemma 1: (b.c)+_G == TC(G_{b.c})."""
    from repro.graph.closure import transitive_closure

    r_g = eval_kleene_free(paper_graph, parse("b.c"))
    tc = transitive_closure(
        r_g.selectExpr("start_v as src", "end_v as dst")
    )
    got = {(r.src, r.dst) for r in tc.collect()}
    assert got == eval_rpq_python(PAPER_EDGES, parse("(b.c)+"))
