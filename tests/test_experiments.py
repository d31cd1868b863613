"""Tests for the experiment harness (repro.experiments) on a tiny graph."""
import pytest

from repro.experiments import (
    METHODS,
    dataset_stats,
    format_table,
    run_method,
    weighted_workload,
)
from repro.graph.model import LabeledGraph
from tests.helpers import PAPER_EDGES


@pytest.fixture(scope="module")
def graph(spark):
    g = LabeledGraph.from_triples(spark, PAPER_EDGES)
    g.edges = g.edges.localCheckpoint(eager=True)
    return g


QUERIES = ("d.(b.c)+.c", "e.(b.c)+.c")


class TestRunMethod:
    @pytest.mark.parametrize("method", list(METHODS))
    def test_runs_and_reports(self, graph, method):
        r = run_method(graph, method, QUERIES)
        assert r.method == method
        assert r.n_rpqs == 2
        assert r.response_ms > 0
        # The three phases never exceed the wall clock they are part of.
        assert (
            r.shared_data_ms + r.pre_join_ms + r.remainder_ms
            <= r.response_ms * 1.05
        )

    def test_methods_agree_on_result_rows(self, graph):
        counts = {
            m: run_method(graph, m, QUERIES).result_rows for m in METHODS
        }
        assert len(set(counts.values())) == 1, counts

    def test_rtc_shared_size_leq_full(self, graph):
        rtc = run_method(graph, "RTC", QUERIES)
        full = run_method(graph, "Full", QUERIES)
        no = run_method(graph, "No", QUERIES)
        assert 0 < rtc.shared_size <= full.shared_size
        assert no.shared_size == 0


class TestWeightedWorkload:
    def test_shapes(self, graph):
        sets = weighted_workload(
            graph, sets_per_length=1, max_rpqs_per_set=3
        )
        assert len(sets) == 3
        assert all(len(s.queries) == 3 for s in sets)

    def test_labels_come_from_graph(self, graph):
        labels = {"b", "c", "d", "e"}
        for s in weighted_workload(
            graph, sets_per_length=2, max_rpqs_per_set=2
        ):
            assert set(s.r_text.split(".")) <= labels


class TestReporting:
    def test_dataset_stats_rows(self, spark):
        rows = dataset_stats(spark)
        assert [r["dataset"] for r in rows] == [
            "yago2s_lite",
            "robots_lite",
            "advogato_lite",
            "youtube_lite",
        ]
        for r in rows:
            assert r["n_edges"] > 0
            assert r["degree_per_label"] == pytest.approx(
                r["paper_degree"], rel=0.15
            )

    def test_format_table(self):
        out = format_table(
            [{"a": 1, "bb": "x"}, {"a": 22, "bb": "y"}], "T"
        )
        lines = out.splitlines()
        assert lines[0] == "T"
        assert "a " in lines[1] and "bb" in lines[1]
        assert len(lines) == 5

    def test_format_table_empty(self):
        assert "(no rows)" in format_table([], "T")
