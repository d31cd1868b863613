"""Tests for distributed SCC (repro.graph.scc) vs driver-side Tarjan."""
import random

import pandas as pd
import pytest

from repro.graph.scc import strongly_connected_components
from repro.pyref import tarjan_scc


def scc_spark(spark, edges, vertices=None):
    edf = spark.createDataFrame(
        pd.DataFrame(edges, columns=["src", "dst"]), "src long, dst long"
    )
    vdf = None
    if vertices is not None:
        vdf = spark.createDataFrame(
            pd.DataFrame({"v": list(vertices)}), "v long"
        )
    out = strongly_connected_components(edf, vdf)
    return {r.v: r.s for r in out.collect()}


class TestSmallGraphs:
    def test_single_cycle(self, spark):
        assert scc_spark(spark, [(1, 2), (2, 3), (3, 1)]) == {
            1: 1,
            2: 1,
            3: 1,
        }

    def test_dag_chain(self, spark):
        assert scc_spark(spark, [(1, 2), (2, 3), (3, 4)]) == {
            1: 1,
            2: 2,
            3: 3,
            4: 4,
        }

    def test_two_sccs_with_bridge(self, spark):
        edges = [(1, 2), (2, 1), (2, 3), (3, 4), (4, 3)]
        assert scc_spark(spark, edges) == {1: 1, 2: 1, 3: 3, 4: 3}

    def test_self_loop_singleton(self, spark):
        assert scc_spark(spark, [(5, 5), (5, 6)]) == {5: 5, 6: 6}

    def test_paper_example5(self, spark):
        """The SCC partition of G_{b.c}: {v2,v4}, {v3,v5}, {v6}."""
        edges = [(2, 4), (2, 6), (3, 5), (4, 2), (5, 3)]
        assert scc_spark(spark, edges) == {2: 2, 4: 2, 3: 3, 5: 3, 6: 6}

    def test_extra_isolated_vertices(self, spark):
        got = scc_spark(spark, [(1, 2), (2, 1)], vertices=[1, 2, 7, 9])
        assert got == {1: 1, 2: 1, 7: 7, 9: 9}

    def test_self_loop_only(self, spark):
        assert scc_spark(spark, [(0, 0)]) == {0: 0}

    def test_no_edges_only_vertices(self, spark):
        assert scc_spark(spark, [], vertices=[3, 5]) == {3: 3, 5: 5}

    def test_long_path_all_singletons(self, spark):
        edges = [(i, i + 1) for i in range(12)]
        assert scc_spark(spark, edges) == {i: i for i in range(13)}

    def test_cycle_ids_descending_vertices(self, spark):
        # Min-id convention regardless of edge direction/ordering.
        edges = [(9, 4), (4, 9), (4, 2), (2, 4)]
        assert scc_spark(spark, edges) == {9: 2, 4: 2, 2: 2}

    def test_two_disjoint_cycles(self, spark):
        edges = [(1, 2), (2, 1), (10, 11), (11, 10)]
        assert scc_spark(spark, edges) == {1: 1, 2: 1, 10: 10, 11: 10}

    def test_nested_cycles_one_scc(self, spark):
        # Two cycles sharing a vertex form one SCC.
        edges = [(1, 2), (2, 1), (2, 3), (3, 2)]
        assert scc_spark(spark, edges) == {1: 1, 2: 1, 3: 1}


@pytest.mark.parametrize("seed", range(8))
def test_random_vs_tarjan(spark, seed):
    rng = random.Random(seed)
    n = 20
    edges = sorted(
        {(rng.randrange(n), rng.randrange(n)) for _ in range(35)}
    )
    assert scc_spark(spark, edges) == tarjan_scc(edges)


def test_denser_random_vs_tarjan(spark):
    rng = random.Random(99)
    n = 40
    edges = sorted(
        {(rng.randrange(n), rng.randrange(n)) for _ in range(160)}
    )
    assert scc_spark(spark, edges) == tarjan_scc(edges)
