"""Test fixtures: tuned Spark conf, paper example graph, random graphs."""
from __future__ import annotations

import pytest

from repro.graph.model import LabeledGraph
from repro.pyref import Edge
from tests.helpers import PAPER_EDGES


@pytest.fixture(scope="session", autouse=True)
def _small_shuffle(spark):
    """Tiny graphs don't need 64 shuffle partitions; 8 cuts per-job cost."""
    prev = spark.conf.get("spark.sql.shuffle.partitions")
    spark.conf.set("spark.sql.shuffle.partitions", "8")
    spark.sparkContext.setLogLevel("ERROR")
    yield
    spark.conf.set("spark.sql.shuffle.partitions", prev)


@pytest.fixture(scope="session")
def paper_graph(spark) -> LabeledGraph:
    return LabeledGraph.from_triples(spark, PAPER_EDGES)


@pytest.fixture(scope="session")
def make_graph(spark):
    """Factory turning an edge list into a LabeledGraph (cached per list)."""
    cache: dict[tuple, LabeledGraph] = {}

    def _make(edges: list[Edge]) -> LabeledGraph:
        key = tuple(edges)
        if key not in cache:
            cache[key] = LabeledGraph.from_triples(spark, list(edges))
        return cache[key]

    return _make
