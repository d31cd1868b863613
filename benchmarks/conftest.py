"""Benchmark fixtures: session-scoped dataset graphs + Spark tuning."""
from __future__ import annotations

import pytest

from repro.graph.generators import DATASETS
from repro.graph.model import LabeledGraph


@pytest.fixture(scope="session", autouse=True)
def _bench_spark_conf(spark):
    spark.conf.set("spark.sql.shuffle.partitions", "16")
    spark.sparkContext.setLogLevel("ERROR")
    yield


@pytest.fixture(scope="session")
def dataset_graphs(spark) -> dict[str, LabeledGraph]:
    """All four Table-IV substitute graphs, built and materialized once."""
    graphs: dict[str, LabeledGraph] = {}
    for name, spec in DATASETS.items():
        g = spec.build(spark)
        g.edges = g.edges.localCheckpoint(eager=True)
        graphs[name] = g
    return graphs


@pytest.fixture(scope="session")
def warmed(dataset_graphs):
    """One small untimed evaluation per dataset to warm JIT/codegen."""
    from repro.experiments import run_method, weighted_workload

    for name, g in dataset_graphs.items():
        sets = weighted_workload(g, sets_per_length=1, max_rpqs_per_set=1)
        run_method(g, "RTC", sets[0].subset(1))
        run_method(g, "Full", sets[0].subset(1))
    return True
