"""Benchmark for Table IV: building the dataset substitutes.

Not a timing the paper reports, but it bounds the fixed cost every
other table's sweep pays per dataset.
"""
import pytest

from repro.graph.generators import DATASETS


@pytest.mark.parametrize("name", list(DATASETS))
def test_build_dataset(benchmark, spark, name):
    spec = DATASETS[name]

    def build():
        g = spec.build(spark)
        return g.edges.count()

    n_edges = benchmark.pedantic(build, rounds=1, iterations=1)
    assert n_edges > 0
