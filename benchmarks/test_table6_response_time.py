"""Benchmark for Table VI: NoSharing response time per dataset.

Full and RTC response times for the same sets are produced by the
Table V benchmarks (identical runs); this file adds the third method so
the three-way Table VI comparison is complete without duplicating the
Full/RTC work.
"""
import pytest

from repro.experiments import run_method, weighted_workload
from repro.graph.generators import DATASETS

N_RPQS = 4


@pytest.mark.parametrize("name", list(DATASETS))
def test_table6_nosharing(benchmark, dataset_graphs, warmed, name):
    g = dataset_graphs[name]
    sets = weighted_workload(g, sets_per_length=1, max_rpqs_per_set=N_RPQS)
    queries = sets[1].subset(N_RPQS)
    result = {}

    def run():
        result["run"] = run_method(g, "No", queries)

    benchmark.pedantic(run, rounds=1, iterations=1)
    r = result["run"]
    benchmark.extra_info.update(
        {
            "dataset": name,
            "method": "No",
            "response_ms": round(r.response_ms, 1),
        }
    )
    assert r.response_ms > 0
