"""Benchmark for Table V: Full vs RTC per dataset, 4 RPQs per set.

Each benchmark evaluates one multiple-RPQ set (the Experiment-1 unit of
work) with one method; the phase breakdown (Shared_Data / Pre⋈R+ /
Remainder) is attached as extra_info so the benchmark JSON carries the
same columns the paper's Table V reports.
"""
import pytest

from repro.experiments import run_method, weighted_workload
from repro.graph.generators import DATASETS

N_RPQS = 4


@pytest.mark.parametrize("name", list(DATASETS))
@pytest.mark.parametrize("method", ["Full", "RTC"])
def test_table5(benchmark, dataset_graphs, warmed, name, method):
    g = dataset_graphs[name]
    sets = weighted_workload(g, sets_per_length=1, max_rpqs_per_set=N_RPQS)
    queries = sets[1].subset(N_RPQS)  # the length-2 R set
    result = {}

    def run():
        result["run"] = run_method(g, method, queries)

    benchmark.pedantic(run, rounds=1, iterations=1)
    r = result["run"]
    benchmark.extra_info.update(
        {
            "dataset": name,
            "method": method,
            "shared_data_ms": round(r.shared_data_ms, 1),
            "pre_join_ms": round(r.pre_join_ms, 1),
            "remainder_ms": round(r.remainder_ms, 1),
            "response_ms": round(r.response_ms, 1),
            "shared_size": r.shared_size,
        }
    )
    assert r.response_ms > 0
