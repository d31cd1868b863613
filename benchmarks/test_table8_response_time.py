"""Benchmark for Table VIII: NoSharing on advogato_lite as #RPQs varies.

Full/RTC numbers for the same sweep come from the Table VII benchmarks;
NoSharing's response time is flat in #RPQs (nothing amortizes), which
is the trend Table VIII contrasts against.
"""
import pytest

from repro.experiments import run_method, weighted_workload

RPQ_COUNTS = [1, 4, 10]


@pytest.mark.parametrize("n_rpqs", RPQ_COUNTS)
def test_table8_nosharing(benchmark, dataset_graphs, warmed, n_rpqs):
    g = dataset_graphs["advogato_lite"]
    sets = weighted_workload(g, sets_per_length=1, max_rpqs_per_set=10)
    queries = sets[1].subset(n_rpqs)
    result = {}

    def run():
        result["run"] = run_method(g, "No", queries)

    benchmark.pedantic(run, rounds=1, iterations=1)
    r = result["run"]
    benchmark.extra_info.update(
        {
            "n_rpqs": n_rpqs,
            "method": "No",
            "response_ms": round(r.response_ms, 1),
        }
    )
    assert r.response_ms > 0
