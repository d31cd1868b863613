"""Benchmark for Table VII: Full vs RTC on advogato_lite as #RPQs varies.

The benchmark sweep samples #RPQs in {1, 4, 10} (the paper's endpoints
and median); jobs/table7.py runs the full {1,2,4,6,8,10} sweep.
"""
import pytest

from repro.experiments import run_method, weighted_workload

RPQ_COUNTS = [1, 4, 10]


@pytest.mark.parametrize("n_rpqs", RPQ_COUNTS)
@pytest.mark.parametrize("method", ["Full", "RTC"])
def test_table7(benchmark, dataset_graphs, warmed, n_rpqs, method):
    g = dataset_graphs["advogato_lite"]
    sets = weighted_workload(g, sets_per_length=1, max_rpqs_per_set=10)
    queries = sets[1].subset(n_rpqs)
    result = {}

    def run():
        result["run"] = run_method(g, method, queries)

    benchmark.pedantic(run, rounds=1, iterations=1)
    r = result["run"]
    benchmark.extra_info.update(
        {
            "n_rpqs": n_rpqs,
            "method": method,
            "shared_data_ms": round(r.shared_data_ms, 1),
            "pre_join_ms": round(r.pre_join_ms, 1),
            "remainder_ms": round(r.remainder_ms, 1),
            "response_ms": round(r.response_ms, 1),
        }
    )
    assert r.response_ms > 0
