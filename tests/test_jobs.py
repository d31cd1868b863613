"""Smoke tests for the jobs/ entrypoints (argument parsing + table paths).

The heavy sweeps are exercised by the benchmarks; here we check that
each job module loads, that the exp JSON caching round-trips, and that
the table printers run over a cached sweep without touching Spark.
"""
import importlib.util
import json
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parent.parent / "jobs"


def load_job(name):
    sys.path.insert(0, str(JOBS))
    try:
        spec = importlib.util.spec_from_file_location(name, JOBS / f"{name}.py")
        mod = importlib.util.module_from_spec(spec)
        sys.modules[name] = mod
        spec.loader.exec_module(mod)
        return mod
    finally:
        sys.path.remove(str(JOBS))


@pytest.mark.parametrize(
    "name", ["table4", "table5", "table6", "table7", "table8", "_common"]
)
def test_job_module_loads(name):
    assert load_job(name) is not None


def _fake_runs(scale):
    return {
        m: {
            "method": m,
            "n_rpqs": 4,
            "shared_data_ms": 10.0 * s,
            "pre_join_ms": 5.0 * s,
            "remainder_ms": 2.0 * s,
            "response_ms": 17.0 * s,
            "shared_size": 7,
            "result_rows": 3,
        }
        for m, s in [("Full", scale), ("RTC", 1.0), ("No", 2 * scale)]
    }


def test_table5_and_6_print_from_cached_json(tmp_path, capsys, monkeypatch):
    t5 = load_job("table5")
    exp1 = [
        {
            "dataset": name,
            "stats": {"degree_per_label": 1.0},
            "runs": _fake_runs(2.0),
        }
        for name in [
            "yago2s_lite",
            "robots_lite",
            "advogato_lite",
            "youtube_lite",
        ]
    ]
    cached = tmp_path / "exp1.json"
    cached.write_text(json.dumps(exp1))
    monkeypatch.setattr(t5, "EXP1_JSON", cached)
    monkeypatch.setattr(sys, "argv", ["table5"])
    t5.main()
    out = capsys.readouterr().out
    assert "TABLE V" in out and "advogato_lite" in out

    t6 = load_job("table6")
    monkeypatch.setattr(t6, "ensure_exp1", lambda *a: exp1)
    monkeypatch.setattr(sys, "argv", ["table6"])
    t6.main()
    out = capsys.readouterr().out
    assert "TABLE VI" in out and "Full/RTC" in out


def test_table7_and_8_print_from_cached_json(tmp_path, capsys, monkeypatch):
    t7 = load_job("table7")
    exp2 = [{"n_rpqs": n, "runs": _fake_runs(2.0)} for n in (1, 2, 4)]
    cached = tmp_path / "exp2.json"
    cached.write_text(json.dumps(exp2))
    monkeypatch.setattr(t7, "EXP2_JSON", cached)
    monkeypatch.setattr(sys, "argv", ["table7"])
    t7.main()
    assert "TABLE VII" in capsys.readouterr().out

    t8 = load_job("table8")
    monkeypatch.setattr(t8, "ensure_exp2", lambda *a: exp2)
    monkeypatch.setattr(sys, "argv", ["table8"])
    t8.main()
    assert "TABLE VIII" in capsys.readouterr().out
