"""Table V — computation time of the three parts (Full vs RTC), by dataset.

Runs Experiment 1 (4 RPQs per set) and caches the sweep in
``results/exp1.json`` so jobs/table6.py reuses it. Pass ``--fresh`` to
rerun; ``--sets N`` controls sets per R-length (default 1).

Usage: python jobs/table5.py [--fresh] [--sets N]
"""
from __future__ import annotations

import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import get_spark  # noqa: E402

EXP1_JSON = Path(__file__).resolve().parent.parent / "results" / "exp1.json"


def ensure_exp1(fresh: bool, sets_per_length: int) -> list[dict]:
    from repro.experiments import run_experiment1
    from repro.tables import exp1_as_dicts, load_exp1, save_exp1

    if EXP1_JSON.exists() and not fresh:
        return load_exp1(EXP1_JSON)
    spark = get_spark("exp1")
    results = run_experiment1(
        spark, n_rpqs=4, sets_per_length=sets_per_length
    )
    EXP1_JSON.parent.mkdir(parents=True, exist_ok=True)
    save_exp1(results, EXP1_JSON)
    spark.stop()
    return exp1_as_dicts(results)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--fresh", action="store_true")
    ap.add_argument("--sets", type=int, default=1)
    args = ap.parse_args()
    exp1 = ensure_exp1(args.fresh, args.sets)

    from repro.experiments import format_table
    from repro.tables import table5_rows

    print(
        format_table(
            table5_rows(exp1),
            "TABLE V: Computation time of three parts, Full vs RTC "
            "(#RPQs = 4; paper ratios alongside).",
        )
    )


if __name__ == "__main__":
    main()
