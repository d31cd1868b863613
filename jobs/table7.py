"""Table VII — computation time of the three parts as #RPQs varies.

Runs Experiment 2 on advogato_lite and caches the sweep in
``results/exp2.json`` so jobs/table8.py reuses it.

Usage: python jobs/table7.py [--fresh] [--sets N]
"""
from __future__ import annotations

import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import get_spark  # noqa: E402

EXP2_JSON = Path(__file__).resolve().parent.parent / "results" / "exp2.json"


def ensure_exp2(fresh: bool, sets_per_length: int) -> list[dict]:
    from repro.experiments import run_experiment2
    from repro.tables import exp2_as_dicts, load_exp2, save_exp2

    if EXP2_JSON.exists() and not fresh:
        return load_exp2(EXP2_JSON)
    spark = get_spark("exp2")
    results = run_experiment2(spark, sets_per_length=sets_per_length)
    EXP2_JSON.parent.mkdir(parents=True, exist_ok=True)
    save_exp2(results, EXP2_JSON)
    spark.stop()
    return exp2_as_dicts(results)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--fresh", action="store_true")
    ap.add_argument("--sets", type=int, default=1)
    args = ap.parse_args()
    exp2 = ensure_exp2(args.fresh, args.sets)

    from repro.experiments import format_table
    from repro.tables import table7_rows

    print(
        format_table(
            table7_rows(exp2),
            "TABLE VII: Computation time of three parts vs #RPQs "
            "(advogato_lite; paper Shared ratios alongside).",
        )
    )


if __name__ == "__main__":
    main()
