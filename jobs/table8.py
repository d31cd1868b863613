"""Table VIII — query response time as #RPQs varies (advogato_lite).

Reuses the Experiment-2 sweep cached by jobs/table7.py
(``results/exp2.json``), running it if absent.

Usage: python jobs/table8.py [--fresh] [--sets N]
"""
from __future__ import annotations

import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from table7 import ensure_exp2  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--fresh", action="store_true")
    ap.add_argument("--sets", type=int, default=1)
    args = ap.parse_args()
    exp2 = ensure_exp2(args.fresh, args.sets)

    from repro.experiments import format_table
    from repro.tables import table8_rows

    print(
        format_table(
            table8_rows(exp2),
            "TABLE VIII: Query response time vs #RPQs (advogato_lite; "
            "paper ratios alongside).",
        )
    )


if __name__ == "__main__":
    main()
