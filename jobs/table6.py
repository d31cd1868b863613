"""Table VI — query response time of Full / RTC / No, by dataset.

Reuses the Experiment-1 sweep cached by jobs/table5.py
(``results/exp1.json``), running it if absent.

Usage: python jobs/table6.py [--fresh] [--sets N]
"""
from __future__ import annotations

import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from table5 import ensure_exp1  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--fresh", action="store_true")
    ap.add_argument("--sets", type=int, default=1)
    args = ap.parse_args()
    exp1 = ensure_exp1(args.fresh, args.sets)

    from repro.experiments import format_table
    from repro.tables import table6_rows

    print(
        format_table(
            table6_rows(exp1),
            "TABLE VI: Query response time (#RPQs = 4; paper ratios "
            "alongside). Also reports shared-data sizes (Fig. 11).",
        )
    )


if __name__ == "__main__":
    main()
