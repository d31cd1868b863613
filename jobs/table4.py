"""Table IV — statistics of the (synthetic substitute) datasets.

Usage: python jobs/table4.py  (or spark-submit jobs/table4.py)
"""
from __future__ import annotations

import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import get_spark  # noqa: E402


def main() -> None:
    spark = get_spark("table4")
    from repro.experiments import dataset_stats, format_table

    rows = dataset_stats(spark)
    print(
        format_table(
            rows,
            "TABLE IV: Statistics of datasets (built vs paper).",
        )
    )
    spark.stop()


if __name__ == "__main__":
    main()
