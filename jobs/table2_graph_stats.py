"""Reproduce Table 2 (graph inputs): spark-submit jobs/table2_graph_stats.py"""
from __future__ import annotations

import sys

sys.path.insert(0, str(__import__("pathlib").Path(__file__).resolve().parent))
from _common import dump, get_spark  # noqa: E402

from repro.tables import format_table, table2_rows  # noqa: E402


def main() -> None:
    spark = get_spark("table2")
    rows = table2_rows(spark)
    print(format_table(rows))
    print(f"\nwritten: {dump('table2', rows)}")
    spark.stop()


if __name__ == "__main__":
    main()
