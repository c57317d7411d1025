"""Reproduce Table 4 (normalized running times, RDMA vs TCP/IP vs MPC):
spark-submit jobs/table4_times.py
"""
from __future__ import annotations

import sys

sys.path.insert(0, str(__import__("pathlib").Path(__file__).resolve().parent))
from _common import dump, get_spark  # noqa: E402

from repro.tables import format_table, table4_rows  # noqa: E402


def main() -> None:
    spark = get_spark("table4")
    rows = table4_rows(spark)
    print(format_table(rows))
    print(f"\nwritten: {dump('table4', rows)}")
    spark.stop()


if __name__ == "__main__":
    main()
