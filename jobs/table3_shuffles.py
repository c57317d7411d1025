"""Reproduce Table 3 (shuffle counts): spark-submit jobs/table3_shuffles.py

Also dumps the per-run timings/queries so Table 4 and EXPERIMENTS.md can
reuse them.
"""
from __future__ import annotations

import sys

sys.path.insert(0, str(__import__("pathlib").Path(__file__).resolve().parent))
from _common import dump, get_spark  # noqa: E402

from repro.tables import format_table, table3_rows  # noqa: E402


def main() -> None:
    spark = get_spark("table3")
    timings: dict = {}
    rows = table3_rows(spark, collect_timings=timings)
    print(format_table(rows))
    print(f"\nwritten: {dump('table3', rows)}")
    dump("table3_timings", {f"{a}|{d}": v for (a, d), v in timings.items()})
    spark.stop()


if __name__ == "__main__":
    main()
