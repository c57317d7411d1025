"""Benchmark regenerating Table 2 (graph inputs & statistics).

Run: pytest benchmarks/bench_table2.py --benchmark-only
"""
import json
import pathlib

from repro.tables import format_table, table2_rows

RESULTS = pathlib.Path(__file__).resolve().parent.parent / "results"


def test_bench_table2(spark, benchmark):
    rows = benchmark.pedantic(
        lambda: table2_rows(spark), rounds=1, iterations=1, warmup_rounds=0
    )
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / "table2.json").write_text(json.dumps(rows, indent=2, default=str))
    print("\n" + format_table(rows))
    # paper-shape assertions: five datasets + the 2xk family row
    assert len(rows) == 6
    names = [r["Dataset"] for r in rows[1:]]
    assert names == ["OK", "TW", "FS", "CW", "HL"]
    hl = rows[-1]
    assert hl["Num. CC"] > 100  # HL: many components (paper: 144.6M)
