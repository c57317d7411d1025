"""Benchmark regenerating Table 3 (shuffles per algorithm × dataset).

Run: pytest benchmarks/bench_table3.py --benchmark-only

One pytest-benchmark entry per implementation (timed over all five
datasets); the assembled table + per-run timings land in results/.
"""
import json
import pathlib

import pytest

from repro.graphs import generators as gen
from repro.mpc import DEFAULT_CUTOFF_EDGES
from repro.tables import DATASET_NAMES, _run_algo, format_table

RESULTS = pathlib.Path(__file__).resolve().parent.parent / "results"

_ALGOS = [
    ("AMPC Maximal Independent Set", "ampc", "mis"),
    ("AMPC Maximal Matching", "ampc", "mm"),
    ("AMPC Minimum Spanning Forest", "ampc", "msf"),
    ("MPC Maximal Independent Set", "mpc", "mis"),
    ("MPC Maximal Matching", "mpc", "mm"),
    ("MPC Minimum Spanning Forest", "mpc", "msf"),
]

_EXPECTED_AMPC = {"mis": 1, "mm": 1, "msf": 5}


@pytest.mark.parametrize("label,model,prob", _ALGOS, ids=[a[0] for a in _ALGOS])
def test_bench_table3_row(spark, benchmark, label, model, prob):
    graphs = {name: gen.dataset(name) for name in DATASET_NAMES}

    def run_row():
        row = {"Algorithm": label}
        timings = {}
        for name in DATASET_NAMES:
            _, ctx, wall = _run_algo(
                spark, model, prob, graphs[name], 0, DEFAULT_CUTOFF_EDGES
            )
            row[name] = ctx.shuffles
            timings[name] = {
                "wall": wall,
                "queries": ctx.queries,
                "phases": ctx.phases,
                "shuffles": ctx.shuffles,
            }
        return row, timings

    row, timings = benchmark.pedantic(run_row, rounds=1, iterations=1, warmup_rounds=0)
    RESULTS.mkdir(exist_ok=True)
    out = RESULTS / "table3_rows"
    out.mkdir(exist_ok=True)
    (out / f"{label.replace(' ', '_')}.json").write_text(
        json.dumps({"row": row, "timings": timings}, indent=2)
    )
    print("\n" + format_table([row]))
    if model == "ampc":
        # Table 3's headline: constant AMPC shuffle count on every graph.
        assert all(row[name] == _EXPECTED_AMPC[prob] for name in DATASET_NAMES)
    else:
        # MPC needs strictly more rounds everywhere.
        assert all(row[name] > _EXPECTED_AMPC[prob] for name in DATASET_NAMES)
