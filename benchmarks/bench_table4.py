"""Benchmark regenerating Table 4 (normalized running times).

Run: pytest benchmarks/bench_table4.py --benchmark-only

Split into the 1-vs-2-Cycle sweep (three graph sizes, AMPC-RDMA vs
AMPC-TCP model vs measured MPC) and the MIS comparison over the five
real-graph stand-ins.
"""
import json
import pathlib
import time

import pytest

from repro.ampc.cost import modeled_time
from repro.core.cycle import ampc_one_vs_two_cycle, mpc_cycle_cc
from repro.core.mis import ampc_mis, mpc_mis
from repro.graphs import generators as gen
from repro.mpc import DEFAULT_CUTOFF_EDGES
from repro.runtime import RoundContext
from repro.tables import DATASET_NAMES, _cycle_p, format_table

RESULTS = pathlib.Path(__file__).resolve().parent.parent / "results"


def _dump(name, obj):
    RESULTS.mkdir(exist_ok=True)
    out = RESULTS / "table4_rows"
    out.mkdir(exist_ok=True)
    (out / f"{name}.json").write_text(json.dumps(obj, indent=2))


@pytest.mark.parametrize("label", ["2e4", "2e5", "2e6"])
def test_bench_table4_cycle(spark, benchmark, label):
    n = gen.CYCLE_SIZES[label]
    g = gen.cycle_graph(n, two=True, name=label)

    def run():
        ctx = RoundContext(model="ampc")
        t0 = time.perf_counter()
        res = ampc_one_vs_two_cycle(spark, g, p=_cycle_p(n), seed=0, ctx=ctx)
        wall_a = time.perf_counter() - t0
        assert res.n_components == 2
        ctx2 = RoundContext(model="mpc")
        t0 = time.perf_counter()
        res2 = mpc_cycle_cc(spark, g, seed=0, ctx=ctx2)
        wall_m = time.perf_counter() - t0
        assert res2.n_components == 2
        rdma = modeled_time(wall_a, ctx.queries, "rdma")
        return {
            "n": n,
            "rdma": rdma,
            "tcp": modeled_time(wall_a, ctx.queries, "tcp"),
            "mpc": wall_m,
            "queries": ctx.queries,
            "mpc_phases": ctx2.phases,
            "mpc_shuffles": ctx2.shuffles,
        }

    res = benchmark.pedantic(run, rounds=1, iterations=1, warmup_rounds=0)
    _dump(f"cycle_{label}", res)
    norm = {k: round(res[k] / res["rdma"], 2) for k in ("rdma", "tcp", "mpc")}
    print(f"\n2-Cyc {label}: normalized {norm}")
    assert res["rdma"] <= res["tcp"] <= res["mpc"] * 5  # model sanity
    assert res["mpc"] > res["rdma"]  # the paper's headline comparison


@pytest.mark.parametrize("name", DATASET_NAMES)
def test_bench_table4_mis(spark, benchmark, name):
    g = gen.dataset(name)

    def run():
        ctx = RoundContext(model="ampc")
        t0 = time.perf_counter()
        ampc_mis(spark, g, seed=0, ctx=ctx)
        wall_a = time.perf_counter() - t0
        t0 = time.perf_counter()
        mpc_mis(spark, g, seed=0, cutoff_edges=DEFAULT_CUTOFF_EDGES)
        wall_m = time.perf_counter() - t0
        return {
            "rdma": modeled_time(wall_a, ctx.queries, "rdma"),
            "tcp": modeled_time(wall_a, ctx.queries, "tcp"),
            "mpc": wall_m,
            "queries": ctx.queries,
        }

    res = benchmark.pedantic(run, rounds=1, iterations=1, warmup_rounds=0)
    _dump(f"mis_{name}", res)
    norm = {k: round(res[k] / res["rdma"], 2) for k in ("rdma", "tcp", "mpc")}
    print(f"\nMIS {name}: normalized {norm}")
    rows = [{"Algorithm": f"MIS {name}", **norm}]
    print(format_table(rows))
    assert res["tcp"] >= res["rdma"]
    assert res["mpc"] > res["rdma"]
