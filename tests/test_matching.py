"""Maximal matching: AMPC (both Theorem 2 variants) + MPC vs greedy oracle."""
import numpy as np
import pandas as pd
import pytest

from repro import reference as ref
from repro.core.matching import (
    ampc_matching_loglog,
    ampc_maximal_matching,
    mpc_maximal_matching,
)
from repro.graphs import generators as gen
from repro.runtime import RoundContext


def _path(n):
    return gen.GraphData(
        n=n,
        edges=pd.DataFrame(
            {"u": np.arange(n - 1, dtype=np.int64), "v": np.arange(1, n, dtype=np.int64)}
        ),
        name="path",
    )


GRAPHS = [
    ("path", _path(9)),
    ("cycle", gen.cycle_graph(14, two=False)),
    ("two_cycles", gen.cycle_graph(12, two=True)),
    ("cl_small", gen.chung_lu(60, 5, 2.2, seed=1)),
    ("cl_mid", gen.chung_lu(150, 8, 2.0, seed=2)),
]


@pytest.mark.parametrize("name,g", GRAPHS, ids=[n for n, _ in GRAPHS])
@pytest.mark.parametrize("seed", [0, 7])
def test_ampc_matching_equals_greedy(spark, name, g, seed):
    got = ampc_maximal_matching(spark, g, seed=seed).edges
    want = ref.greedy_matching(g.n, g.u(), g.v(), seed)
    assert got == want


@pytest.mark.parametrize("name,g", GRAPHS[:4], ids=[n for n, _ in GRAPHS[:4]])
def test_mpc_matching_equals_greedy(spark, name, g):
    got = mpc_maximal_matching(spark, g, seed=0, cutoff_edges=0).edges
    want = ref.greedy_matching(g.n, g.u(), g.v(), 0)
    assert got == want


def test_ampc_and_mpc_identical(spark):
    g = gen.chung_lu(120, 6, 2.1, seed=3)
    a = ampc_maximal_matching(spark, g, seed=5).edges
    b = mpc_maximal_matching(spark, g, seed=5, cutoff_edges=0).edges
    assert a == b


def test_ampc_matching_single_shuffle_untruncated(spark):
    g = gen.chung_lu(100, 6, 2.2, seed=1)
    ctx = RoundContext(model="ampc")
    ampc_maximal_matching(spark, g, seed=0, ctx=ctx)
    assert ctx.shuffles == 1 and ctx.phases == 1
    assert ctx.queries > 0


def test_ampc_matching_truncated_multiround(spark):
    """Lemma 4.7: with a finite n^eps budget the process needs a few
    applications but still produces the exact greedy matching."""
    g = gen.chung_lu(100, 8, 2.0, seed=2)
    ctx = RoundContext(model="ampc")
    got = ampc_maximal_matching(spark, g, seed=0, budget=24, ctx=ctx).edges
    assert got == ref.greedy_matching(g.n, g.u(), g.v(), 0)
    assert ctx.phases >= 1  # may need several applications


def test_ampc_matching_cache_reduces_queries(spark):
    g = gen.chung_lu(140, 8, 2.0, seed=2)
    on, off = RoundContext(model="ampc"), RoundContext(model="ampc")
    r_on = ampc_maximal_matching(spark, g, seed=0, cache=True, ctx=on)
    r_off = ampc_maximal_matching(spark, g, seed=0, cache=False, ctx=off)
    assert r_on.edges == r_off.edges
    assert off.queries > on.queries


@pytest.mark.parametrize("seed", [0, 3])
def test_ampc_matching_valid_and_maximal(spark, seed):
    g = gen.chung_lu(200, 7, 2.1, seed=6)
    m = ampc_maximal_matching(spark, g, seed=seed).edges
    assert ref.is_matching(m)
    assert ref.is_maximal_matching(g.u(), g.v(), m)


@pytest.mark.parametrize("name,g", GRAPHS[:3] + GRAPHS[4:], ids=lambda p: p if isinstance(p, str) else "")
def test_loglog_variant_equals_greedy(spark, name, g):
    got = ampc_matching_loglog(spark, g, seed=0).edges
    want = ref.greedy_matching(g.n, g.u(), g.v(), 0)
    assert got == want


def test_mpc_matching_shuffle_accounting(spark):
    g = gen.chung_lu(90, 6, 2.2, seed=1)
    ctx = RoundContext(model="mpc")
    mpc_maximal_matching(spark, g, seed=0, cutoff_edges=0, ctx=ctx)
    assert ctx.phases >= 1
    assert ctx.shuffles == 4 * ctx.phases


def test_mpc_matching_cutoff_pure_inmemory(spark):
    g = gen.chung_lu(80, 5, 2.2, seed=4)
    ctx = RoundContext(model="mpc")
    got = mpc_maximal_matching(spark, g, seed=0, cutoff_edges=10**9, ctx=ctx).edges
    assert got == ref.greedy_matching(g.n, g.u(), g.v(), 0)
    assert ctx.shuffles == 0


def test_single_edge_graph(spark):
    g = gen.GraphData(n=2, edges=pd.DataFrame({"u": [0], "v": [1]}), name="e")
    assert ampc_maximal_matching(spark, g).edges == {(0, 1)}
