"""AMPC DHT construction, metering, cost model, and round accounting."""
import numpy as np
import pytest

from repro.ampc.cost import LATENCY_S, modeled_time
from repro.ampc.dht import Meter, build_cycle_store, build_sorted_adjacency
from repro.graphs import generators as gen
from repro.hashing import edge_rank, hash01
from repro.runtime import RoundContext


class TestMeter:
    def test_lookup_counts(self):
        m = Meter()
        m.lookup()
        m.lookup(words=3)
        m.hit()
        assert m.queries == 2
        assert m.cache_hits == 1
        assert m.kv_bytes == 4 * 8


class TestBuildSortedAdjacency:
    def test_vertex_rank_sorted(self, spark):
        g = gen.chung_lu(50, 5, 2.2, seed=0)
        ctx = RoundContext(model="ampc")
        dht = build_sorted_adjacency(
            spark, g.to_spark(spark), ctx, sort="vertex_rank", seed=3
        )
        assert ctx.shuffles == 1
        for src, (nbrs, keys) in dht.store.items():
            assert np.all(np.diff(keys) >= 0)
            assert np.allclose(keys, hash01(nbrs, 3))

    def test_direct_keeps_only_earlier(self, spark):
        g = gen.chung_lu(60, 5, 2.2, seed=1)
        ctx = RoundContext(model="ampc")
        dht = build_sorted_adjacency(
            spark, g.to_spark(spark), ctx, sort="vertex_rank", direct=True, seed=0
        )
        for src, (nbrs, keys) in dht.store.items():
            r_src = hash01(np.array([src]), 0)[0]
            assert (keys < r_src).all()

    def test_direct_halves_entries(self, spark):
        g = gen.chung_lu(60, 5, 2.2, seed=1)
        full = build_sorted_adjacency(
            spark, g.to_spark(spark), RoundContext(model="ampc"), sort="vertex_rank"
        )
        direct = build_sorted_adjacency(
            spark,
            g.to_spark(spark),
            RoundContext(model="ampc"),
            sort="vertex_rank",
            direct=True,
        )
        n_full = sum(len(v[0]) for v in full.store.values())
        n_direct = sum(len(v[0]) for v in direct.store.values())
        assert n_full == 2 * g.m
        assert n_direct == g.m  # each edge kept in exactly one direction

    def test_edge_rank_sorted(self, spark):
        g = gen.chung_lu(40, 4, 2.2, seed=2)
        dht = build_sorted_adjacency(
            spark, g.to_spark(spark), RoundContext(model="ampc"), sort="edge_rank", seed=1
        )
        for src, (nbrs, keys) in dht.store.items():
            srcs = np.full(len(nbrs), src, dtype=np.int64)
            assert np.allclose(keys, edge_rank(srcs, nbrs, 1))
            assert np.all(np.diff(keys) >= 0)

    def test_weight_sorted(self, spark):
        g = gen.with_degree_weights(gen.chung_lu(40, 4, 2.2, seed=3))
        dht = build_sorted_adjacency(
            spark, g.to_spark(spark), RoundContext(model="ampc"), sort="weight"
        )
        wt = {(min(a, b), max(a, b)): w for a, b, w in zip(g.u(), g.v(), g.w())}
        for src, (nbrs, keys) in dht.store.items():
            assert np.all(np.diff(keys) >= 0)
            for y, k in zip(nbrs.tolist(), keys.tolist()):
                assert wt[(min(src, y), max(src, y))] == pytest.approx(k)

    def test_weight_sort_requires_w(self, spark):
        g = gen.chung_lu(20, 3, 2.2, seed=0)
        with pytest.raises(Exception):
            build_sorted_adjacency(
                spark, g.to_spark(spark), RoundContext(model="ampc"), sort="weight"
            )

    def test_direct_requires_vertex_rank(self, spark):
        g = gen.chung_lu(20, 3, 2.2, seed=0)
        with pytest.raises(ValueError):
            build_sorted_adjacency(
                spark,
                g.to_spark(spark),
                RoundContext(model="ampc"),
                sort="edge_rank",
                direct=True,
            )

    def test_payload_bytes_recorded(self, spark):
        g = gen.chung_lu(30, 4, 2.2, seed=0)
        ctx = RoundContext(model="ampc")
        dht = build_sorted_adjacency(spark, g.to_spark(spark), ctx, sort="vertex_rank")
        assert dht.payload_bytes > 0
        assert ctx.kv_bytes == dht.payload_bytes


class TestCycleStore:
    def test_successors(self, spark):
        g = gen.cycle_graph(16, two=True)
        ctx = RoundContext(model="ampc")
        dht = build_cycle_store(spark, g.to_spark(spark), g.n, ctx)
        assert ctx.shuffles == 1
        nbr = dht.store
        assert nbr.shape == (16, 2)
        deg_check = np.zeros(16)
        for v in range(16):
            a, b = nbr[v]
            assert v in nbr[a] and v in nbr[b]

    def test_non_cycle_rejected(self, spark):
        g = gen.chung_lu(20, 4, 2.2, seed=0)
        with pytest.raises(ValueError):
            build_cycle_store(spark, g.to_spark(spark), g.n, RoundContext(model="ampc"))


class TestCostModel:
    def test_zero_queries_is_wall(self):
        assert modeled_time(2.5, 0, "rdma") == 2.5

    def test_tcp_slower_than_rdma(self):
        assert modeled_time(1.0, 10**6, "tcp") > modeled_time(1.0, 10**6, "rdma")

    def test_latency_arithmetic(self):
        q = 1000
        assert modeled_time(1.0, q, "rdma", concurrency=1) == pytest.approx(
            1.0 + q * LATENCY_S["rdma"]
        )

    def test_unknown_transport(self):
        with pytest.raises(ValueError):
            modeled_time(1.0, 1, "carrier-pigeon")


class TestRoundContext:
    def test_shuffle_counting(self):
        ctx = RoundContext(model="mpc")
        ctx.shuffle()
        ctx.shuffle(3)
        assert ctx.shuffles == 4

    def test_barrier_counts_and_materializes(self, spark):
        ctx = RoundContext(model="mpc")
        df = spark.range(10).groupBy().count()
        out = ctx.barrier(df, shuffles=2)
        assert ctx.shuffles == 2
        assert out.collect()[0]["count"] == 10
