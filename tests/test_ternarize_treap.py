"""Ternarization (Alg. 2 line 2) and ternary treaps (Appendix A)."""
import numpy as np
import pytest

from repro import reference as ref
from repro.core.msf import _prim_search
from repro.core.ternarize import msf_via_ternarization, ternarize
from repro.core.treap import build_ternary_treap
from repro.ampc.dht import Meter
from repro.graphs import generators as gen
from repro.hashing import hash01


def _weighted(g):
    return gen.with_degree_weights(g)


class TestTernarize:
    @pytest.mark.parametrize("seed", range(3))
    def test_degrees_bounded(self, seed):
        g = _weighted(gen.chung_lu(80, 6, 2.0, seed=seed))
        t = ternarize(g)
        deg = np.zeros(t.graph.n, dtype=np.int64)
        np.add.at(deg, t.graph.u(), 1)
        np.add.at(deg, t.graph.v(), 1)
        assert deg.max() <= 3

    def test_vertex_and_edge_counts(self):
        g = _weighted(gen.chung_lu(60, 6, 2.0, seed=1))
        t = ternarize(g)
        deg = np.zeros(g.n, dtype=np.int64)
        np.add.at(deg, g.u(), 1)
        np.add.at(deg, g.v(), 1)
        big = deg > 3
        # replaced hubs stay as isolated placeholder ids (see Ternarized)
        expected_n = int(g.n + deg[big].sum())
        expected_m = g.m + int(deg[big].sum())  # one cycle edge per slot
        assert t.graph.n == expected_n
        assert t.graph.m == expected_m

    def test_dummy_weights_below_real_and_distinct(self):
        g = _weighted(gen.chung_lu(60, 6, 2.0, seed=2))
        t = ternarize(g)
        w = t.graph.w()
        assert len(np.unique(w)) == len(w)
        dummies = w[w < t.dummy_below]
        reals = w[w >= t.dummy_below]
        assert len(reals) == g.m
        if len(dummies):
            assert dummies.max() < reals.min()

    def test_low_degree_graph_unchanged(self):
        g = _weighted(gen.cycle_graph(12, two=False))
        t = ternarize(g)
        assert t.graph.n == g.n
        assert t.graph.m == g.m

    def test_origin_mapping(self):
        g = _weighted(gen.chung_lu(50, 8, 2.0, seed=3))
        t = ternarize(g)
        assert np.array_equal(t.origin[: g.n], np.arange(g.n))
        assert t.origin.max() < g.n

    @pytest.mark.parametrize("seed", [0, 5])
    def test_msf_via_ternarization_exact(self, spark, seed):
        g = _weighted(gen.chung_lu(70, 6, 2.0, seed=seed))
        got = msf_via_ternarization(spark, g, seed=seed).edges
        assert got == ref.kruskal_msf(g.n, g.u(), g.v(), g.w())

    def test_kruskal_on_ternarized_maps_back(self):
        """MSF(G') minus dummies == MSF(G) under the origin map."""
        g = _weighted(gen.chung_lu(40, 7, 2.0, seed=1))
        t = ternarize(g)
        msf3 = ref.kruskal_msf(t.graph.n, t.graph.u(), t.graph.v(), t.graph.w())
        wt = {
            (int(a), int(b)): float(x)
            for a, b, x in zip(t.graph.u(), t.graph.v(), t.graph.w())
        }
        real = {e for e in msf3 if wt[e] > t.dummy_below}
        assert t.map_back(real) == ref.kruskal_msf(g.n, g.u(), g.v(), g.w())


def _tree_path(n, tu, tv, a, b):
    """Vertices on the unique a..b path of the tree (BFS back-pointers)."""
    import collections

    adj = collections.defaultdict(list)
    for x, y in zip(tu.tolist(), tv.tolist()):
        adj[x].append(y)
        adj[y].append(x)
    prev = {a: a}
    q = collections.deque([a])
    while q:
        x = q.popleft()
        if x == b:
            break
        for y in adj[x]:
            if y not in prev:
                prev[y] = x
                q.append(y)
    path = [b]
    while path[-1] != a:
        path.append(prev[path[-1]])
    return path


def _random_ternary_tree(n, seed):
    """Random tree with max degree 3 (attach to any vertex with deg<3)."""
    g = np.random.default_rng(seed)
    deg = np.zeros(n, dtype=np.int64)
    tu, tv = [], []
    for i in range(1, n):
        cands = np.flatnonzero(deg[:i] < (3 if i > 1 else 2))
        p = int(cands[g.integers(0, len(cands))])
        tu.append(p)
        tv.append(i)
        deg[p] += 1
        deg[i] += 1
    return np.array(tu, dtype=np.int64), np.array(tv, dtype=np.int64)


class TestTernaryTreap:
    @pytest.mark.parametrize("seed", range(4))
    def test_root_is_min_rank(self, seed):
        n = 50
        tu, tv = _random_ternary_tree(n, seed)
        ranks = hash01(np.arange(n), seed)
        t = build_ternary_treap(n, tu, tv, ranks)
        root = int(np.argmin(ranks))
        assert t.parent[root] == -1
        assert t.depth[root] == 0
        assert t.subtree[root] == n

    @pytest.mark.parametrize("seed", range(4))
    def test_heap_property(self, seed):
        n = 60
        tu, tv = _random_ternary_tree(n, seed)
        ranks = hash01(np.arange(n), seed + 10)
        t = build_ternary_treap(n, tu, tv, ranks)
        for x in range(n):
            p = int(t.parent[x])
            if p >= 0:
                assert ranks[p] < ranks[x]

    @pytest.mark.parametrize("seed", range(6))
    def test_height_logarithmic_on_paths(self, seed):
        """Lemma A.1 on path-shaped ternary trees (the shape ternarized
        MSTs take along dummy cycles): height O(log n) w.h.p. —
        equivalent to random-BST height."""
        n = 2000
        tu = np.arange(n - 1, dtype=np.int64)
        tv = np.arange(1, n, dtype=np.int64)
        ranks = hash01(np.arange(n), seed)
        t = build_ternary_treap(n, tu, tv, ranks)
        assert t.height <= 8 * np.log2(n)

    @pytest.mark.parametrize("seed", range(2))
    def test_ancestor_is_path_minimum(self, seed):
        """The defining property of tree treaps: j is an ancestor of i
        iff rank(j) is minimal on the tree path i..j. (On bushy ternary
        trees this makes the height ω(log n) — with diameter D, expected
        depth is Σ_j 1/|path(i,j)| ≈ n/D — an observed gap vs Lemma
        A.1's stated generality; recorded in EXPERIMENTS.md. The
        algorithms themselves are unaffected: the Prim cost bound of
        Lemma A.2 is about subtree sizes, tested below.)"""
        n = 40
        tu, tv = _random_ternary_tree(n, seed)
        ranks = hash01(np.arange(n), seed + 1)
        t = build_ternary_treap(n, tu, tv, ranks)
        # ancestors of i per implementation
        for i in range(n):
            anc = set()
            x = int(t.parent[i])
            while x >= 0:
                anc.add(x)
                x = int(t.parent[x])
            for j in range(n):
                if i == j:
                    continue
                path = _tree_path(n, tu, tv, i, j)
                is_min = ranks[j] == min(ranks[x] for x in path)
                assert (j in anc) == is_min


    def test_high_degree_rejected(self):
        tu = np.array([0, 0, 0, 0])
        tv = np.array([1, 2, 3, 4])
        with pytest.raises(ValueError):
            build_ternary_treap(5, tu, tv, hash01(np.arange(5), 0))

    @pytest.mark.parametrize("seed", range(3))
    def test_lemma_a2_prim_cost_bounded_by_subtree(self, seed):
        """Lemma A.2: untruncated Prim search cost from v is O(|R_v|)."""
        n = 120
        tu, tv = _random_ternary_tree(n, seed)
        ranks = hash01(np.arange(n), seed + 3)
        t = build_ternary_treap(n, tu, tv, ranks)
        # weight-sorted adjacency store over the tree itself
        from repro.hashing import edge_rank

        w = edge_rank(tu, tv, seed)
        store = {}
        for a, b, ww in zip(tu.tolist(), tv.tolist(), w.tolist()):
            store.setdefault(a, []).append((ww, b))
            store.setdefault(b, []).append((ww, a))
        store = {
            k: (
                np.array([y for _, y in sorted(vs)], dtype=np.int64),
                np.array([x for x, _ in sorted(vs)], dtype=np.float64),
            )
            for k, vs in store.items()
        }
        ranks_of = lambda x: float(ranks[x])  # noqa: E731
        for v in range(0, n, 5):
            meter = Meter()
            msf_edges, visits = _prim_search(v, store, ranks_of, n + 1, meter)
            explored = len(msf_edges) + 1
            assert explored <= 3 * int(t.subtree[v]) + 1
