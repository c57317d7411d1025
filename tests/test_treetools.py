"""ForestPathOracle: LCA, heavy-light decomposition, path-max vs brute."""
import numpy as np
import pytest

from repro import reference as ref
from repro.core.treetools import ForestPathOracle
from repro.hashing import edge_rank


def _random_forest(n, seed, *, trees=1):
    """Random spanning forest: random attachment within `trees` groups."""
    g = np.random.default_rng(seed)
    groups = np.array_split(g.permutation(n), trees)
    fu, fv = [], []
    for grp in groups:
        for i in range(1, len(grp)):
            fu.append(int(grp[g.integers(0, i)]))
            fv.append(int(grp[i]))
    fu = np.array(fu, dtype=np.int64)
    fv = np.array(fv, dtype=np.int64)
    fw = edge_rank(fu, fv, seed) * 100
    return fu, fv, fw


def _brute_lca(oracle, n, fu, fv, a, b):
    adj = ref.adjacency(n, np.minimum(fu, fv), np.maximum(fu, fv))
    # walk both to root using oracle.parent for ground-truth ancestry
    anc = set()
    x = a
    while x >= 0:
        anc.add(x)
        x = int(oracle.parent[x])
    x = b
    while x not in anc:
        x = int(oracle.parent[x])
    return x


@pytest.mark.parametrize("seed", range(4))
def test_lca_matches_parent_walk(seed):
    n = 40
    fu, fv, fw = _random_forest(n, seed)
    o = ForestPathOracle(n, fu, fv, fw)
    g = np.random.default_rng(seed + 99)
    for _ in range(60):
        a, b = int(g.integers(0, n)), int(g.integers(0, n))
        assert o.lca(a, b) == _brute_lca(o, n, fu, fv, a, b)


@pytest.mark.parametrize("seed", range(5))
@pytest.mark.parametrize("trees", [1, 3])
def test_path_max_vs_bruteforce(seed, trees):
    n = 36
    fu, fv, fw = _random_forest(n, seed, trees=trees)
    o = ForestPathOracle(n, fu, fv, fw)
    g = np.random.default_rng(seed)
    for _ in range(80):
        a, b = int(g.integers(0, n)), int(g.integers(0, n))
        want = ref.path_max_weight(n, fu, fv, fw, a, b)
        assert o.path_max(a, b) == pytest.approx(want)


def test_path_max_on_explicit_path():
    fu = np.array([0, 1, 2, 3])
    fv = np.array([1, 2, 3, 4])
    fw = np.array([5.0, 1.0, 7.0, 3.0])
    o = ForestPathOracle(5, fu, fv, fw)
    assert o.path_max(0, 4) == 7.0
    assert o.path_max(1, 2) == 1.0
    assert o.path_max(2, 0) == max(5.0, 1.0)
    assert o.path_max(3, 3) == float("-inf")


def test_cross_component_inf():
    fu, fv = np.array([0, 2]), np.array([1, 3])
    fw = np.array([1.0, 2.0])
    o = ForestPathOracle(4, fu, fv, fw)
    assert o.path_max(0, 2) == float("inf")
    assert not o.same_component(1, 3)
    with pytest.raises(ValueError):
        o.lca(0, 3)


def test_cycle_input_rejected():
    fu, fv = np.array([0, 1, 0]), np.array([1, 2, 2])
    fw = np.array([1.0, 2.0, 3.0])
    with pytest.raises(ValueError):
        ForestPathOracle(3, fu, fv, fw)


@pytest.mark.parametrize("seed", range(3))
def test_pivot_count_logarithmic(seed):
    """Lemma B.1: O(log n) pivots per vertex."""
    n = 512
    fu, fv, fw = _random_forest(n, seed)
    o = ForestPathOracle(n, fu, fv, fw)
    bound = 2 * np.log2(n) + 4
    for v in range(0, n, 7):
        assert len(o.pivots(v)) <= bound


def test_heavy_paths_are_disjoint_cover():
    n = 64
    fu, fv, fw = _random_forest(n, 1)
    o = ForestPathOracle(n, fu, fv, fw)
    # every vertex has exactly one position; positions are a permutation
    assert sorted(o.pos.tolist()) == list(range(n))
    # head of each vertex lies on its root path
    for v in range(n):
        x, h = v, int(o.head[v])
        seen = False
        while x >= 0:
            if x == h:
                seen = True
                break
            x = int(o.parent[x])
        assert seen


def test_isolated_vertices_ok():
    o = ForestPathOracle(5, np.array([0]), np.array([1]), np.array([2.0]))
    assert o.path_max(2, 3) == float("inf")
    assert o.path_max(0, 1) == 2.0
