"""Forest path machinery of Appendix B: rooting, levels, Euler tours,
LCA via RMQ, heavy-light decomposition, and max-edge-weight path
queries.

``ForestPathOracle`` packages Algorithm 5's precomputed structures
(lines 1–9): built once per forest (O(n log n) work, the paper's O(1)
AMPC rounds of precomputation), then each edge query (line 10) runs in
O(log n) reads. The oracle is picklable, so ``repro.core.flight``
broadcasts it and evaluates edges in a single adaptive round.
"""
from __future__ import annotations

from collections import deque

import numpy as np

from repro.core.rmq import SparseTable
from repro.reference import UnionFind

NEG_INF = float("-inf")
INF = float("inf")


class ForestPathOracle:
    """LCA + max-edge-weight-on-path queries over a forest.

    Parameters: ``n`` vertices, forest edges ``(fu, fv, fw)`` (must be
    acyclic — verified during construction).
    """

    def __init__(self, n: int, fu: np.ndarray, fv: np.ndarray, fw: np.ndarray):
        self.n = n
        uf = UnionFind(n)
        for a, b in zip(fu.tolist(), fv.tolist()):
            if not uf.union(int(a), int(b)):
                raise ValueError("forest input contains a cycle")
        self.comp = np.array([uf.find(i) for i in range(n)], dtype=np.int64)

        adj: list[list[tuple[int, float]]] = [[] for _ in range(n)]
        for a, b, w in zip(fu.tolist(), fv.tolist(), fw.tolist()):
            adj[int(a)].append((int(b), float(w)))
            adj[int(b)].append((int(a), float(w)))

        self.parent = np.full(n, -1, dtype=np.int64)
        self.parent_w = np.full(n, NEG_INF, dtype=np.float64)
        self.level = np.full(n, -1, dtype=np.int64)
        order: list[int] = []  # BFS order (parents precede children)
        roots = []
        for r in range(n):
            if self.level[r] >= 0:
                continue
            roots.append(r)
            self.level[r] = 0
            q = deque([r])
            while q:
                x = q.popleft()
                order.append(x)
                for y, w in adj[x]:
                    if self.level[y] < 0:
                        self.level[y] = self.level[x] + 1
                        self.parent[y] = x
                        self.parent_w[y] = w
                        q.append(y)
        self.roots = np.array(roots, dtype=np.int64)

        # --- Euler tour + level RMQ for LCA (Algorithm 5 lines 4-6) ---
        children: list[list[int]] = [[] for _ in range(n)]
        for x in order:
            p = self.parent[x]
            if p >= 0:
                children[p].append(x)
        tour: list[int] = []
        first = np.full(n, -1, dtype=np.int64)
        for r in roots:
            first[r] = len(tour)
            tour.append(r)
            stack: list[list[int]] = [[r, 0]]
            while stack:
                x, ci = stack[-1]
                kids = children[x]
                if ci < len(kids):
                    stack[-1][1] = ci + 1
                    c = kids[ci]
                    first[c] = len(tour)
                    tour.append(c)
                    stack.append([c, 0])
                else:
                    stack.pop()
                    if stack:
                        tour.append(stack[-1][0])
        self.tour = np.array(tour, dtype=np.int64)
        self.first = first
        self._lca_rmq = SparseTable(self.level[self.tour] if len(tour) else np.array([]), op="min")

        # --- Heavy-light decomposition (lines 7-9) ---
        size = np.ones(n, dtype=np.int64)
        for x in reversed(order):
            p = self.parent[x]
            if p >= 0:
                size[p] += size[x]
        heavy = np.full(n, -1, dtype=np.int64)
        for x in order:
            best, best_sz = -1, 0
            for y, _ in adj[x]:
                if self.parent[y] == x and size[y] > best_sz:
                    best, best_sz = y, size[y]
            heavy[x] = best
        self.head = np.full(n, -1, dtype=np.int64)
        self.pos = np.full(n, -1, dtype=np.int64)
        base = np.full(n, NEG_INF, dtype=np.float64)
        cursor = 0
        for x in order:  # BFS order: heads assigned before descendants
            if self.pos[x] >= 0:
                continue
            # x starts a new heavy path iff it is a root or a light child
            p = self.parent[x]
            if p >= 0 and heavy[p] == x:
                continue  # will be placed when walking its head's path
            y = x
            while y >= 0:
                self.head[y] = x
                self.pos[y] = cursor
                base[cursor] = self.parent_w[y]  # weight of edge to parent
                cursor += 1
                y = int(heavy[y])
        self._path_rmq = SparseTable(base, op="max")
        self.size = size
        self.heavy = heavy

    # ------------------------------------------------------------------

    def same_component(self, a: int, b: int) -> bool:
        return bool(self.comp[a] == self.comp[b])

    def lca(self, a: int, b: int) -> int:
        if not self.same_component(a, b):
            raise ValueError("lca of vertices in different trees")
        i, j = int(self.first[a]), int(self.first[b])
        if i > j:
            i, j = j, i
        return int(self.tour[self._lca_rmq.arg_query(i, j)])

    def _max_to_ancestor(self, u: int, anc: int) -> float:
        """Max edge weight on the u → anc path (anc must be an ancestor).

        Climbs heavy paths: per Lemma B.1, O(log n) segments, each a
        contiguous heavy-path range answered by one RMQ read.
        """
        res = NEG_INF
        while self.head[u] != self.head[anc]:
            h = int(self.head[u])
            res = max(res, self._path_rmq.query(int(self.pos[h]), int(self.pos[u])))
            u = int(self.parent[h])
        if u != anc:
            res = max(res, self._path_rmq.query(int(self.pos[anc]) + 1, int(self.pos[u])))
        return res

    def path_max(self, a: int, b: int) -> float:
        """w_F(a, b) of Definition 3.7: max edge weight on the a-b path;
        +inf across components; -inf when a == b."""
        if a == b:
            return NEG_INF
        if not self.same_component(a, b):
            return INF
        c = self.lca(a, b)
        return max(self._max_to_ancestor(a, c), self._max_to_ancestor(b, c))

    def pivots(self, v: int) -> list[int]:
        """The pivot vertices of Appendix B: heads of the heavy-path
        segments on the v → root path (plus v and the root). O(log n)
        of them per Lemma B.1."""
        out = [v]
        u = v
        while self.parent[int(self.head[u])] >= 0:
            u = int(self.parent[int(self.head[u])])
            out.append(u)
        root = int(self.head[u])
        if self.parent[root] < 0 and out[-1] != root:
            out.append(root)
        return out
