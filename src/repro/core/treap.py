"""Ternary treaps (Appendix A).

Given a tree T with Δ(T) ≤ 3 and a rank permutation π, the ternary
treap R is defined recursively: the minimum-rank vertex is the root;
removing it splits T into ≤ 3 components, whose treaps become the
children. Lemma A.1: height(R) = O(log n) w.h.p.; Lemma A.2: the
truncated Prim search from v makes O(|R_v|) queries. Both are validated
empirically in tests — this module exists to make the paper's analysis
object executable, not as a runtime dependency of the algorithms.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass
class TernaryTreap:
    parent: np.ndarray  # treap parent per vertex (-1 for roots)
    depth: np.ndarray  # depth in the treap (root = 0)
    subtree: np.ndarray  # subtree size |R_v| per vertex

    @property
    def height(self) -> int:
        return int(self.depth.max()) + 1 if len(self.depth) else 0


def build_ternary_treap(
    n: int, tu: np.ndarray, tv: np.ndarray, ranks: np.ndarray
) -> TernaryTreap:
    """Build the (unique) ternary treap of forest (tu, tv) under ranks.

    Iterative divide-and-conquer over components: the min-rank vertex
    of a component roots its treap; its removal splits the component.
    """
    adj: list[list[int]] = [[] for _ in range(n)]
    deg = np.zeros(n, dtype=np.int64)
    for a, b in zip(tu.tolist(), tv.tolist()):
        adj[int(a)].append(int(b))
        adj[int(b)].append(int(a))
        deg[int(a)] += 1
        deg[int(b)] += 1
    if deg.max(initial=0) > 3:
        raise ValueError("ternary treap needs a tree with max degree 3")

    parent = np.full(n, -1, dtype=np.int64)
    depth = np.zeros(n, dtype=np.int64)
    subtree = np.ones(n, dtype=np.int64)

    comp_seen = np.zeros(n, dtype=bool)
    for s in range(n):
        if comp_seen[s]:
            continue
        # collect the component
        comp = [s]
        comp_seen[s] = True
        qi = 0
        while qi < len(comp):
            x = comp[qi]
            qi += 1
            for y in adj[x]:
                if not comp_seen[y]:
                    comp_seen[y] = True
                    comp.append(y)
        # recursive splitting (explicit work list of (members, treap_parent))
        work: list[tuple[list[int], int]] = [(comp, -1)]
        while work:
            members, tp = work.pop()
            root = min(members, key=lambda x: ranks[x])
            parent[root] = tp
            depth[root] = 0 if tp < 0 else depth[tp] + 1
            member_set = set(members)
            member_set.discard(root)
            # split members \ {root} into connected pieces
            while member_set:
                seed_v = next(iter(member_set))
                piece = [seed_v]
                member_set.discard(seed_v)
                qi = 0
                while qi < len(piece):
                    x = piece[qi]
                    qi += 1
                    for y in adj[x]:
                        if y in member_set:
                            member_set.discard(y)
                            piece.append(y)
                work.append((piece, root))

    # subtree sizes: accumulate over vertices sorted by decreasing depth
    for x in np.argsort(-depth).tolist():
        p = parent[x]
        if p >= 0:
            subtree[p] += subtree[x]
    return TernaryTreap(parent=parent, depth=depth, subtree=subtree)
