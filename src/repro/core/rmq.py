"""Sparse-table range queries (Appendix B's RMQ data structure).

``b[x, y] = argopt over a[x .. x+2^y-1]`` — O(k log k) precompute,
O(1) query, exactly the auxiliary-array construction described in
Appendix B (Andoni et al. build it in O(1) MPC rounds; here the build
is a numpy scan and the structure is broadcast to executors).
"""
from __future__ import annotations

import numpy as np


class SparseTable:
    """Idempotent range queries (min or max) over a fixed array."""

    def __init__(self, values: np.ndarray, op: str = "min"):
        if op not in ("min", "max"):
            raise ValueError("op must be 'min' or 'max'")
        a = np.asarray(values, dtype=np.float64)
        self.op = op
        self.values = a
        k = len(a)
        self.levels: list[np.ndarray] = []
        if k == 0:
            return
        idx = np.arange(k, dtype=np.int64)
        self.levels.append(idx)
        span = 1
        cmp = np.less if op == "min" else np.greater
        while 2 * span <= k:
            prev = self.levels[-1]
            left = prev[: k - 2 * span + 1]
            right = prev[span : k - span + 1]
            take_left = cmp(a[left], a[right]) | (a[left] == a[right])
            self.levels.append(np.where(take_left, left, right))
            span *= 2
        self._log = np.zeros(k + 1, dtype=np.int64)
        for i in range(2, k + 1):
            self._log[i] = self._log[i // 2] + 1

    def arg_query(self, i: int, j: int) -> int:
        """Index of the op-extreme value in a[i..j] (inclusive)."""
        if not 0 <= i <= j < len(self.values):
            raise IndexError(f"bad range [{i}, {j}] for size {len(self.values)}")
        t = int(self._log[j - i + 1])
        left = int(self.levels[t][i])
        right = int(self.levels[t][j - (1 << t) + 1])
        a = self.values
        if self.op == "min":
            return left if a[left] <= a[right] else right
        return left if a[left] >= a[right] else right

    def query(self, i: int, j: int) -> float:
        return float(self.values[self.arg_query(i, j)])
