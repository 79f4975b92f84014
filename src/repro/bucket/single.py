"""Scan-based frontier structures.

``SingleBucket`` is the plain framework of Alg. 1: the active set is an
explicit array, re-packed (and scanned) once per round — O(|A|) per
round, O(n+m) total by Thm. 3.1.

``ScanAll`` is what ParK and PKC do: no active set at all, the whole
vertex array is scanned every round — O(n) per round, O(m + k_max*n)
total work. This is the source of their work-inefficiency on graphs
with large k_max (Sec. 3.2).
"""
from __future__ import annotations

import numpy as np

from repro.bucket.interface import ACTIVE, FrontierStructure


class SingleBucket(FrontierStructure):
    """Alg. 1's active-set scan: pack A each round, extract deg == k."""

    def __init__(self, n: int):
        super().__init__(n)
        self.active = np.empty(0, dtype=np.int64)

    def build(self, ids: np.ndarray, deg: np.ndarray) -> float:
        self.active = np.asarray(ids, dtype=np.int64).copy()
        self.scanned += len(self.active)
        return float(len(self.active))

    def next_frontier(self, k, deg, state):
        a = self.active
        cost = float(len(a))
        self.scanned += len(a)
        alive = state[a] == ACTIVE
        a = a[alive]
        take = deg[a] <= k
        frontier = a[take]
        self.active = a[~take]
        return frontier, cost

    def on_decrement(self, ids, deg) -> float:
        return 0.0


class ScanAll(FrontierStructure):
    """ParK/PKC: no active set — scan all n vertices every round."""

    def build(self, ids: np.ndarray, deg: np.ndarray) -> float:
        return 0.0

    def next_frontier(self, k, deg, state):
        cost = float(self.n)
        self.scanned += self.n
        frontier = np.flatnonzero((state == ACTIVE) & (deg <= k)).astype(np.int64)
        return frontier, cost

    def on_decrement(self, ids, deg) -> float:
        return 0.0
