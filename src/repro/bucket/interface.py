"""Interface shared by all frontier-management structures.

The machine simulator drives a structure through three calls, mirroring
the bucketing interface of Sec. 5.1 (BUILDBUCKETS / GETNEXTBUCKET /
DECREASEKEY):

- ``build(ids, deg)``: register the initially active vertices.
- ``next_frontier(k, deg, state)``: return the ids to peel in round k
  (active vertices whose induced degree is <= k) and the number of
  work units the structure spent producing them.
- ``on_decrement(ids, deg)``: called once per subround with the unique
  vertices whose induced degree changed; returns the work units spent
  (DecreaseKey moves).

``deg`` is the engine-owned induced-degree array and ``state`` the
engine-owned vertex state (0 = active, 1 = queued for the next
frontier, 2 = peeled); structures read but never write them.
"""
from __future__ import annotations

import numpy as np

ACTIVE, QUEUED, PEELED = 0, 1, 2

# Cost of one DecreaseKey bucket move: a CAS hash-bag insert plus the
# lazily-deleted stale copy it leaves to be filtered at extraction.
# This is the constant-factor structure-management overhead that makes
# fixed-b bucketing a net loss on constant-average-degree graphs
# (paper Sec. 5.1: 20-70% overhead of 16 buckets vs a single bucket).
MOVE_WEIGHT = 2.0


class FrontierStructure:
    """Base class; subclasses fill in the three operations."""

    def __init__(self, n: int):
        self.n = n
        # Uniform counters read by the simulator's cost model.
        self.scanned = 0  # vertices scanned during builds/extractions
        self.moves = 0  # DecreaseKey bucket moves
        self.redistributed = 0  # elements repartitioned by GetNextBucket
        self.stale_filtered = 0  # lazily-deleted copies skipped

    def build(self, ids: np.ndarray, deg: np.ndarray) -> float:
        raise NotImplementedError

    def next_frontier(
        self, k: int, deg: np.ndarray, state: np.ndarray
    ) -> tuple[np.ndarray, float]:
        raise NotImplementedError

    def on_decrement(self, ids: np.ndarray, deg: np.ndarray) -> float:
        raise NotImplementedError

    def counters(self) -> dict:
        return {
            "scanned": int(self.scanned),
            "moves": int(self.moves),
            "redistributed": int(self.redistributed),
            "stale_filtered": int(self.stale_filtered),
        }
