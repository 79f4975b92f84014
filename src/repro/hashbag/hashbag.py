"""Parallel hash bag (paper Sec. 2, [25, 72]).

A hash bag maintains a multiset of non-negative integers. Storage is a
sequence of chunks of sizes lambda, 2*lambda, 4*lambda, ...; insertions
go to the current chunk via hashing with linear probing, and once the
chunk reaches the target load factor, insertion moves on to the next
(doubled) chunk. Chunks are allocated lazily, so memory is proportional
to the high-water content. EXTRACTALL only scans the chunks that have
been used, so its cost is O(lambda + t) for t stored elements — the
property the paper relies on for cheap frontier extraction.

In the real system insertions are concurrent CAS loops; here the bag is
driven by the deterministic machine simulator, so ``insert_many`` is a
vectorized batch insert that resolves probe collisions iteratively and
counts every probe (the simulator charges those probes as work).
"""
from __future__ import annotations

import numpy as np

_EMPTY = -1
_MIX = np.int64(-7046029254386353131)  # 0x9E3779B97F4A7C15 as signed 64-bit


def _hash(vals: np.ndarray) -> np.ndarray:
    """Fibonacci-style multiplicative hash, deterministic across runs."""
    h = vals.astype(np.int64) * _MIX
    return (h >> np.int64(17)) ^ h


class HashBag:
    """Chunked hash bag with probe/extract cost counters.

    Args:
        lam: size of the first chunk (lambda, 2^8 in the paper).
        load_factor: fill fraction that triggers opening the next chunk.
    """

    def __init__(self, *, lam: int = 256, load_factor: float = 0.5):
        self.lam = int(lam)
        self.load_factor = float(load_factor)
        self.chunks: list[np.ndarray] = [np.full(self.lam, _EMPTY, dtype=np.int64)]
        self.cur_chunk = 0
        self.fill = 0  # elements in the current chunk
        self.count = 0  # total elements resident
        # Cost counters, read by the machine simulator.
        self.probes = 0
        self.inserts = 0
        self.extract_scanned = 0
        self.extracts = 0

    def _chunk_capacity(self) -> int:
        return int(len(self.chunks[self.cur_chunk]) * self.load_factor)

    def insert_many(self, vals: np.ndarray) -> None:
        """Insert a batch of values (vectorized linear probing)."""
        vals = np.asarray(vals, dtype=np.int64)
        pos = 0
        while pos < len(vals):
            room = self._chunk_capacity() - self.fill
            if room <= 0:
                self.cur_chunk += 1
                if self.cur_chunk == len(self.chunks):
                    self.chunks.append(
                        np.full(len(self.chunks[-1]) * 2, _EMPTY, dtype=np.int64)
                    )
                self.fill = 0
                continue
            batch = vals[pos : pos + room]
            pos += len(batch)
            self._insert_into_chunk(batch)
            self.fill += len(batch)
            self.count += len(batch)
            self.inserts += len(batch)

    def _insert_into_chunk(self, batch: np.ndarray) -> None:
        chunk = self.chunks[self.cur_chunk]
        size = len(chunk)
        pending_vals = batch
        pending_idx = (_hash(batch) % size + size) % size
        while len(pending_vals):
            self.probes += len(pending_vals)
            # First-come-wins within the batch: keep the first claimant
            # of each slot, retry the rest one step further.
            order = np.argsort(pending_idx, kind="stable")
            sorted_idx = pending_idx[order]
            first = np.ones(len(order), dtype=bool)
            first[1:] = sorted_idx[1:] != sorted_idx[:-1]
            winners_mask = np.zeros(len(pending_vals), dtype=bool)
            winners_mask[order[first]] = True
            free = chunk[pending_idx] == _EMPTY
            place = winners_mask & free
            chunk[pending_idx[place]] = pending_vals[place]
            retry = ~place
            pending_vals = pending_vals[retry]
            pending_idx = (pending_idx[retry] + 1) % size

    def extract_all(self) -> np.ndarray:
        """Remove and return all elements; cost = used chunks + t."""
        out = []
        for ci in range(self.cur_chunk + 1):
            chunk = self.chunks[ci]
            self.extract_scanned += len(chunk)
            occupied = chunk != _EMPTY
            out.append(chunk[occupied])
            chunk[occupied] = _EMPTY
        self.extracts += 1
        self.cur_chunk = 0
        self.fill = 0
        self.count = 0
        return np.concatenate(out) if out else np.empty(0, dtype=np.int64)

    def __len__(self) -> int:
        return self.count
