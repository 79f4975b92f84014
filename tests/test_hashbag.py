"""Parallel hash bag tests."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.hashbag import HashBag


def test_insert_extract_multiset():
    bag = HashBag(lam=16)
    vals = np.array([5, 7, 5, 9, 1000, 5])
    bag.insert_many(vals)
    out = bag.extract_all()
    assert sorted(out.tolist()) == sorted(vals.tolist())
    assert len(bag) == 0


def test_extract_empty():
    bag = HashBag()
    assert len(bag.extract_all()) == 0


def test_reuse_after_extract():
    bag = HashBag(lam=8)
    bag.insert_many(np.arange(50))
    bag.extract_all()
    bag.insert_many(np.arange(100, 120))
    assert sorted(bag.extract_all().tolist()) == list(range(100, 120))


def test_chunks_grow_lazily():
    bag = HashBag(lam=8, load_factor=0.5)
    assert len(bag.chunks) == 1
    bag.insert_many(np.arange(100))
    assert len(bag.chunks) >= 4  # 4 + 8 + 16 + 32 + ... >= 100
    assert len(bag) == 100


def test_extract_cost_proportional_to_usage():
    """EXTRACTALL scans only used chunks: O(lambda + t), not capacity."""
    bag = HashBag(lam=64)
    bag.insert_many(np.arange(1000))
    bag.extract_all()
    big_scan = bag.extract_scanned
    bag2 = HashBag(lam=64)
    bag2.insert_many(np.arange(10))
    bag2.extract_all()
    assert bag2.extract_scanned <= 64  # only the first chunk
    assert big_scan > bag2.extract_scanned


def test_probe_counter_increments():
    bag = HashBag(lam=16)
    bag.insert_many(np.arange(30))
    assert bag.probes >= 30
    assert bag.inserts == 30


def test_determinism():
    a, b = HashBag(lam=16), HashBag(lam=16)
    vals = np.array([3, 1, 4, 1, 5, 9, 2, 6])
    a.insert_many(vals)
    b.insert_many(vals)
    assert np.array_equal(a.extract_all(), b.extract_all())


@settings(max_examples=40, deadline=None)
@given(st.lists(st.integers(0, 10_000), min_size=0, max_size=500))
def test_hashbag_multiset_property(vals):
    bag = HashBag(lam=16)
    bag.insert_many(np.array(vals, dtype=np.int64))
    assert sorted(bag.extract_all().tolist()) == sorted(vals)


def test_incremental_inserts_accumulate():
    bag = HashBag(lam=8)
    for chunk in np.array_split(np.arange(200), 10):
        bag.insert_many(chunk)
    assert sorted(bag.extract_all().tolist()) == list(range(200))
