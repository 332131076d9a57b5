"""Open-addressing primitive: insert/find over shared-array regions."""
import numpy as np
import pytest

from repro.tables.open_addr import (
    EMPTY_BIT,
    capacity_for,
    hash_u64,
    region_find,
    region_insert,
)


def test_capacity_always_leaves_empty():
    for c in [0, 1, 5, 100]:
        assert capacity_for(c) > c


def test_hash_u64_deterministic_and_spread():
    x = np.arange(1000, dtype=np.uint64)
    h1, h2 = hash_u64(x), hash_u64(x)
    assert np.array_equal(h1, h2)
    assert len(np.unique(h1 % np.uint64(256))) > 200


def test_insert_find_single_region():
    keys = np.arange(100, dtype=np.uint64)
    cap = capacity_for(100)
    cells = np.full(cap + 1, EMPTY_BIT, dtype=np.uint64)
    pos = region_insert(cells, 0, cap, keys)
    found = region_find(
        cells, np.zeros(100, np.int64), np.full(100, cap), keys
    )
    assert np.array_equal(found, pos)


def test_find_missing_returns_minus_one():
    keys = np.array([5, 9], dtype=np.uint64)
    cap = capacity_for(2)
    cells = np.full(cap + 1, EMPTY_BIT, dtype=np.uint64)
    region_insert(cells, 0, cap, keys)
    q = np.array([5, 7, 9, 100], dtype=np.uint64)
    out = region_find(cells, np.zeros(4, np.int64), np.full(4, cap), q)
    assert out[1] == -1 and out[3] == -1
    assert out[0] >= 0 and out[2] >= 0


def test_multiple_regions_shared_array():
    capA, capB = capacity_for(3), capacity_for(4)
    cells = np.full(capA + 1 + capB + 1, EMPTY_BIT, dtype=np.uint64)
    a_keys = np.array([1, 2, 3], dtype=np.uint64)
    b_keys = np.array([1, 2, 3, 4], dtype=np.uint64)  # same keys, other region
    pa = region_insert(cells, 0, capA, a_keys)
    pb = region_insert(cells, capA + 1, capB, b_keys)
    assert (pa < capA).all() and (pb >= capA + 1).all()
    starts = np.array([0] * 3 + [capA + 1] * 4, dtype=np.int64)
    caps = np.array([capA] * 3 + [capB] * 4, dtype=np.int64)
    q = np.concatenate([a_keys, b_keys])
    out = region_find(cells, starts, caps, q)
    assert np.array_equal(out, np.concatenate([pa, pb]))


def test_negative_start_is_not_found():
    cells = np.full(4, EMPTY_BIT, dtype=np.uint64)
    out = region_find(
        cells,
        np.array([-1], np.int64),
        np.array([3], np.int64),
        np.array([1], np.uint64),
    )
    assert out[0] == -1


def test_high_load_probing():
    g = np.random.default_rng(3)
    keys = np.unique(g.integers(0, 1 << 40, 500).astype(np.uint64))
    cap = len(keys) + 1  # load just under 1
    cells = np.full(cap + 1, EMPTY_BIT, dtype=np.uint64)
    pos = region_insert(cells, 0, cap, keys)
    out = region_find(
        cells, np.zeros(len(keys), np.int64), np.full(len(keys), cap), keys
    )
    assert np.array_equal(out, pos)
