"""Vectorized linear-probing open addressing over regions of a shared
cell array.

A *region* is a slice ``[start, start + cap)`` of the cell array used as
one hash table, followed by one explicit *barrier* cell at
``start + cap`` (paper §5.3: barriers between tables hold up-pointers).
Empty cells carry ``EMPTY_BIT`` plus an up-pointer payload. Probing is
modulo ``cap`` (the barrier is never probed), and every region keeps at
least one empty probe-able cell, so searches terminate.

``region_find`` resolves many (region, key) queries at once with a
mask-driven probe loop — the batch analogue of the paper's concurrent
hash table lookups.
"""
from __future__ import annotations

import numpy as np

from .packing import EMPTY_BIT, PAYLOAD_MASK

__all__ = ["hash_u64", "capacity_for", "region_insert", "region_find", "EMPTY_BIT", "PAYLOAD_MASK"]


def hash_u64(x: np.ndarray) -> np.ndarray:
    """Splitmix64-style mixer, vectorized on uint64."""
    x = np.asarray(x, dtype=np.uint64).copy()
    x = (x + np.uint64(0x9E3779B97F4A7C15)) & np.uint64(0xFFFFFFFFFFFFFFFF)
    x ^= x >> np.uint64(30)
    x = (x * np.uint64(0xBF58476D1CE4E5B9)) & np.uint64(0xFFFFFFFFFFFFFFFF)
    x ^= x >> np.uint64(27)
    x = (x * np.uint64(0x94D049BB133111EB)) & np.uint64(0xFFFFFFFFFFFFFFFF)
    x ^= x >> np.uint64(31)
    return x


def capacity_for(count: int, load: float = 0.5) -> int:
    """Probe-able capacity guaranteeing >= 1 empty cell (load < 1)."""
    return max(2, int(np.ceil(count / load)) + 1)


def region_insert(cells: np.ndarray, start: int, cap: int, keys: np.ndarray) -> np.ndarray:
    """Insert distinct keys into one region; returns absolute cell positions."""
    pos_out = np.empty(len(keys), dtype=np.int64)
    offs = (hash_u64(keys) % np.uint64(cap)).astype(np.int64)
    for i, key in enumerate(keys):
        p = offs[i]
        while not (cells[start + p] & EMPTY_BIT):
            p = (p + 1) % cap
        cells[start + p] = key
        pos_out[i] = start + p
    return pos_out


def region_find(
    cells: np.ndarray,
    starts: np.ndarray,
    caps: np.ndarray,
    keys: np.ndarray,
) -> np.ndarray:
    """Batch lookup: absolute cell position per (region, key), -1 if absent.

    ``starts``/``caps``/``keys`` are parallel arrays; entries with
    ``starts < 0`` are treated as not-found immediately.
    """
    k = len(keys)
    out = np.full(k, -1, dtype=np.int64)
    if k == 0:
        return out
    starts = np.asarray(starts, dtype=np.int64)
    caps = np.asarray(caps, dtype=np.int64)
    keys = np.asarray(keys, dtype=np.uint64)
    active = starts >= 0
    pos = np.zeros(k, dtype=np.int64)
    idx0 = np.flatnonzero(active)
    pos[idx0] = starts[idx0] + (
        hash_u64(keys[idx0]) % caps[idx0].astype(np.uint64)
    ).astype(np.int64)
    while True:
        idx = np.flatnonzero(active)
        if len(idx) == 0:
            break
        vals = cells[pos[idx]]
        hit = vals == keys[idx]
        empty = (vals & EMPTY_BIT) != 0
        out[idx[hit]] = pos[idx[hit]]
        active[idx[hit | empty]] = False
        adv = idx[~(hit | empty)]
        pos[adv] = starts[adv] + (pos[adv] - starts[adv] + 1) % caps[adv]
    return out
