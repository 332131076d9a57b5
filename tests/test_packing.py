"""Key packing: roundtrip, order preservation, capacity limits."""
import numpy as np
import pytest

from repro.tables.packing import EMPTY_BIT, bits_for, fits, pack, unpack


@pytest.mark.parametrize("n,expected", [(2, 1), (3, 2), (4, 2), (5, 3), (1024, 10), (1025, 11)])
def test_bits_for(n, expected):
    assert bits_for(n) == expected


@pytest.mark.parametrize("n,w", [(10, 3), (100, 4), (1000, 5), (64, 2), (2, 1)])
def test_roundtrip(n, w):
    g = np.random.default_rng(0)
    vmat = np.sort(g.integers(0, n, (50, w)), axis=1)
    assert np.array_equal(unpack(pack(vmat, n), n, w), vmat)


def test_pack_preserves_lex_order():
    g = np.random.default_rng(1)
    vmat = np.sort(g.integers(0, 100, (200, 3)), axis=1)
    keys = pack(vmat, 100)
    order = np.argsort(keys, kind="stable")
    lex = np.lexsort((vmat[:, 2], vmat[:, 1], vmat[:, 0]))
    assert np.array_equal(np.sort(keys[order]), keys[order])
    assert np.array_equal(vmat[lex], vmat[order])


def test_top_bit_free():
    vmat = np.array([[1023, 1023, 1023, 1023, 1023, 1023]])
    keys = pack(vmat, 1024)  # 6 * 10 = 60 bits
    assert (keys & EMPTY_BIT) == 0


def test_fits():
    assert fits(1024, 6)  # 60 bits
    assert not fits(1024, 7)  # 70 bits
    assert not fits(1 << 20, 4)  # 80 bits


def test_overflow_raises():
    with pytest.raises(ValueError):
        pack(np.array([[0] * 7]), 1024)


def test_single_vertex():
    vmat = np.arange(5).reshape(-1, 1)
    assert np.array_equal(unpack(pack(vmat, 5), 5, 1), vmat)
