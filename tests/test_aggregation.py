"""Update-aggregation options: identical results, modeled contention."""
import numpy as np
import pytest

from repro.aggregation import HashTableU, ListBufferU, SimpleArrayU, make_aggregator

KINDS = ["array", "list-buffer", "hash"]


@pytest.mark.parametrize("kind", KINDS)
def test_drain_returns_unique_sorted(kind):
    a = make_aggregator(kind, 100)
    a.begin_round(0, 5, 3)
    a.record(np.array([7, 3, 7, 9]))
    a.record(np.array([3, 11]))
    assert a.drain().tolist() == [3, 7, 9, 11]


@pytest.mark.parametrize("kind", KINDS)
def test_round_stamps_reset(kind):
    a = make_aggregator(kind, 100)
    a.begin_round(0, 1, 1)
    a.record(np.array([5]))
    a.drain()
    a.begin_round(1, 1, 1)
    a.record(np.array([5, 6]))
    assert a.drain().tolist() == [5, 6], "stamp from round 0 must not mask round 1"


def test_all_kinds_agree():
    g = np.random.default_rng(0)
    aggs = [make_aggregator(k, 1000) for k in KINDS]
    for rnd in range(5):
        batches = [g.integers(0, 1000, 50) for _ in range(4)]
        outs = []
        for a in aggs:
            a.begin_round(rnd, 10, 3)
            for b in batches:
                a.record(b)
            outs.append(a.drain().tolist())
        assert outs[0] == outs[1] == outs[2]


def test_simple_array_serializes_every_insert():
    a = SimpleArrayU(100)
    a.begin_round(0, 10, 3)
    a.record(np.arange(60))
    assert a.serialized_ops == 60


def test_list_buffer_serializes_only_block_reservations():
    a = ListBufferU(10_000, buffer_size=64, n_threads=4)
    a.begin_round(0, 10, 3)
    a.record(np.arange(1000))
    assert 0 < a.serialized_ops < 1000 / 64 + 1


def test_hash_table_no_serialization_but_clear_work():
    a = HashTableU(100)
    a.begin_round(0, 10, 3)
    a.record(np.arange(60))
    a.drain()
    assert a.serialized_ops == 0
    assert a.clear_work > 0


def test_contention_ordering_matches_paper():
    """§5.5: simple array worst contention; hash table none."""
    arr, lb, ht = SimpleArrayU(10_000), ListBufferU(10_000), HashTableU(10_000)
    for a in (arr, lb, ht):
        a.begin_round(0, 100, 3)
        a.record(np.arange(5000))
        a.drain()
    assert arr.serialized_ops > lb.serialized_ops >= ht.serialized_ops == 0


def test_unknown_kind():
    with pytest.raises(ValueError):
        make_aggregator("bogus", 10)
