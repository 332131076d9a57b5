"""CSR construction and orientation invariants."""
import numpy as np
import pytest

from repro.graphs.csr import build_csr, orient_csr
from repro.graphs.orient import degree_order

from .fixtures import SMALL_GRAPHS


@pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
def test_symmetry(name):
    und = build_csr(SMALL_GRAPHS[name])
    for v in range(und.n):
        for w in und.neighbors(v):
            assert v in und.neighbors(int(w))


@pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
def test_sorted_neighbors(name):
    und = build_csr(SMALL_GRAPHS[name])
    for v in range(und.n):
        nb = und.neighbors(v)
        assert (np.diff(nb) > 0).all(), "sorted, no duplicates"


def test_m_counts_arcs():
    und = build_csr(SMALL_GRAPHS["k4"])
    assert und.m == 12  # 6 edges * 2 directions


def test_self_loops_and_dups_dropped():
    e = np.array([(0, 1), (1, 0), (0, 0), (0, 1), (1, 2)])
    und = build_csr(e)
    assert und.m == 4
    assert und.degree(0) == 1 and und.degree(1) == 2


def test_isolated_vertices_via_n():
    und = build_csr(np.array([(0, 1)]), n=5)
    assert und.n == 5 and und.degree(4) == 0


def test_empty_graph():
    und = build_csr(np.empty((0, 2), dtype=np.int64), n=3)
    assert und.n == 3 and und.m == 0


@pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
def test_orient_halves_arcs(name):
    und = build_csr(SMALL_GRAPHS[name])
    dg = orient_csr(und, degree_order(und))
    assert dg.m == und.m // 2


@pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
def test_orient_is_dag_by_rank(name):
    und = build_csr(SMALL_GRAPHS[name])
    rank = degree_order(und)
    dg = orient_csr(und, rank)
    for v in range(dg.n):
        for w in dg.neighbors(v):
            assert rank[v] < rank[int(w)]
