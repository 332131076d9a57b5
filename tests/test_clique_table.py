"""Multi-level clique tables: lookup/decode roundtrips across every
configuration of §5.1-5.3, plus the space model."""
import numpy as np
import pytest

from repro.cliques.listing import enumerate_cliques
from repro.graphs.csr import build_csr, orient_csr
from repro.graphs.orient import degree_order
from repro.tables.clique_table import CliqueTable, TableConfig, make_table, min_levels

from .fixtures import MEDIUM_GRAPHS, SMALL_GRAPHS

ALL = {**SMALL_GRAPHS, **MEDIUM_GRAPHS}


def cliques_of(name: str, r: int) -> tuple[np.ndarray, int]:
    und = build_csr(ALL[name])
    dg = orient_csr(und, degree_order(und))
    return enumerate_cliques(dg, r), und.n


CONFIGS = [
    TableConfig(levels=1),
    TableConfig(levels=2, first_level="array", contiguous=True, decode="pointer"),
    TableConfig(levels=2, first_level="array", contiguous=True, decode="binsearch"),
    TableConfig(levels=2, first_level="array", contiguous=False, decode="binsearch"),
    TableConfig(levels=2, first_level="hash", contiguous=True, decode="pointer"),
    TableConfig(levels=3, first_level="hash", contiguous=True, decode="pointer"),
    TableConfig(levels=3, first_level="hash", contiguous=True, decode="binsearch"),
    TableConfig(levels=3, first_level="hash", contiguous=False, decode="binsearch"),
]


@pytest.mark.parametrize("name", ["fig1", "k6", "er30", "comm", "rmat6", "comm-m"])
@pytest.mark.parametrize("cfg", CONFIGS, ids=lambda c: c.label())
@pytest.mark.parametrize("r", [3, 4])
def test_lookup_decode_roundtrip(name, cfg, r):
    vmat, n = cliques_of(name, r)
    if len(vmat) == 0 or cfg.levels > r:
        pytest.skip("no cliques or too many levels")
    t = CliqueTable(vmat, n, cfg)
    idx = t.lookup(vmat)
    assert (idx >= 0).all()
    assert len(np.unique(idx)) == len(vmat), "indices unique per clique"
    assert np.array_equal(t.decode(idx), vmat)


@pytest.mark.parametrize("cfg", CONFIGS, ids=lambda c: c.label())
def test_row_indices_match_lookup(cfg):
    vmat, n = cliques_of("er30", 3)
    t = CliqueTable(vmat, n, cfg)
    assert np.array_equal(t.row_indices(), t.lookup(vmat))


@pytest.mark.parametrize("cfg", CONFIGS, ids=lambda c: c.label())
def test_occupied_indices(cfg):
    vmat, n = cliques_of("comm", 3)
    t = CliqueTable(vmat, n, cfg)
    occ = t.occupied_indices()
    assert len(occ) == len(vmat)
    assert np.array_equal(np.sort(t.row_indices()), occ)


@pytest.mark.parametrize("cfg", CONFIGS, ids=lambda c: c.label())
def test_missing_lookup(cfg):
    vmat, n = cliques_of("er30", 3)
    t = CliqueTable(vmat, n, cfg)
    bogus = np.array([[0, 1, n - 1], [n - 3, n - 2, n - 1]])
    present = {tuple(r_) for r_ in vmat.tolist()}
    idx = t.lookup(bogus)
    for row, i in zip(bogus.tolist(), idx):
        if tuple(row) not in present:
            assert i == -1


def test_two_level_saves_space_on_overlapping_cliques():
    """Fig 3's point: two-level beats one-level once r-cliques overlap."""
    vmat, n = cliques_of("comm-m", 4)
    one = CliqueTable(vmat, n, TableConfig(levels=1))
    two = CliqueTable(vmat, n, TableConfig(levels=2))
    assert two.memory_units() < one.memory_units()


def test_fig4_multilevel_pays_off_only_for_larger_r():
    """Figs 3-4 on the paper's own example: the 3-multi-level T beats the
    two-level T at r=4 (22 vs 25 units here; paper: 22 vs 24 one-level)
    but not at r=3, where r is too small for the extra level to pay."""
    v3, n = cliques_of("fig1", 3)
    v4, _ = cliques_of("fig1", 4)
    m = lambda v, cfg: CliqueTable(v, n, cfg).memory_units()
    three = TableConfig(levels=3, first_level="hash")
    two = TableConfig(levels=2, first_level="array")
    one = TableConfig(levels=1)
    assert m(v4, three) < m(v4, two) and m(v4, three) < m(v4, one)
    assert m(v3, three) > m(v3, two)


def test_memory_units_fig4_exact():
    """Fig 4: one-level T of the six 4-cliques takes 24 units, the
    3-multi-level T takes 22."""
    v4, n = cliques_of("fig1", 4)
    assert CliqueTable(v4, n, TableConfig(levels=1)).memory_units() == 24
    assert (
        CliqueTable(v4, n, TableConfig(levels=3, first_level="hash")).memory_units()
        == 22
    )


def test_memory_units_one_level_exact():
    vmat, n = cliques_of("fig1", 3)
    t = CliqueTable(vmat, n, TableConfig(levels=1))
    assert t.memory_units() == 14 * 3  # Fig 3: 42 units


def test_memory_units_two_level_exact():
    vmat, n = cliques_of("fig1", 3)
    t = CliqueTable(vmat, n, TableConfig(levels=2, first_level="array"))
    assert t.memory_units() == 7 + 14 * 2  # Fig 3: 35 units


def test_pointer_requires_contiguous():
    vmat, n = cliques_of("fig1", 3)
    with pytest.raises(ValueError):
        CliqueTable(vmat, n, TableConfig(levels=2, contiguous=False, decode="pointer"))


def test_min_levels_and_factory_auto_raise():
    n = 1 << 16  # 16 bits/vertex: 63 // 16 = 3 vertices max per key
    assert min_levels(n, 3) == 1
    assert min_levels(n, 4) == 2
    assert min_levels(n, 6) == 4
    g = np.random.default_rng(0)
    vmat = np.sort(g.integers(0, n, (20, 6)), axis=1)
    vmat = vmat[np.all(np.diff(vmat, axis=1) > 0, axis=1)]
    t = make_table(vmat, n, TableConfig(levels=1))
    assert t.config.levels >= 4
    assert np.array_equal(t.decode(t.lookup(vmat)), vmat)


def test_r1_table():
    vmat = np.arange(7).reshape(-1, 1)
    t = CliqueTable(vmat, 7, TableConfig(levels=1))
    idx = t.lookup(vmat)
    assert (idx >= 0).all()
    assert np.array_equal(t.decode(idx), vmat)


def test_empty_table():
    t = CliqueTable(np.empty((0, 3), dtype=np.int64), 5, TableConfig(levels=2))
    assert t.n_cliques == 0
    assert len(t.occupied_indices()) == 0


def test_levels_equal_r():
    vmat, n = cliques_of("k6", 4)
    t = CliqueTable(vmat, n, TableConfig(levels=4, first_level="hash"))
    idx = t.lookup(vmat)
    assert (idx >= 0).all()
    assert np.array_equal(t.decode(idx), vmat)
