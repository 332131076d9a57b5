"""ARB-NUCLEUS-DECOMP (Algorithm 2) with the §5 practical optimizations.

Phases:

1. Orient the graph with a low out-degree ordering (optionally relabel
   vertices by orientation rank, §5.4).
2. Count the s-cliques incident on every r-clique with REC-LIST-CLIQUES
   — locally, or fanned out over Spark partitions (cliques/spark_count).
3. Store counts in the configurable multi-level hash table T (§5.1-5.3);
   each r-clique's identifier is its last-level cell index.
4. Peel rounds: extract the minimum bucket from the Julienne-style
   bucketing structure, re-list the s-cliques incident to peeled
   r-cliques (UPDATE), subtract 1/a per discovery (UPDATE-FUNC's
   over-counting guard), aggregate the updated set U with the chosen
   §5.5 structure, and re-bucket.

The peeling loop runs driver-side over numpy structures: with thousands
of rounds, per-round Spark jobs would measure scheduler overhead rather
than the algorithm (see DESIGN.md §2); Spark parallelizes the dominant
counting phase and all graph preparation.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from itertools import combinations
from math import comb, log2

import numpy as np

from ..aggregation import make_aggregator
from ..bucketing import Bucketing
from ..cliques.listing import Stats, extend_cliques, s_counts_per_r_clique
from ..graphs.csr import CSR, build_csr, orient_csr
from ..graphs.orient import make_rank, relabel
from ..instrument import Counters
from ..tables.clique_table import CliqueTable, TableConfig, make_table
from .contract import ContractionState, maybe_contract

__all__ = ["DecompConfig", "DecompResult", "nucleus_decomposition"]


@dataclass
class DecompConfig:
    table: TableConfig = field(default_factory=TableConfig)
    orientation: str = "degeneracy"  # 'degree' | 'degeneracy' | 'goodrich-pszona'
    relabel: bool = False  # §5.4 graph relabeling
    aggregation: str = "list-buffer"  # §5.5: 'array' | 'list-buffer' | 'hash'
    contraction: bool = False  # §5.6, (2,3) only
    frac_updates: bool = True  # 1/a trick (True) vs exact per-round dedup
    counting: str = "local"  # 'local' | 'spark'
    spark_slices: int = 64
    num_open_buckets: int = 16


@dataclass
class DecompResult:
    vmat: np.ndarray  # (n_r, r) r-cliques, sorted vertex rows, original labels
    core: np.ndarray  # (n_r,) (r,s)-clique core numbers, aligned with vmat
    rho: int  # number of peeling rounds
    max_core: int
    counters: Counters
    table_memory_units: int
    table_allocated_cells: int
    contractions: int = 0

    def core_dict(self) -> dict[tuple[int, ...], int]:
        return {tuple(row): int(c) for row, c in zip(self.vmat, self.core)}


def nucleus_decomposition(
    edges: np.ndarray,
    r: int,
    s: int,
    config: DecompConfig | None = None,
    *,
    spark=None,
    n: int | None = None,
) -> DecompResult:
    """Compute the (r, s) nucleus decomposition of an undirected edge list."""
    if not (1 <= r < s):
        raise ValueError("need 1 <= r < s")
    config = config or DecompConfig()
    t_start = time.perf_counter()
    counters = Counters()

    und = build_csr(edges, n)
    n_verts = und.n
    rank = make_rank(und, config.orientation)
    perm = None
    if config.relabel:
        new_edges, perm = relabel(np.asarray(edges, dtype=np.int64), rank)
        und = build_csr(new_edges, n_verts)
        rank = np.arange(n_verts)
    dg = orient_csr(und, rank)

    # ---- Phase 1: count s-cliques per r-clique (Alg 2 lines 20-22) ----
    count_stats = Stats()
    if config.counting == "spark":
        from ..cliques.spark_count import spark_s_counts

        vmat, cnts = spark_s_counts(spark, dg, r, s, n_slices=config.spark_slices)
    else:
        d = s_counts_per_r_clique(dg, r, s, stats=count_stats)
        if d:
            vmat = np.array(sorted(d.keys()), dtype=np.int64)
            cnts = np.array([d[tuple(row)] for row in vmat], dtype=np.float64)
        else:
            vmat = np.empty((0, r), dtype=np.int64)
            cnts = np.empty(0, dtype=np.float64)
    counters.work += count_stats.intersect_work + count_stats.base_work
    counters.span_logs += s * log2(max(2, n_verts))
    n_r = len(vmat)

    table = make_table(vmat, n_verts, config.table)
    idx_rows = table.row_indices()
    counts = np.zeros(table.capacity, dtype=np.float64)
    counts[idx_rows] = cnts
    core = np.zeros(table.capacity, dtype=np.int64)
    peeled = np.full(table.capacity, -1, dtype=np.int64)

    buckets = Bucketing(
        idx_rows, np.rint(cnts).astype(np.int64), num_open=config.num_open_buckets
    )
    agg = make_aggregator(config.aggregation, table.capacity)
    log2n = log2(max(2, n_verts))
    subs_cols = np.array(list(combinations(range(s), r)), dtype=np.int64)
    est_per_peel = comb(s, r) - 1

    do_contract = config.contraction and r == 2 and s == 3
    cstate = ContractionState(und) if do_contract else None

    def edge_peeled(rows: np.ndarray) -> np.ndarray:
        idx = table.lookup(rows)
        return peeled[np.clip(idx, 0, None)] >= 0

    # ---- Phase 2: peel (Alg 2 lines 23-29) ----
    finished = 0
    round_no = 0
    und_cur = und
    while finished < n_r:
        k, A = buckets.next_bucket()
        core[A] = k
        peeled[A] = round_no
        finished += len(A)
        counters.rounds += 1
        counters.span_logs += log2n
        counters.work += len(A)
        agg.begin_round(round_no, len(A), est_per_peel * max(1, k))

        A_rows = table.decode(A)
        update_stats = Stats()
        s_parts: list[np.ndarray] = []
        if s - r >= 1 and k > 0:
            for row in A_rows:

                def on_sclique(C: tuple[int, ...], batch: np.ndarray, row=row) -> None:
                    blk = np.empty((len(batch), s), dtype=np.int64)
                    blk[:, :r] = row
                    if C:
                        blk[:, r : s - 1] = np.asarray(C, dtype=np.int64)
                    blk[:, s - 1] = batch
                    s_parts.append(blk)

                extend_cliques(und_cur, dg, row, s - r, on_sclique, stats=update_stats)
        counters.scliques_discovered += update_stats.cliques_found
        counters.work += update_stats.intersect_work + update_stats.base_work
        counters.span_logs += (s - r) * log2n

        if s_parts:
            s_mat = np.concatenate(s_parts)
            s_mat.sort(axis=1)
            if not config.frac_updates:
                s_mat = np.unique(s_mat, axis=0)
            flat = s_mat[:, subs_cols].reshape(-1, r)
            idxs = table.lookup(flat).reshape(len(s_mat), len(subs_cols))
            st = peeled[idxs]
            prev = (st >= 0) & (st < round_no)
            valid = ~prev.any(axis=1)
            in_a = (st == round_no) & valid[:, None]
            unpeeled = (st == -1) & valid[:, None]
            a = in_a.sum(axis=1)
            rows_i, cols_i = np.nonzero(unpeeled)
            tgt = idxs[rows_i, cols_i]
            if config.frac_updates:
                deltas = 1.0 / np.maximum(a[rows_i], 1)
            else:
                deltas = np.ones(len(tgt), dtype=np.float64)
            np.subtract.at(counts, tgt, deltas)
            if len(tgt):
                agg.record(tgt)
            counters.work += idxs.size

        u_ids = agg.drain()
        buckets.update(u_ids, np.rint(counts[u_ids]).astype(np.int64))
        counters.work += len(u_ids)

        if do_contract:
            cstate.note_peeled_edges(A_rows)
            und_cur = maybe_contract(und_cur, cstate, edge_peeled)
        round_no += 1

    counters.serialized_ops += agg.serialized_ops
    counters.work += agg.clear_work
    counters.wall_seconds = time.perf_counter() - t_start

    out_vmat = vmat if perm is None else np.sort(perm[vmat], axis=1)
    out_core = core[idx_rows]
    order = np.lexsort(tuple(out_vmat[:, j] for j in range(r - 1, -1, -1)))
    return DecompResult(
        vmat=out_vmat[order],
        core=out_core[order],
        rho=counters.rounds,
        max_core=int(out_core.max()) if n_r else 0,
        counters=counters,
        table_memory_units=table.memory_units(),
        table_allocated_cells=table.allocated_cells(),
        contractions=cstate.contractions if cstate else 0,
    )
