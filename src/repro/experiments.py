"""Table generators for the paper's evaluation section (§6).

One function per evaluation table (the paper presents most numbers in
figures; each is a table of numbers which we regenerate as printed
rows — see DESIGN.md §4 for the mapping). Every function returns a
pandas DataFrame and optionally writes a markdown copy under
``results/``. ``jobs/*.py`` are the spark-submit wrappers and
``benchmarks/bench_t*.py`` the pytest-benchmark harnesses over these.

Times: ``wall_s`` is single-process wall-clock on this container;
``sim`` columns are work-span model times T_P = W/P + S (Brent), the
model the paper's analysis uses — see instrument.py and DESIGN.md §2.
"""
from __future__ import annotations

import time
from pathlib import Path

import numpy as np
import pandas as pd

from .baselines.and_local import and_decomposition
from .baselines.nd import nd_decomposition
from .baselines.pkt import pkt_truss
from .graphs.csr import build_csr
from .graphs.gen import rmat, surrogate
from .instrument import simulated_time
from .nucleus.decomp import DecompConfig, DecompResult, nucleus_decomposition
from .tables.clique_table import TableConfig

__all__ = [
    "SUITE",
    "RS_HEADLINE",
    "table_graph_stats",
    "table_t_optimizations",
    "table_other_optimizations",
    "table_baselines",
    "table_rs_sweep",
    "table_scalability",
    "table_rmat_scaling",
    "save_table",
]

SUITE = ["amazon-lite", "dblp-lite", "youtube-lite", "skitter-lite", "orkut-lite"]
# Community surrogates sustain the full r < s <= 7 sweep; the sparse
# rMAT surrogates have few cliques past s = 5 (and the paper itself
# omits many large-graph large-s cells as OOM/timeout).
RS_FULL = [(r, s) for s in range(3, 8) for r in range(2, s)]
RS_RMAT = [(r, s) for s in range(3, 6) for r in range(2, s)]
RS_HEADLINE = [(2, 3), (3, 4)]

P_PAPER = 60  # 30 cores, two-way hyper-threading


def to_markdown(df: pd.DataFrame) -> str:
    """Minimal GitHub-markdown table (the container lacks ``tabulate``)."""
    fmt = lambda v: f"{v:.3f}" if isinstance(v, float) else str(v)
    header = "| " + " | ".join(df.columns) + " |"
    sep = "|" + "|".join("---" for _ in df.columns) + "|"
    body = ["| " + " | ".join(fmt(v) for v in row) + " |" for row in df.itertuples(index=False)]
    return "\n".join([header, sep, *body])


_DEFAULT_RESULTS = Path(__file__).resolve().parents[2] / "results"


def save_table(df: pd.DataFrame, name: str, results_dir: str | Path | None = None) -> Path:
    out = Path(results_dir) if results_dir is not None else _DEFAULT_RESULTS
    out.mkdir(parents=True, exist_ok=True)
    path = out / f"{name}.md"
    path.write_text(to_markdown(df) + "\n")
    (out / f"{name}.csv").write_text(df.to_csv(index=False))
    return path


def _arb(edges: np.ndarray, r: int, s: int, cfg: DecompConfig | None = None) -> DecompResult:
    return nucleus_decomposition(edges, r, s, cfg)


def _best_config(r: int, s: int) -> DecompConfig:
    """§6.2's overall-optimal setting: two-level contiguous stored-pointer
    T; hash aggregation + contraction for (2,3), list buffer + relabeling
    otherwise."""
    table = TableConfig(levels=2, first_level="array", contiguous=True, decode="pointer")
    if (r, s) == (2, 3):
        return DecompConfig(table=table, aggregation="hash", contraction=True)
    return DecompConfig(table=table, aggregation="list-buffer", relabel=True)


# ---------------------------------------------------------------- Fig 7 table
def table_graph_stats(graphs: list[str] | None = None) -> pd.DataFrame:
    """Fig 7: n, m and per-(r,s) peeling complexity rho and max core."""
    rows = []
    for name in graphs or SUITE:
        edges = surrogate(name)
        und = build_csr(edges)
        pairs = RS_FULL if name in ("amazon-lite", "dblp-lite") else RS_RMAT
        for r, s in pairs:
            res = _arb(edges, r, s, _best_config(r, s))
            rows.append(
                {
                    "graph": name,
                    "n": und.n,
                    "m": len(edges),
                    "r": r,
                    "s": s,
                    "n_rcliques": len(res.vmat),
                    "rho": res.rho,
                    "max_core": res.max_core,
                    "wall_s": res.counters.wall_seconds,
                }
            )
    return pd.DataFrame(rows)


# ------------------------------------------------------------- Figs 8, 9, 10
T_CONFIGS: list[tuple[str, TableConfig]] = [
    ("1-level (unopt)", TableConfig(levels=1)),
    ("2-level contig ptr", TableConfig(2, "array", True, "pointer")),
    ("2-level contig binsearch", TableConfig(2, "array", True, "binsearch")),
    ("2-level noncontig binsearch", TableConfig(2, "array", False, "binsearch")),
    ("2-multi contig ptr", TableConfig(2, "hash", True, "pointer")),
    ("3-multi contig ptr", TableConfig(3, "hash", True, "pointer")),
    ("3-multi contig binsearch", TableConfig(3, "hash", True, "binsearch")),
]


def table_t_optimizations(
    rs: tuple[int, int] = (3, 4), graphs: list[str] | None = None
) -> pd.DataFrame:
    """Figs 8/9 (speedups of T configurations over the one-level T) and
    the right half of Fig 8 / Fig 10 (space savings)."""
    r, s = rs
    rows = []
    for name in graphs or SUITE:
        edges = surrogate(name)
        base = None
        for label, tcfg in T_CONFIGS:
            if tcfg.levels > r:
                continue
            res = _arb(edges, r, s, DecompConfig(table=tcfg, aggregation="array"))
            if base is None:
                base = res
            rows.append(
                {
                    "graph": name,
                    "r": r,
                    "s": s,
                    "config": label,
                    "wall_s": res.counters.wall_seconds,
                    "speedup_vs_1level": base.counters.wall_seconds
                    / res.counters.wall_seconds,
                    "mem_units": res.table_memory_units,
                    "space_saving_vs_1level": base.table_memory_units
                    / res.table_memory_units,
                }
            )
    return pd.DataFrame(rows)


# -------------------------------------------------------------------- Fig 11
def table_other_optimizations(
    graphs: list[str] | None = None,
    rs_list: list[tuple[int, int]] | None = None,
) -> pd.DataFrame:
    """Fig 11: graph relabeling, update aggregation, and (2,3) graph
    contraction, over the two-level contiguous stored-pointer baseline
    with the simple-array aggregator.

    ``sim_speedup`` is the work-span model time ratio at P=60, which is
    where the §5.5 contention differences between the aggregators live
    (a single-process run cannot exhibit fetch-and-add contention)."""
    rows = []
    two_level = TableConfig(2, "array", True, "pointer")
    for name in graphs or SUITE:
        edges = surrogate(name)
        for r, s in rs_list or [(2, 3), (2, 4), (3, 4)]:
            base = _arb(edges, r, s, DecompConfig(table=two_level, aggregation="array"))
            base_sim = simulated_time(base.counters, P_PAPER)
            variants: list[tuple[str, DecompConfig]] = [
                ("relabel", DecompConfig(table=two_level, aggregation="array", relabel=True)),
                ("agg=list-buffer", DecompConfig(table=two_level, aggregation="list-buffer")),
                ("agg=hash", DecompConfig(table=two_level, aggregation="hash")),
            ]
            if (r, s) == (2, 3):
                variants.append(
                    ("contraction", DecompConfig(table=two_level, aggregation="array", contraction=True))
                )
            for label, cfg in variants:
                res = _arb(edges, r, s, cfg)
                rows.append(
                    {
                        "graph": name,
                        "r": r,
                        "s": s,
                        "optimization": label,
                        "wall_s": res.counters.wall_seconds,
                        "wall_speedup": base.counters.wall_seconds
                        / res.counters.wall_seconds,
                        "sim_speedup_p60": base_sim
                        / simulated_time(res.counters, P_PAPER),
                    }
                )
    return pd.DataFrame(rows)


# -------------------------------------------------------------------- Fig 12
def table_baselines(
    graphs: list[str] | None = None,
    rs_list: list[tuple[int, int]] | None = None,
) -> pd.DataFrame:
    """Fig 12: slowdowns of ND/PND/AND/AND-NN (and PKT for (2,3)) and of
    single-threaded ARB over parallel ARB, plus the paper's two work
    metrics: the PND round blowup and the AND s-clique discovery ratio."""
    rows = []
    for name in graphs or SUITE:
        edges = surrogate(name)
        for r, s in rs_list or RS_HEADLINE:
            arb = _arb(edges, r, s, _best_config(r, s))
            arb_sim = simulated_time(arb.counters, P_PAPER)
            arb_sim1 = simulated_time(arb.counters, 1)
            nd_core, nd_c = nd_decomposition(edges, r, s)
            assert nd_core == arb.core_dict(), "baseline disagrees with ARB"
            and_res = and_decomposition(edges, r, s)
            nn_res = and_decomposition(edges, r, s, notification=True)
            row = {
                "graph": name,
                "r": r,
                "s": s,
                "arb_wall_s": arb.counters.wall_seconds,
                "arb_rho": arb.rho,
                "slowdown_arb_1thread_sim": arb_sim1 / arb_sim,
                "slowdown_nd_wall": nd_c.wall_seconds / arb.counters.wall_seconds,
                "slowdown_pnd_sim": simulated_time(nd_c, P_PAPER) / arb_sim,
                "pnd_rounds_ratio": nd_c.rounds / max(1, arb.rho),
                "and_iters": and_res.iterations,
                "and_scliques_ratio": and_res.scliques_discovered
                / max(1, arb.counters.scliques_discovered),
                "andnn_scliques_ratio": nn_res.scliques_discovered
                / max(1, arb.counters.scliques_discovered),
                "andnn_extra_mem_bytes": nn_res.incidence_bytes,
            }
            if (r, s) == (2, 3):
                pkt = pkt_truss(edges)
                got = {
                    tuple(e): int(c) for e, c in zip(pkt.edges.tolist(), pkt.core.tolist())
                }
                assert got == arb.core_dict(), "PKT disagrees with ARB"
                row["slowdown_pkt_wall"] = pkt.wall_seconds / arb.counters.wall_seconds
            rows.append(row)
    return pd.DataFrame(rows)


# -------------------------------------------------------------------- Fig 13
def table_rs_sweep(graphs: list[str] | None = None) -> pd.DataFrame:
    """Fig 13: per-(r,s) times relative to the fastest (r,s) per graph
    (excluding (2,3) and (3,4), which Fig 12 covers)."""
    rows = []
    for name in graphs or SUITE:
        edges = surrogate(name)
        pairs = RS_FULL if name in ("amazon-lite", "dblp-lite") else RS_RMAT
        times = {}
        for r, s in pairs:
            if (r, s) in RS_HEADLINE:
                continue
            res = _arb(edges, r, s, _best_config(r, s))
            times[(r, s)] = res.counters.wall_seconds
        fastest = min(times.values())
        for (r, s), t in sorted(times.items()):
            rows.append(
                {
                    "graph": name,
                    "r": r,
                    "s": s,
                    "wall_s": t,
                    "slowdown_vs_fastest": t / fastest,
                }
            )
    return pd.DataFrame(rows)


# -------------------------------------------------------------------- Fig 14
def table_scalability(
    graphs: list[str] | None = None,
    rs_list: list[tuple[int, int]] | None = None,
    threads: list[int] | None = None,
) -> pd.DataFrame:
    """Fig 14: scalability over thread counts, via the work-span model
    (T_P = W/P + S) on the measured operation counters."""
    rows = []
    for name in graphs or ["dblp-lite", "skitter-lite", "orkut-lite"]:
        edges = surrogate(name)
        for r, s in rs_list or [(2, 3), (2, 4), (3, 4)]:
            res = _arb(edges, r, s, _best_config(r, s))
            t1 = simulated_time(res.counters, 1)
            for p in threads or [1, 2, 4, 8, 16, 30, 60]:
                rows.append(
                    {
                        "graph": name,
                        "r": r,
                        "s": s,
                        "threads": p,
                        "sim_speedup": t1 / simulated_time(res.counters, p),
                    }
                )
    return pd.DataFrame(rows)


def table_spark_counting_scalability(
    spark,
    graph: str = "skitter-lite",
    rs: tuple[int, int] = (3, 4),
    slices: list[int] | None = None,
) -> pd.DataFrame:
    """Measured companion to Fig 14: wall-clock of the Spark counting
    stage at varying partition counts on this machine."""
    from .cliques.spark_count import spark_s_counts
    from .graphs.csr import orient_csr
    from .graphs.orient import make_rank

    edges = surrogate(graph)
    und = build_csr(edges)
    dg = orient_csr(und, make_rank(und, "degeneracy"))
    r, s = rs
    rows = []
    for k in slices or [1, 2, 4, 8, 16]:
        t0 = time.perf_counter()
        vmat, _ = spark_s_counts(spark, dg, r, s, n_slices=k)
        rows.append(
            {
                "graph": graph,
                "r": r,
                "s": s,
                "slices": k,
                "wall_s": time.perf_counter() - t0,
                "n_rcliques": len(vmat),
            }
        )
    return pd.DataFrame(rows)


# -------------------------------------------------------------------- Fig 15
def table_rmat_scaling(
    log2_ns: list[int] | None = None,
    edges_per_vertex: list[int] | None = None,
    rs_list: list[tuple[int, int]] | None = None,
) -> pd.DataFrame:
    """Fig 15: ARB on rMAT graphs of varying size and density."""
    rows = []
    for log2_n in log2_ns or [9, 10, 11]:
        for epv in edges_per_vertex or [4, 8, 16]:
            edges = rmat(log2_n, (1 << log2_n) * epv, seed=100 + log2_n)
            for r, s in rs_list or [(2, 3), (3, 4), (4, 5)]:
                res = _arb(edges, r, s, _best_config(r, s))
                rows.append(
                    {
                        "log2_n": log2_n,
                        "edges_per_vertex": epv,
                        "m": len(edges),
                        "r": r,
                        "s": s,
                        "n_rcliques": len(res.vmat),
                        "n_scliques": res.counters.scliques_discovered,
                        "wall_s": res.counters.wall_seconds,
                    }
                )
    return pd.DataFrame(rows)
