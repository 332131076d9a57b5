"""Smoke tests for the table generators (small slices of each)."""
import pandas as pd
import pytest

from repro.experiments import (
    save_table,
    table_baselines,
    table_graph_stats,
    table_other_optimizations,
    table_rmat_scaling,
    table_rs_sweep,
    table_scalability,
    table_t_optimizations,
)


def test_graph_stats_one_graph():
    df = table_graph_stats(["youtube-lite"])
    assert {"graph", "n", "m", "r", "s", "rho", "max_core"} <= set(df.columns)
    assert (df["graph"] == "youtube-lite").all()
    assert len(df) > 3


def test_t_optimizations_configs_present():
    df = table_t_optimizations(rs=(3, 4), graphs=["amazon-lite"])
    assert "1-level (unopt)" in set(df["config"])
    assert (df[df["config"] == "1-level (unopt)"]["speedup_vs_1level"] == 1.0).all()
    assert (df["space_saving_vs_1level"] > 0).all()


def test_other_optimizations_shape():
    df = table_other_optimizations(["amazon-lite"], rs_list=[(2, 3)])
    opts = set(df["optimization"])
    assert {"relabel", "agg=list-buffer", "agg=hash", "contraction"} <= opts


def test_baselines_consistency_checks_run():
    # table_baselines asserts internally that every baseline agrees with ARB
    df = table_baselines(["amazon-lite"], rs_list=[(2, 3)])
    assert "slowdown_pkt_wall" in df.columns
    assert (df["pnd_rounds_ratio"] > 1).all()


def test_rs_sweep_relative_floor():
    df = table_rs_sweep(["youtube-lite"])
    assert df["slowdown_vs_fastest"].min() == pytest.approx(1.0)


def test_scalability_monotone():
    df = table_scalability(["amazon-lite"], rs_list=[(2, 3)], threads=[1, 4, 60])
    sp = df.sort_values("threads")["sim_speedup"].to_numpy()
    assert sp[0] == pytest.approx(1.0)
    assert sp[-1] > sp[0]


def test_rmat_scaling_small():
    df = table_rmat_scaling(log2_ns=[8], edges_per_vertex=[4, 8], rs_list=[(2, 3)])
    assert len(df) == 2
    assert df.sort_values("edges_per_vertex")["n_scliques"].is_monotonic_increasing


def test_save_table(tmp_path):
    df = pd.DataFrame({"a": [1], "b": [2.5]})
    p = save_table(df, "smoke", results_dir=tmp_path)
    assert p.exists() and (tmp_path / "smoke.csv").exists()
