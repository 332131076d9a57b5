"""Table T5 (paper Fig 13): relative cost across (r, s) values."""
from repro.experiments import save_table, table_rs_sweep


def test_t5_rs_sweep(once):
    df = once(table_rs_sweep)
    save_table(df, "t5_rs_sweep")
    assert (df["slowdown_vs_fastest"] >= 1.0 - 1e-9).all()
