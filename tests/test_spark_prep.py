"""DataFrame-side graph prep, cross-checked against numpy and DuckDB.

These run Catalyst plans through the shuffle path (broadcast joins are
disabled by the session fixture) and use ``repro.oracle`` so a wrong
join/aggregation is caught as a wrong *result*, not just a crash.
"""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.graphs.csr import build_csr, orient_csr
from repro.graphs.gen import rmat
from repro.graphs.orient import degree_order
from repro.graphs.spark_prep import (
    degrees_df,
    edges_df,
    orient_edges_df,
    triangle_support_df,
)
from repro.oracle import assert_equivalent

from .fixtures import FIG1_EDGES, SMALL_GRAPHS


@pytest.fixture(scope="module")
def fig1_df(spark):
    return edges_df(spark, FIG1_EDGES).cache()


@pytest.fixture(scope="module")
def rmat_df(spark):
    return edges_df(spark, rmat(8, 900, seed=23)).cache()


def _pdf(edges: np.ndarray) -> pd.DataFrame:
    return pd.DataFrame({"u": edges[:, 0], "v": edges[:, 1]})


def test_edges_df_canonical(spark, fig1_df):
    pdf = fig1_df.toPandas()
    assert (pdf["u"] < pdf["v"]).all()
    assert len(pdf) == len(FIG1_EDGES)


def test_degrees_vs_duckdb_oracle(spark, fig1_df):
    got = degrees_df(fig1_df)
    assert_equivalent(
        got,
        """
        SELECT w, COUNT(*) AS deg FROM (
            SELECT u AS w FROM edges UNION ALL SELECT v AS w FROM edges
        ) GROUP BY w
        """,
        edges=_pdf(FIG1_EDGES),
    )


def test_degrees_vs_numpy(spark, rmat_df):
    edges = rmat(8, 900, seed=23)
    und = build_csr(edges)
    got = degrees_df(rmat_df).toPandas().sort_values("w").reset_index(drop=True)
    np_deg = und.degrees()
    present = np.flatnonzero(np_deg > 0)
    assert got["w"].to_numpy().tolist() == present.tolist()
    assert got["deg"].to_numpy().tolist() == np_deg[present].tolist()


def test_orientation_out_edges_match_numpy(spark, rmat_df):
    edges = rmat(8, 900, seed=23)
    und = build_csr(edges)
    dg = orient_csr(und, degree_order(und))
    got = orient_edges_df(rmat_df).toPandas()
    got_set = set(zip(got["src"], got["dst"]))
    exp_set = {
        (v, int(w)) for v in range(dg.n) for w in dg.neighbors(v)
    }
    assert got_set == exp_set


def test_triangle_support_vs_duckdb_oracle(spark, fig1_df):
    got = triangle_support_df(fig1_df).select("u", "v", "support")
    assert_equivalent(
        got,
        """
        WITH tri AS (
          SELECT e1.u AS a, e1.v AS b, e2.v AS c
          FROM edges e1 JOIN edges e2 ON e1.v = e2.u
          JOIN edges e3 ON e3.u = e1.u AND e3.v = e2.v
        ),
        sides AS (
          SELECT a AS u, b AS v FROM tri
          UNION ALL SELECT a, c FROM tri
          UNION ALL SELECT b, c FROM tri
        )
        SELECT e.u, e.v, COALESCE(s.support, 0) AS support
        FROM edges e LEFT JOIN (
          SELECT u, v, COUNT(*) AS support FROM sides GROUP BY u, v
        ) s ON e.u = s.u AND e.v = s.v
        """,
        edges=_pdf(FIG1_EDGES),
    )


def test_triangle_support_total_is_3x_triangles(spark, fig1_df):
    total = triangle_support_df(fig1_df).agg(F.sum("support")).collect()[0][0]
    assert total == 3 * 14  # Fig 1 has 14 triangles


@pytest.mark.parametrize("name", ["bowtie", "two-tri", "er30"])
def test_triangle_support_matches_brute_force(spark, name):
    from itertools import combinations

    from repro.nucleus.reference import brute_force_cliques

    edges = SMALL_GRAPHS[name]
    und = build_csr(edges)
    support = {}
    for t in brute_force_cliques(und, 3):
        for e in combinations(t, 2):
            support[e] = support.get(e, 0) + 1
    got = triangle_support_df(edges_df(spark, edges)).toPandas()
    for u, v, sup in got[["u", "v", "support"]].itertuples(index=False):
        assert support.get((u, v), 0) == sup
