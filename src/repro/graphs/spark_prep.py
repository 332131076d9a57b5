"""DataFrame-side graph preparation (degrees, orientation, supports).

These mirror the numpy substrates with pure Spark SQL / DataFrame
operations, are tested equal to them, and are cross-checked against
DuckDB with ``repro.oracle.assert_equivalent`` — the Catalyst plans for
the self-join triangle query exercise the shuffle path (broadcast joins
are disabled by the session fixture).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

__all__ = ["edges_df", "degrees_df", "orient_edges_df", "triangle_support_df"]


def edges_df(spark: SparkSession, edges: np.ndarray) -> DataFrame:
    """Canonical undirected edge DataFrame with u < v."""
    pdf = pd.DataFrame(
        {
            "u": np.minimum(edges[:, 0], edges[:, 1]),
            "v": np.maximum(edges[:, 0], edges[:, 1]),
        }
    )
    return spark.createDataFrame(pdf).where("u <> v").distinct()


def degrees_df(e: DataFrame) -> DataFrame:
    """Per-vertex degree from the canonical edge DataFrame."""
    both = e.select(F.col("u").alias("w")).unionAll(e.select(F.col("v").alias("w")))
    return both.groupBy("w").agg(F.count("*").alias("deg"))


def orient_edges_df(e: DataFrame) -> DataFrame:
    """Degree orientation: src -> dst iff (deg, id) of src < of dst.

    The DataFrame analogue of ``orient_csr`` with ``degree_order``.
    """
    deg = degrees_df(e)
    du = deg.withColumnRenamed("w", "u").withColumnRenamed("deg", "du")
    dv = deg.withColumnRenamed("w", "v").withColumnRenamed("deg", "dv")
    j = e.join(du, "u").join(dv, "v")
    fwd = j.where("(du < dv) or (du = dv and u < v)").select(
        F.col("u").alias("src"), F.col("v").alias("dst")
    )
    bwd = j.where("(dv < du) or (du = dv and v < u)").select(
        F.col("v").alias("src"), F.col("u").alias("dst")
    )
    return fwd.unionAll(bwd)


def triangle_support_df(e: DataFrame) -> DataFrame:
    """Per-edge triangle count (the k-truss 'support'), columns (u, v, support).

    Triangles are enumerated once each over the degree-oriented DAG
    (src->mid->last with src->last closing), then exploded back onto
    their three undirected edges.
    """
    d = orient_edges_df(e)
    e1 = d.select(F.col("src").alias("a"), F.col("dst").alias("b"))
    e2 = d.select(F.col("src").alias("b"), F.col("dst").alias("c"))
    e3 = d.select(F.col("src").alias("a2"), F.col("dst").alias("c2"))
    tri = (
        e1.join(e2, "b")
        .join(e3, (F.col("a") == F.col("a2")) & (F.col("c") == F.col("c2")))
        .select("a", "b", "c")
    )
    sides = tri.select(
        F.explode(
            F.array(
                F.array("a", "b"),
                F.array("a", "c"),
                F.array("b", "c"),
            )
        ).alias("pair")
    ).select(
        F.least(F.col("pair")[0], F.col("pair")[1]).alias("u"),
        F.greatest(F.col("pair")[0], F.col("pair")[1]).alias("v"),
    )
    support = sides.groupBy("u", "v").agg(F.count("*").alias("support"))
    return e.join(support, ["u", "v"], "left").fillna(0, subset=["support"])
