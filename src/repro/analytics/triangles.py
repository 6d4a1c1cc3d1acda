"""Distributed triangle counting and per-edge support.

Standard Catalyst-friendly formulation: orient every edge from the
lower-(degree, id) endpoint to the higher one — each triangle then has
exactly one "apex" vertex with two out-edges, so joining the oriented list
with itself on the apex and probing the closing edge counts each triangle
once, with the join sizes bounded by the sum of squared out-degrees
(O(m^{3/2}) overall).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from ..graphs.edgelist import degrees


def oriented(edges: DataFrame) -> DataFrame:
    """Orient edges by (degree, id): columns ``u`` -> ``w`` with u ranked
    below w. Both directions of each input edge are considered."""
    deg = degrees(edges)
    both = edges.select("src", "dst").unionAll(
        edges.select(F.col("dst").alias("src"), F.col("src").alias("dst"))
    )
    ranked = (
        both.join(deg.withColumnRenamed("v", "src").withColumnRenamed("degree", "d_src"), "src")
        .join(deg.withColumnRenamed("v", "dst").withColumnRenamed("degree", "d_dst"), "dst")
    )
    return ranked.where(
        (F.col("d_src") < F.col("d_dst"))
        | ((F.col("d_src") == F.col("d_dst")) & (F.col("src") < F.col("dst")))
    ).select(F.col("src").alias("u"), F.col("dst").alias("w"))


def triangles(edges: DataFrame) -> DataFrame:
    """One row per triangle: columns ``a < b < c`` (vertex ids)."""
    o = oriented(edges)
    wedges = (
        o.alias("e1")
        .join(o.alias("e2"), F.col("e1.u") == F.col("e2.u"))
        .where(F.col("e1.w") < F.col("e2.w"))
        .select(
            F.col("e1.u").alias("apex"),
            F.col("e1.w").alias("x"),
            F.col("e2.w").alias("y"),
        )
    )
    closed = wedges.join(
        edges.select(F.col("src").alias("x"), F.col("dst").alias("y")),
        ["x", "y"],
    )
    return closed.select(
        F.least("apex", "x", "y").alias("a"),
        F.array_sort(F.array("apex", "x", "y"))[1].alias("b"),
        F.greatest("apex", "x", "y").alias("c"),
    )


def triangle_count(edges: DataFrame) -> int:
    """Total number of triangles in the graph."""
    return triangles(edges).count()


def edge_support(edges: DataFrame) -> DataFrame:
    """Per-edge support = number of triangles through the edge: columns
    ``src``, ``dst``, ``support`` (edges in no triangle report 0)."""
    tri = triangles(edges)
    tri_edges = (
        tri.select(F.col("a").alias("src"), F.col("b").alias("dst"))
        .unionAll(tri.select(F.col("a").alias("src"), F.col("c").alias("dst")))
        .unionAll(tri.select(F.col("b").alias("src"), F.col("c").alias("dst")))
    )
    sup = tri_edges.groupBy("src", "dst").agg(F.count("*").alias("support"))
    return (
        edges.join(sup, ["src", "dst"], "left")
        .select("src", "dst", F.coalesce("support", F.lit(0)).alias("support"))
    )
