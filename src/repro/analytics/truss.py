"""Distributed k-truss decomposition (iterative DataFrame peeling).

Truss numbers: the k-truss is the maximal subgraph in which every edge lies
in at least k - 2 triangles of the subgraph. An edge's truss number is the
largest k for which it survives. τ (the paper's truss-based branch-size
bound, the max support seen when peeling edges in min-support order) equals
``max truss number - 2`` — asserted against the local peel in tests.

Peeling: for k = 3, 4, …, repeatedly delete edges whose support in the
remaining graph is < k - 2; deleted edges get truss number k - 1 (edges
falling out before the 3-round get 2).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .triangles import edge_support


def truss_numbers(edges: DataFrame) -> DataFrame:
    """Per-edge truss number: columns ``src``, ``dst``, ``truss``."""
    spark = edges.sparkSession
    remaining = edges.select("src", "dst").localCheckpoint(eager=True)
    result = spark.createDataFrame([], "src long, dst long, truss long")
    k = 3
    while remaining.limit(1).count() > 0:
        while True:
            sup = edge_support(remaining)
            low = sup.where(F.col("support") < k - 2).select("src", "dst")
            if low.limit(1).count() == 0:
                break
            result = result.unionAll(
                low.select("src", "dst", F.lit(k - 1).alias("truss"))
            ).localCheckpoint(eager=True)
            remaining = remaining.join(low, ["src", "dst"], "left_anti").localCheckpoint(
                eager=True
            )
        k += 1
    return result


def tau(edges: DataFrame) -> int:
    """The paper's τ = max truss number - 2 (0 for a triangle-free graph)."""
    row = truss_numbers(edges).agg(F.max("truss").alias("t")).collect()[0]
    return int(row["t"]) - 2 if row["t"] is not None else 0
