"""Distributed k-core decomposition (iterative DataFrame peeling).

Core numbers: repeatedly delete all vertices of degree < k, for k = 1, 2, …;
a vertex's core number is the largest k at which it survives the k-core
pruning. The graph degeneracy δ is the largest non-empty core's k.

The loop tracks the remaining vertex set explicitly (a vertex that loses all
its edges is otherwise unrepresentable in an edge list) and materializes the
shrinking DataFrames with ``localCheckpoint`` every round so the Catalyst
plan/lineage stays bounded. This is a small-data substrate job (validated
against the exact local peel); the MCE kernels use the local peel directly
for the *ordering*, which a distributed decomposition inherently does not
produce.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from ..graphs.edgelist import degrees


def core_numbers(edges: DataFrame) -> DataFrame:
    """Per-vertex core number: columns ``v``, ``core``."""
    spark = edges.sparkSession
    remaining = edges.select("src", "dst").localCheckpoint(eager=True)
    verts = (
        remaining.select(F.col("src").alias("v"))
        .unionAll(remaining.select(F.col("dst").alias("v")))
        .distinct()
        .localCheckpoint(eager=True)
    )
    result = spark.createDataFrame([], "v long, core long")
    k = 1
    while verts.limit(1).count() > 0:
        while True:
            deg = verts.join(degrees(remaining), "v", "left").select(
                "v", F.coalesce("degree", F.lit(0)).alias("degree")
            )
            low = deg.where(F.col("degree") < k).select("v")
            if low.limit(1).count() == 0:
                break
            # Everything peeled during the k-round has core number k - 1.
            result = result.unionAll(
                low.select("v", F.lit(k - 1).alias("core"))
            ).localCheckpoint(eager=True)
            verts = verts.join(low, "v", "left_anti").localCheckpoint(eager=True)
            rm = low.withColumnRenamed("v", "rm")
            remaining = (
                remaining.join(rm, remaining.src == F.col("rm"), "left_anti")
                .join(rm, remaining.dst == F.col("rm"), "left_anti")
                .localCheckpoint(eager=True)
            )
        k += 1
    return result


def degeneracy(edges: DataFrame) -> int:
    """δ = max core number (0 for an empty graph)."""
    row = core_numbers(edges).agg(F.max("core").alias("d")).collect()[0]
    return int(row["d"]) if row["d"] is not None else 0
