"""Graph structure metrics in Spark SQL (Catalyst), oracle-checkable.

These run over ``(src, dst)`` edge DataFrames. The undirected simple view
is what every partitioner in this repo consumes, mirroring how the
partitioning tools in the paper symmetrize their input.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def undirected(edges: DataFrame) -> DataFrame:
    """Canonical undirected simple view (src < dst, no loops, distinct)."""
    return (
        edges.select(
            F.least("src", "dst").alias("src"), F.greatest("src", "dst").alias("dst")
        )
        .where(F.col("src") != F.col("dst"))
        .distinct()
    )


def incident_vertices(edges: DataFrame) -> DataFrame:
    """All (vertex) rows with one row per incidence (not distinct)."""
    return edges.select(F.col("src").alias("vertex")).unionAll(
        edges.select(F.col("dst").alias("vertex"))
    )


def degrees(edges: DataFrame) -> DataFrame:
    """Undirected degree per vertex: columns (vertex, degree)."""
    return (
        incident_vertices(undirected(edges))
        .groupBy("vertex")
        .agg(F.count("*").alias("degree"))
    )


def degree_skew(edges: DataFrame) -> float:
    """Max degree / mean degree — a cheap proxy for power-law skew."""
    row = degrees(edges).agg(
        (F.max("degree") / F.mean("degree")).alias("skew")
    ).collect()[0]
    return float(row["skew"])
