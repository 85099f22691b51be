"""Degree computation as a Spark dataflow."""
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def symmetrize(edges: DataFrame) -> DataFrame:
    """Union of both directions of a canonical (src<dst) edge list."""
    e = edges.select("src", "dst")
    return e.unionByName(
        e.select(F.col("dst").alias("src"), F.col("src").alias("dst"))
    )


def degrees(edges: DataFrame) -> DataFrame:
    """Per-node degree from a canonical undirected edge list.

    Returns ``id: long, degree: long``. Nodes with no edges do not appear
    (join against the node table and ``coalesce`` to 0 when needed).
    """
    return (
        symmetrize(edges)
        .groupBy(F.col("src").alias("id"))
        .agg(F.count("*").alias("degree"))
    )
