"""Canonical probabilistic edge DataFrames and degree-based orientation.

All downstream enumeration assumes the canonical form produced by
:func:`canonical_edges`: undirected edges stored once as (u, v, p) with
u < v (vertex ids), 0 < p <= 1, no duplicates, no self-loops.

Triangle / 4-clique enumeration uses the standard degree orientation: each
undirected edge is directed from the endpoint of smaller (degree, id) to the
larger. Orienting by a total order bounded by degeneracy keeps the wedge join
output near-linear in practice (a hub of degree d contributes O(d^2) wedges
undirected but only pairs among its *higher-ranked* neighbours when oriented).
"""
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.window import Window


def canonical_edges(df: DataFrame) -> DataFrame:
    """Normalize an edge DataFrame with columns (u, v, p) to canonical form."""
    e = (
        df.select(
            F.least("u", "v").alias("u"),
            F.greatest("u", "v").alias("v"),
            F.col("p").cast("double").alias("p"),
        )
        .filter(F.col("u") != F.col("v"))
        .groupBy("u", "v")
        .agg(F.max("p").alias("p"))
    )
    return e


def degrees(edges: DataFrame) -> DataFrame:
    """Vertex degrees (vid, deg) of a canonical edge DataFrame."""
    ends = edges.select(F.col("u").alias("vid")).unionAll(
        edges.select(F.col("v").alias("vid"))
    )
    return ends.groupBy("vid").agg(F.count("*").alias("deg"))


def vertex_ranks(edges: DataFrame) -> DataFrame:
    """Dense total-order rank (vid, rank) by (degree, id), rank 0..n-1.

    The rank is the orientation order: edges point from low to high rank.
    """
    w = Window.orderBy("deg", "vid")
    return degrees(edges).select(
        "vid", (F.row_number().over(w) - F.lit(1)).alias("rank")
    )


def oriented(edges: DataFrame, ranks: DataFrame) -> DataFrame:
    """Directed edges (src, dst, p, rs, rd) with rank(src) < rank(dst)."""
    e = (
        edges.join(ranks.withColumnRenamed("vid", "u").withColumnRenamed("rank", "ru"), "u")
        .join(ranks.withColumnRenamed("vid", "v").withColumnRenamed("rank", "rv"), "v")
    )
    fwd = F.col("ru") < F.col("rv")
    return e.select(
        F.when(fwd, F.col("u")).otherwise(F.col("v")).alias("src"),
        F.when(fwd, F.col("v")).otherwise(F.col("u")).alias("dst"),
        "p",
        F.when(fwd, F.col("ru")).otherwise(F.col("rv")).alias("rs"),
        F.when(fwd, F.col("rv")).otherwise(F.col("ru")).alias("rd"),
    )
