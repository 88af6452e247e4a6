"""Canonical undirected edge-list handling.

Every algorithm in this repo consumes a *canonical* edge DataFrame:
columns ``src``/``dst`` (long), ``src < dst``, distinct rows, no self
loops. ``normalize_edges`` produces that form from any raw pair list.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

SRC, DST = "src", "dst"


def normalize_edges(df: DataFrame, src: str = SRC, dst: str = DST) -> DataFrame:
    """Return the canonical form of an undirected edge list.

    Orients every edge so ``src < dst``, drops self loops and duplicate
    edges (including duplicates that differ only in direction).
    """
    a = F.col(src).cast("long")
    b = F.col(dst).cast("long")
    return (
        df.select(
            F.least(a, b).alias(SRC),
            F.greatest(a, b).alias(DST),
        )
        .where(F.col(SRC) != F.col(DST))
        .distinct()
    )


def from_pandas(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    """Lift a pandas edge list (columns src/dst) into canonical Spark form."""
    return normalize_edges(spark.createDataFrame(pdf[[SRC, DST]]))


def vertices(edges: DataFrame) -> DataFrame:
    """Distinct vertices appearing in the edge list (column ``v``)."""
    return (
        edges.select(F.col(SRC).alias("v"))
        .union(edges.select(F.col(DST).alias("v")))
        .distinct()
    )


def degrees(edges: DataFrame) -> DataFrame:
    """Vertex degrees (columns ``v``, ``deg``) of a canonical edge list."""
    return (
        edges.select(F.col(SRC).alias("v"))
        .union(edges.select(F.col(DST).alias("v")))
        .groupBy("v")
        .agg(F.count("*").alias("deg"))
    )


def num_vertices(edges: DataFrame) -> int:
    """Number of distinct vertices."""
    return vertices(edges).count()


def num_edges(edges: DataFrame) -> int:
    """Number of canonical (undirected, deduplicated) edges."""
    return edges.count()


def max_vertex_id(edges: DataFrame) -> int:
    """Largest vertex id (graphs use dense ids 0..n-1, so usually n-1)."""
    row = edges.agg(F.max(F.greatest(F.col(SRC), F.col(DST))).alias("m")).collect()[0]
    return int(row["m"]) if row["m"] is not None else -1
