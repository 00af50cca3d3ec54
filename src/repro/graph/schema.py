"""Edge-DataFrame normal form shared by every distributed operator.

A graph is a DataFrame with ``src BIGINT, dst BIGINT``: no self-loops, no
duplicate edges. ``normalize_edges`` establishes that form;
:func:`graph_stats` computes the Table II statistics (the paper reports
``d_avg = 2|E| / |V|``, counting both directions of incidence).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

EDGE_SCHEMA = "src BIGINT, dst BIGINT"


def edges_df(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    """Lift a pandas ``src``/``dst`` frame into the Spark normal form."""
    return normalize_edges(spark.createDataFrame(pdf[["src", "dst"]],
                                                 schema=EDGE_SCHEMA))


def normalize_edges(edges: DataFrame) -> DataFrame:
    """Drop self-loops and duplicate edges (the problem's graph model)."""
    return (edges.select("src", "dst")
            .where(F.col("src") != F.col("dst"))
            .distinct())


def vertices(edges: DataFrame) -> DataFrame:
    """Distinct vertices incident to any edge, as column ``v``."""
    return (edges.select(F.col("src").alias("v"))
            .unionByName(edges.select(F.col("dst").alias("v")))
            .distinct())


def graph_stats(edges: DataFrame) -> dict:
    """``{"n": |V|, "m": |E|, "d_avg": 2m/n}`` for a normalized graph."""
    m = edges.count()
    n = vertices(edges).count()
    return {"n": n, "m": m, "d_avg": (2.0 * m / n) if n else 0.0}
