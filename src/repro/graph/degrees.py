"""Degree computations over the edge normal form (Catalyst aggregations)."""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def degrees(edges: DataFrame) -> DataFrame:
    """Per-vertex ``out_deg``/``in_deg``/``deg`` (missing sides are 0)."""
    out_d = edges.groupBy(F.col("src").alias("v")).agg(
        F.count("*").alias("out_deg"))
    in_d = edges.groupBy(F.col("dst").alias("v")).agg(
        F.count("*").alias("in_deg"))
    return (out_d.join(in_d, "v", "full_outer")
            .select(
                "v",
                F.coalesce("out_deg", F.lit(0)).alias("out_deg"),
                F.coalesce("in_deg", F.lit(0)).alias("in_deg"))
            .withColumn("deg", F.col("out_deg") + F.col("in_deg")))
