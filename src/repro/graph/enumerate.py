"""Distributed hop-constrained simple-cycle enumeration.

The paper's problem never *enumerates* cycles (that is exactly what TDB
avoids), but enumeration is the natural ground truth: this module grows
simple paths by iterative joins — the DataFrame analog of the join-based
path enumeration literature the paper cites (§II-C) — and emits each
constrained cycle exactly once, canonically rooted at its minimum vertex.
Tests cross-check the result against a DuckDB recursive CTE and the
in-process brute enumerator. Exponential output: tiny graphs only.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def enumerate_cycles(edges: DataFrame, k: int, *,
                     min_len: int = 3) -> DataFrame:
    """All simple cycles with length in ``[min_len, k]``.

    Output columns: ``cycle`` (``"v0->v1->..."``, v0 = min vertex,
    direction preserved) and ``length``. Each cycle appears exactly once:
    paths are rooted at their minimum vertex and only extend to strictly
    larger vertices.
    """
    spark = edges.sparkSession
    if k < 2:
        return spark.createDataFrame([], "cycle STRING, length INT")
    paths = (edges.where(F.col("src") < F.col("dst"))
             .select(F.col("src").alias("root"), F.col("dst").alias("last"),
                     F.array("src", "dst").alias("path")))
    closures = []

    def _close(p: DataFrame) -> DataFrame:
        back = edges.select(F.col("src").alias("last"),
                            F.col("dst").alias("root"))
        return (p.join(back, ["root", "last"], "leftsemi")
                .select(F.concat_ws("->", F.col("path")).alias("cycle"),
                        F.size("path").alias("length")))

    for step in range(k - 1):
        length = step + 2  # cycle length if the current path closes
        if length >= min_len:
            closures.append(_close(paths))
        if length + 1 > k:
            break
        paths = (paths.join(edges, paths.last == edges.src)
                 .where((F.col("dst") > F.col("root"))
                        & ~F.array_contains("path", F.col("dst")))
                 .select("root", F.col("dst").alias("last"),
                         F.concat("path", F.array("dst")).alias("path"))
                 .localCheckpoint(eager=True))
        if paths.isEmpty():
            break
    out = None
    for c in closures:
        out = c if out is None else out.unionByName(c)
    if out is None:
        return spark.createDataFrame([], "cycle STRING, length INT")
    return out.distinct()
