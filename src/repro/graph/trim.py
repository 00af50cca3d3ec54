"""Iterative trim: peel vertices that cannot lie on any cycle.

A vertex with no incoming or no outgoing edge is on no cycle; removing it
may expose more such vertices, so the peel iterates to a fixpoint (the
classic FW-BW-Trim preprocessing). Pure DataFrame dataflow: each round is
two semi-joins; ``localCheckpoint`` cuts the growing lineage.

Trim preserves the set of cycles exactly (every removed vertex is on
none), so running any cover algorithm on the trimmed graph is equivalent
— asserted against brute-force cycle sets in the tests.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def trim(edges: DataFrame, *, max_rounds: int = 10_000) -> DataFrame:
    """Remove vertices with in-degree or out-degree 0, to a fixpoint."""
    cur = edges
    m = cur.count()
    for _ in range(max_rounds):
        if m == 0:
            break
        srcs = cur.select(F.col("src").alias("v")).distinct()
        dsts = cur.select(F.col("dst").alias("v")).distinct()
        both = srcs.join(dsts, "v")  # vertices with out- AND in-edges
        nxt = (cur
               .join(both.withColumnRenamed("v", "src"), "src", "leftsemi")
               .join(both.withColumnRenamed("v", "dst"), "dst", "leftsemi")
               .select("src", "dst")
               .localCheckpoint(eager=True))
        m_next = nxt.count()
        cur = nxt
        if m_next == m:
            break
        m = m_next
    return cur
