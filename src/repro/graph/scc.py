"""Distributed strongly-connected components as iterative DataFrame joins.

The classic *coloring* algorithm (Orzan; used by GraphFrames/Pregel SCC):

1. forward max-label propagation to a fixpoint — ``color[v]`` becomes the
   largest vertex id that reaches ``v``;
2. every vertex whose color equals its own id roots one SCC; the SCC's
   members are the vertices that reach their root *within their color
   class* (backward propagation restricted to same-color edges);
3. peel the assigned vertices and repeat.

Cycles never cross SCCs, so this is the partitioner that makes the cover
problem embarrassingly parallel per component. Peeling can need many
rounds on pathological SCC-chains, so after ``max_rounds`` all remaining
vertices are assigned the single *residual* component ``-1`` — sound for
partitioning (the in-kernel Tarjan re-decomposes), and tests use enough
rounds for exactness against Tarjan.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from .schema import vertices

RESIDUAL = -1


def _forward_colors(edges: DataFrame, verts: DataFrame,
                    max_iters: int) -> DataFrame:
    """Fixpoint of ``color[v] = max(v, max_{u->v} color[u])`` → (v, c)."""
    color = verts.select("v", F.col("v").alias("c"))
    prev_sum = None
    for _ in range(max_iters):
        msgs = (edges.join(color, edges.src == color.v)
                .groupBy(edges.dst.alias("v"))
                .agg(F.max("c").alias("mc")))
        color = (color.join(msgs, "v", "left_outer")
                 .select("v", F.greatest("c", F.coalesce("mc", "c"))
                         .alias("c"))
                 .localCheckpoint(eager=True))
        s = color.agg(F.sum("c").alias("s")).collect()[0]["s"]
        if s == prev_sum:
            break
        prev_sum = s
    return color


def scc(spark: SparkSession, edges: DataFrame, *, max_rounds: int = 20,
        max_prop_iters: int = 500) -> DataFrame:
    """Component assignment ``(v, comp)`` for every vertex of ``edges``.

    ``comp`` is the root vertex id of the SCC (or ``RESIDUAL`` for
    vertices left after ``max_rounds`` peels).
    """
    master = vertices(edges).localCheckpoint(eager=True)
    assigned: list[DataFrame] = []
    cur = edges
    for _ in range(max_rounds):
        if cur.isEmpty():
            break
        verts = vertices(cur).localCheckpoint(eager=True)
        color = _forward_colors(cur, verts, max_prop_iters)
        # same-color edges only: SCCs live inside color classes
        ce = (cur
              .join(color.withColumnRenamed("v", "src")
                    .withColumnRenamed("c", "c_src"), "src")
              .join(color.withColumnRenamed("v", "dst")
                    .withColumnRenamed("c", "c_dst"), "dst")
              .where(F.col("c_src") == F.col("c_dst"))
              .select("src", "dst", F.col("c_src").alias("c"))
              .localCheckpoint(eager=True))
        # backward reach from each color root within the class
        members = color.where(F.col("v") == F.col("c"))
        n_members = members.count()
        for _ in range(max_prop_iters):
            grow = (ce.join(members.withColumnRenamed("v", "dst"),
                            ["dst", "c"], "leftsemi")
                    .select(F.col("src").alias("v"), "c")
                    .distinct())
            members = members.unionByName(grow).distinct() \
                .localCheckpoint(eager=True)
            n_new = members.count()
            if n_new == n_members:
                break
            n_members = n_new
        assigned.append(members.select("v", F.col("c").alias("comp")))
        # peel: drop all edges touching an assigned vertex
        mv = members.select("v")
        cur = (cur
               .join(mv.withColumnRenamed("v", "src"), "src", "left_anti")
               .join(mv.withColumnRenamed("v", "dst"), "dst", "left_anti")
               .select("src", "dst")
               .localCheckpoint(eager=True))
    out = None
    for a in assigned:
        out = a if out is None else out.unionByName(a)
    residual = vertices(cur).select(
        "v", F.lit(RESIDUAL).cast("bigint").alias("comp"))
    if out is None:
        out = residual
    else:
        out = out.unionByName(residual.join(out.select("v"), "v",
                                            "left_anti"))
    # Vertices whose every edge was peeled away without them being
    # assigned are provably singleton SCCs (SCC-internal edges are never
    # peeled): give them their own id.
    singles = (master.join(out.select("v"), "v", "left_anti")
               .select("v", F.col("v").alias("comp")))
    return out.unionByName(singles)
