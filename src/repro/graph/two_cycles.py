"""2-cycle (mutual-edge) detection — the structures §VII-F's Table IV is
about. A self-join finds every reciprocated pair exactly once."""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def two_cycle_pairs(edges: DataFrame) -> DataFrame:
    """All unordered pairs {u, v} with both ``u->v`` and ``v->u``.

    Returned as ``(u, v)`` with ``u < v``, each mutual pair once.
    """
    rev = edges.select(F.col("dst").alias("src"), F.col("src").alias("dst"))
    return (edges.join(rev, ["src", "dst"])
            .where(F.col("src") < F.col("dst"))
            .select(F.col("src").alias("u"), F.col("dst").alias("v")))


def reciprocity(edges: DataFrame) -> float:
    """Fraction of edges belonging to a mutual pair."""
    m = edges.count()
    if m == 0:
        return 0.0
    return 2.0 * two_cycle_pairs(edges).count() / m
