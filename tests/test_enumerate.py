"""Spark cycle enumeration vs DuckDB recursive CTE vs brute force."""
import pytest

from repro.core.brute import all_simple_cycles
from repro.graph.csr import CSRGraph
from repro.graph.enumerate import enumerate_cycles
from repro.graph.schema import edges_df
from repro.graphgen.models import uniform_digraph
from repro.oracle import assert_equivalent

# DuckDB recursive CTE enumerating hop-constrained simple cycles with the
# same canonicalization (min vertex first, direction preserved).
DUCK_SQL = """
WITH RECURSIVE paths(root, last, path) AS (
    SELECT src, dst, [src, dst] FROM t WHERE src < dst
    UNION ALL
    SELECT p.root, e.dst, list_append(p.path, e.dst)
    FROM paths p JOIN t e ON p.last = e.src
    WHERE e.dst > p.root
      AND NOT list_contains(p.path, e.dst)
      AND len(p.path) < {k}
)
SELECT list_aggr(list_transform(p.path, x -> CAST(x AS VARCHAR)),
                 'string_agg', '->') AS cycle,
       len(p.path) AS length
FROM paths p JOIN t e ON p.last = e.src AND e.dst = p.root
WHERE len(p.path) BETWEEN {lo} AND {k}
"""


@pytest.mark.parametrize("seed", range(4))
@pytest.mark.parametrize("k", [3, 4, 5])
def test_vs_duckdb_recursive_cte(spark, seed, k):
    pdf = uniform_digraph(10, 26, reciprocity=0.3, seed=seed)
    got = enumerate_cycles(edges_df(spark, pdf), k)
    assert_equivalent(got, DUCK_SQL.format(k=k, lo=3), t=pdf)


@pytest.mark.parametrize("seed", range(4))
@pytest.mark.parametrize("k", [3, 5])
@pytest.mark.parametrize("min_len", [2, 3])
def test_vs_brute(spark, seed, k, min_len):
    pdf = uniform_digraph(10, 26, reciprocity=0.4, seed=seed)
    g = CSRGraph.from_edges(pdf)
    got = {r["cycle"] for r in
           enumerate_cycles(edges_df(spark, pdf), k,
                            min_len=min_len).collect()}
    expect = {"->".join(str(int(g.vertex_ids[v])) for v in c)
              for c in all_simple_cycles(g, min_len, k)}
    assert got == expect


def test_each_cycle_once(spark):
    import pandas as pd
    pdf = pd.DataFrame({"src": [0, 1, 2, 0, 2, 1],
                        "dst": [1, 2, 0, 2, 1, 0]})
    rows = enumerate_cycles(edges_df(spark, pdf), 3).collect()
    assert len(rows) == len({r["cycle"] for r in rows}) == 2


def test_empty_and_small_k(spark):
    import pandas as pd
    pdf = pd.DataFrame({"src": [0], "dst": [1]})
    assert enumerate_cycles(edges_df(spark, pdf), 5).count() == 0
    assert enumerate_cycles(edges_df(spark, pdf), 1).count() == 0
