"""Edge normal form + stats, DuckDB-oracled."""
import pandas as pd
import pytest

from repro.graph.schema import edges_df, graph_stats, normalize_edges, vertices
from repro.oracle import assert_equivalent


@pytest.fixture()
def dirty(spark):
    pdf = pd.DataFrame({"src": [1, 1, 1, 2, 3, 3],
                        "dst": [2, 2, 1, 3, 1, 3]})
    return spark.createDataFrame(pdf, "src BIGINT, dst BIGINT"), pdf


def test_normalize_drops_loops_and_dups(spark, dirty):
    df, pdf = dirty
    got = normalize_edges(df)
    assert_equivalent(
        got,
        "SELECT DISTINCT src, dst FROM t WHERE src <> dst",
        t=pdf,
    )


def test_vertices(spark, dirty):
    df, pdf = dirty
    got = vertices(normalize_edges(df))
    assert_equivalent(
        got,
        "SELECT DISTINCT v FROM (SELECT src AS v FROM t WHERE src <> dst "
        "UNION ALL SELECT dst FROM t WHERE src <> dst)",
        t=pdf,
    )


def test_graph_stats(spark, dirty):
    df, _ = dirty
    st = graph_stats(normalize_edges(df))
    # normalized: (1,2),(2,3),(3,1) -> n=3, m=3, d_avg=2
    assert st == {"n": 3, "m": 3, "d_avg": 2.0}


def test_edges_df_normalizes(spark):
    pdf = pd.DataFrame({"src": [5, 5, 6], "dst": [5, 6, 5]})
    assert edges_df(spark, pdf).count() == 2


def test_graph_stats_empty(spark):
    e = spark.createDataFrame([], "src BIGINT, dst BIGINT")
    assert graph_stats(e) == {"n": 0, "m": 0, "d_avg": 0.0}
