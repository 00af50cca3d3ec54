"""Iterative trim: fixpoint semantics and cycle preservation."""
import numpy as np
import pandas as pd
import pytest

from repro.core.brute import all_simple_cycles
from repro.graph.csr import CSRGraph
from repro.graph.schema import edges_df
from repro.graph.trim import trim
from repro.graphgen.models import uniform_digraph
from repro.oracle import assert_equivalent


def trim_reference(pdf: pd.DataFrame) -> pd.DataFrame:
    cur = pdf[pdf.src != pdf.dst].drop_duplicates()
    while True:
        good = set(cur.src) & set(cur.dst)
        nxt = cur[cur.src.isin(good) & cur.dst.isin(good)]
        if len(nxt) == len(cur):
            return nxt.reset_index(drop=True)
        cur = nxt


@pytest.mark.parametrize("seed", range(5))
def test_matches_reference(spark, seed):
    pdf = uniform_digraph(25, 60, reciprocity=0.2, seed=seed)
    got = trim(edges_df(spark, pdf))
    assert_equivalent(got, "SELECT src, dst FROM expected",
                      expected=trim_reference(pdf))


def test_chain_fully_trimmed(spark):
    pdf = pd.DataFrame({"src": [0, 1, 2], "dst": [1, 2, 3]})
    assert trim(edges_df(spark, pdf)).count() == 0


def test_cycle_with_tail(spark):
    pdf = pd.DataFrame({"src": [0, 1, 2, 2, 4], "dst": [1, 2, 0, 3, 0]})
    got = trim(edges_df(spark, pdf)).toPandas()
    assert {tuple(r) for r in got.to_numpy()} == {(0, 1), (1, 2), (2, 0)}


def test_idempotent(spark):
    pdf = uniform_digraph(30, 80, seed=3)
    t1 = trim(edges_df(spark, pdf))
    t2 = trim(t1)
    assert sorted(map(tuple, t1.collect())) == sorted(map(tuple,
                                                          t2.collect()))


@pytest.mark.parametrize("seed", range(4))
def test_preserves_all_cycles(spark, seed):
    pdf = uniform_digraph(20, 45, reciprocity=0.3, seed=seed)
    g0 = CSRGraph.from_edges(pdf)
    trimmed = trim(edges_df(spark, pdf)).toPandas()
    g1 = CSRGraph.from_edges(trimmed) if len(trimmed) else None
    before = {tuple(g0.to_labels(list(c)))
              for c in all_simple_cycles(g0, 2, 6)}
    after = ({tuple(g1.to_labels(list(c)))
              for c in all_simple_cycles(g1, 2, 6)} if g1 else set())
    assert before == after
