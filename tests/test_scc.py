"""Distributed SCC vs Tarjan."""
import pandas as pd
import pytest

from repro.graph.csr import CSRGraph
from repro.graph.scc import RESIDUAL, scc
from repro.graph.schema import edges_df
from repro.graph.tarjan import tarjan_scc
from repro.graphgen.models import powerlaw_digraph, uniform_digraph


def spark_partition(spark, pdf, **kw):
    out = scc(spark, edges_df(spark, pdf), **kw).toPandas()
    groups = {}
    for _, r in out.iterrows():
        groups.setdefault(int(r["comp"]), set()).add(int(r["v"]))
    return out, {frozenset(s) for c, s in groups.items() if c != RESIDUAL}


def tarjan_partition(pdf):
    g = CSRGraph.from_edges(pdf)
    groups = {}
    for i, c in enumerate(tarjan_scc(g)):
        groups.setdefault(int(c), set()).add(int(g.vertex_ids[i]))
    return {frozenset(s) for s in groups.values()}


@pytest.mark.parametrize("seed", range(5))
@pytest.mark.parametrize("gen", [uniform_digraph, powerlaw_digraph])
def test_matches_tarjan(spark, seed, gen):
    pdf = gen(18, 40, reciprocity=0.3, seed=seed)
    out, parts = spark_partition(spark, pdf, max_rounds=40)
    assert (out.comp != RESIDUAL).all()  # enough rounds: exact
    assert parts == tarjan_partition(pdf)


def test_two_cycles_and_bridge(spark):
    pdf = pd.DataFrame({"src": [0, 1, 1, 2, 3], "dst": [1, 0, 2, 3, 2]})
    _, parts = spark_partition(spark, pdf, max_rounds=10)
    assert parts == {frozenset({0, 1}), frozenset({2, 3})}


def test_dag_all_singletons(spark):
    pdf = pd.DataFrame({"src": [0, 0, 1], "dst": [1, 2, 2]})
    out, parts = spark_partition(spark, pdf, max_rounds=10)
    assert all(len(p) == 1 for p in parts)
    assert len(parts) == 3


def test_residual_grouping_when_rounds_exhausted(spark):
    # SCC chain A={10,11} -> B={4,5} -> C={0,1} where the global max id
    # sits upstream: the first peel only assigns A, so with max_rounds=1
    # B and C land in the residual group — still a valid grouping for the
    # kernels (they re-Tarjan inside).
    pdf = pd.DataFrame({"src": [10, 11, 4, 5, 0, 1, 11, 5],
                        "dst": [11, 10, 5, 4, 1, 0, 4, 0]})
    out = scc(spark, edges_df(spark, pdf), max_rounds=1).toPandas()
    assert set(out.v) == {0, 1, 4, 5, 10, 11}  # everyone assigned
    comp = dict(zip(out.v, out.comp))
    assert comp[10] == comp[11] != RESIDUAL
    assert comp[4] == comp[5] == comp[0] == comp[1] == RESIDUAL


def test_empty(spark):
    e = spark.createDataFrame([], "src BIGINT, dst BIGINT")
    assert scc(spark, e).count() == 0
