"""Distributed k-circuit filter: may-analysis soundness + exactness on
closed walks."""
import pandas as pd
import pytest

from repro.core.brute import vertex_on_cycle
from repro.graph.csr import CSRGraph
from repro.graph.khop import circuit_candidates, prefilter_edges
from repro.graph.schema import edges_df
from repro.graphgen.models import uniform_digraph
from repro.core.brute import all_simple_cycles


@pytest.mark.parametrize("seed", range(4))
@pytest.mark.parametrize("k", [3, 5])
def test_no_false_pruning(spark, seed, k):
    pdf = uniform_digraph(16, 45, reciprocity=0.3, seed=seed)
    g = CSRGraph.from_edges(pdf)
    cand = {r["v"] for r in circuit_candidates(edges_df(spark, pdf), k)
            .collect()}
    for v in range(g.n):
        if vertex_on_cycle(g, v, 2, k):
            assert int(g.vertex_ids[v]) in cand


def test_exact_on_pure_cycles(spark):
    pdf = pd.DataFrame({"src": [0, 1, 2, 10, 11, 12, 13, 14],
                        "dst": [1, 2, 0, 11, 12, 13, 14, 10]})
    e = edges_df(spark, pdf)
    c3 = {r["v"] for r in circuit_candidates(e, 3).collect()}
    assert c3 == {0, 1, 2}
    c5 = {r["v"] for r in circuit_candidates(e, 5).collect()}
    assert c5 == {0, 1, 2, 10, 11, 12, 13, 14}


def test_two_cycle_counts_as_walk(spark):
    pdf = pd.DataFrame({"src": [0, 1], "dst": [1, 0]})
    assert {r["v"] for r in
            circuit_candidates(edges_df(spark, pdf), 3).collect()} == {0, 1}


def test_k_below_two_empty(spark):
    pdf = pd.DataFrame({"src": [0, 1], "dst": [1, 0]})
    assert circuit_candidates(edges_df(spark, pdf), 1).count() == 0


@pytest.mark.parametrize("seed", range(3))
def test_prefilter_preserves_cycles(spark, seed):
    pdf = uniform_digraph(15, 40, reciprocity=0.3, seed=seed)
    g0 = CSRGraph.from_edges(pdf)
    filtered = prefilter_edges(edges_df(spark, pdf), 5).toPandas()
    g1 = CSRGraph.from_edges(filtered) if len(filtered) else None
    before = {tuple(g0.to_labels(list(c)))
              for c in all_simple_cycles(g0, 2, 5)}
    after = ({tuple(g1.to_labels(list(c)))
              for c in all_simple_cycles(g1, 2, 5)} if g1 else set())
    assert before == after
