"""Minimal pruning (Algorithm 7) and BUR+ (Theorem 4 properties)."""
import numpy as np
import pytest

from repro.core.bottom_up import bottom_up
from repro.core.minimal import bur_plus, find_minimal_cover
from repro.core.verify import check_feasible, check_minimal
from repro.graph.csr import CSRGraph
from repro.graphgen.models import powerlaw_digraph, uniform_digraph


@pytest.mark.parametrize("seed", range(12))
@pytest.mark.parametrize("k", [3, 4, 5])
@pytest.mark.parametrize("allow2", [False, True])
def test_feasible_and_minimal(seed, k, allow2):
    g = CSRGraph.from_edges(uniform_digraph(14, 45, reciprocity=0.4,
                                            seed=seed))
    if g.n == 0:
        return
    res = bur_plus(g, k, allow_two_cycles=allow2)
    assert res.finished
    ok, wit = check_feasible(g, res.cover, k, allow_two_cycles=allow2)
    assert ok, wit
    okm, red = check_minimal(g, res.cover, k, allow_two_cycles=allow2)
    assert okm, red


@pytest.mark.parametrize("seed", range(8))
def test_subset_of_bur(seed):
    g = CSRGraph.from_edges(powerlaw_digraph(18, 70, reciprocity=0.3,
                                             seed=seed))
    if g.n == 0:
        return
    assert bur_plus(g, 5).cover_set() <= bottom_up(g, 5).cover_set()


def test_prune_removes_redundant_vertex():
    # triangle + an extra vertex injected into the cover by hand
    g = CSRGraph.from_edges(np.array([[0, 1], [1, 2], [2, 0], [2, 3],
                                      [3, 0]]))
    # cover {0, 3}: 3 is redundant (0 already covers both cycles)
    kept = find_minimal_cover(g, 4, [0, 3])
    assert kept == [0]


def test_prune_keeps_needed_vertices():
    # two disjoint triangles: both cover vertices needed
    g = CSRGraph.from_edges(np.array([[0, 1], [1, 2], [2, 0],
                                      [10, 11], [11, 12], [12, 10]]))
    idx = {int(l): i for i, l in enumerate(g.vertex_ids)}
    kept = find_minimal_cover(g, 3, [idx[0], idx[10]])
    assert sorted(kept) == sorted([idx[0], idx[10]])


def test_pre_prune_size_recorded():
    g = CSRGraph.from_edges(powerlaw_digraph(20, 80, reciprocity=0.3,
                                             seed=1))
    res = bur_plus(g, 4)
    assert res.extra["pre_prune_size"] >= res.size
