"""DARC / DARC-DV (Algorithms 1-3 on the implicit line graph)."""
import numpy as np
import pytest

from repro.core.brute import all_simple_cycles, is_cover
from repro.core.darc import darc_dv
from repro.core.engine import OpBudget
from repro.core.verify import check_feasible
from repro.graph.csr import CSRGraph
from repro.graphgen.models import powerlaw_digraph, uniform_digraph


def local_cover(g, res):
    idx = {int(l): i for i, l in enumerate(g.vertex_ids)}
    return {idx[int(v)] for v in res.cover}


@pytest.mark.parametrize("seed", range(12))
@pytest.mark.parametrize("k", [3, 4, 5])
@pytest.mark.parametrize("allow2", [False, True])
def test_feasible_on_random(seed, k, allow2):
    g = CSRGraph.from_edges(uniform_digraph(13, 40, reciprocity=0.4,
                                            seed=seed))
    if g.n == 0:
        return
    res = darc_dv(g, k, allow_two_cycles=allow2)
    assert res.finished
    lo = 2 if allow2 else 3
    assert is_cover(all_simple_cycles(g, lo, k), local_cover(g, res))
    ok, wit = check_feasible(g, res.cover, k, allow_two_cycles=allow2)
    assert ok, wit


@pytest.mark.parametrize("seed", range(10))
@pytest.mark.parametrize("k", [3, 4, 5])
def test_blocked_equals_plain(seed, k):
    """Block pruning must not change the result, only the work."""
    g = CSRGraph.from_edges(powerlaw_digraph(14, 50, reciprocity=0.5,
                                             seed=seed))
    if g.n == 0:
        return
    a = darc_dv(g, k, blocked=True)
    b = darc_dv(g, k, blocked=False)
    assert a.cover_set() == b.cover_set()
    assert a.ops <= b.ops  # pruning never does more work


def test_triangle_single_vertex():
    g = CSRGraph.from_edges(np.array([[0, 1], [1, 2], [2, 0]]))
    res = darc_dv(g, 3)
    assert res.size == 1


def test_acyclic_empty():
    g = CSRGraph.from_edges(np.array([[0, 1], [1, 2], [0, 2]]))
    assert darc_dv(g, 5).size == 0


def test_two_cycles_not_covered_by_default():
    g = CSRGraph.from_edges(np.array([[0, 1], [1, 0]]))
    assert darc_dv(g, 5).size == 0
    assert darc_dv(g, 5, allow_two_cycles=True).size >= 1


def test_k_too_small():
    g = CSRGraph.from_edges(np.array([[0, 1], [1, 2], [2, 0]]))
    assert darc_dv(g, 2).size == 0


def test_budget_dnf_flagged():
    g = CSRGraph.from_edges(powerlaw_digraph(40, 200, reciprocity=0.3,
                                             seed=2))
    res = darc_dv(g, 5, budget=OpBudget(100))
    assert not res.finished


def test_figure_eight_covers_both_lobes():
    g = CSRGraph.from_edges(np.array([[0, 1], [1, 2], [2, 0],
                                      [0, 3], [3, 4], [4, 0]]))
    res = darc_dv(g, 3)
    cov = local_cover(g, res)
    assert is_cover(all_simple_cycles(g, 3, 3), cov)
