"""BFS filter (Algorithm 11): sound may-analysis, Fig-4 imprecision."""
import numpy as np
import pytest

from repro.core.bfs_filter import bfs_filter
from repro.core.brute import vertex_on_cycle
from repro.core.engine import OpBudget, Workspace
from repro.graph.csr import CSRGraph
from repro.graphgen.models import uniform_digraph


@pytest.mark.parametrize("seed", range(15))
@pytest.mark.parametrize("k", [3, 4, 5])
def test_never_prunes_cycle_vertices(seed, k):
    g = CSRGraph.from_edges(uniform_digraph(14, 42, reciprocity=0.3,
                                            seed=seed))
    if g.n == 0:
        return
    ws = Workspace(g.n)
    act = np.ones(g.n, dtype=bool)
    for v in range(g.n):
        flagged = bfs_filter(g, v, k, act, ws, OpBudget())
        if vertex_on_cycle(g, v, 3, k):
            assert flagged, f"filter wrongly pruned cycle vertex {v}"
        if not flagged:
            # a pruned vertex must be on no closed walk at all <= k; in
            # particular on no 2..k simple cycle either
            assert not vertex_on_cycle(g, v, 2, k)


def test_figure4_imprecision_is_on_the_safe_side():
    """Closed walk <= k exists but no simple cycle <= k: the filter may
    flag (imprecise) but the exact search then rejects — never the other
    way around. Graph: a->b->c->a is too long with k=3? Build the classic
    case: v on two 2-length lobes giving a length-4 walk, no 4-cycle."""
    # walk 0->1->0->2->... : mutual pairs create walks; with k=4 and only
    # mutual edges there is a closed walk of length 2 and 4 but no simple
    # 3..4 cycle.
    g = CSRGraph.from_edges(np.array([[0, 1], [1, 0], [0, 2], [2, 0]]))
    ws = Workspace(g.n)
    assert bfs_filter(g, 0, 4, np.ones(g.n, bool), ws, OpBudget())
    assert not vertex_on_cycle(g, 0, 3, 4)


def test_active_mask_respected():
    g = CSRGraph.from_edges(np.array([[0, 1], [1, 2], [2, 0]]))
    ws = Workspace(g.n)
    act = np.ones(g.n, dtype=bool)
    assert bfs_filter(g, 0, 3, act, ws, OpBudget())
    act[1] = False
    assert not bfs_filter(g, 0, 3, act, ws, OpBudget())


def test_k_too_small():
    g = CSRGraph.from_edges(np.array([[0, 1], [1, 0]]))
    assert not bfs_filter(g, 0, 1, np.ones(g.n, bool), Workspace(g.n),
                          OpBudget())


def test_closed_walk_just_over_k_not_flagged():
    g = CSRGraph.from_edges(
        np.array([[0, 1], [1, 2], [2, 3], [3, 4], [4, 0]]))  # 5-cycle
    ws = Workspace(g.n)
    assert not bfs_filter(g, 0, 4, np.ones(g.n, bool), ws, OpBudget())
    assert bfs_filter(g, 0, 5, np.ones(g.n, bool), ws, OpBudget())
