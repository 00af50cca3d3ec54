"""Vectorized bulk BFS masks: exactness vs per-pair brute distances and
cycle-set preservation of the edge restriction."""
import numpy as np
import pytest

from repro.core.brute import all_simple_cycles
from repro.graph.bulk_bfs import restrict_to_short_walk_edges, short_walk_masks
from repro.graph.csr import CSRGraph
from repro.graphgen.models import powerlaw_digraph, uniform_digraph


def bfs_dist(g, root):
    dist = np.full(g.n, -1)
    q = [root]
    dist[root] = 0
    head = 0
    while head < len(q):
        u = q[head]; head += 1
        for w in g.out_neighbors(u):
            w = int(w)
            if dist[w] == -1:
                dist[w] = dist[u] + 1
                q.append(w)
    return dist


@pytest.mark.parametrize("seed", range(10))
@pytest.mark.parametrize("k", [3, 5])
def test_edge_mask_exact(seed, k):
    g = CSRGraph.from_edges(uniform_digraph(15, 50, reciprocity=0.3,
                                            seed=seed))
    if g.n == 0:
        return
    edge_mask, vertex_mask = short_walk_masks(g, k)
    ea = g.edge_array()
    for eid, (u, v) in enumerate(ea):
        d = bfs_dist(g, int(v))  # dist from head back to tail
        expect = 0 < d[int(u)] <= k - 1 if d[int(u)] != -1 else False
        # note dist(v,u)=0 impossible for u!=v; -1 = unreachable
        assert edge_mask[eid] == (d[int(u)] != -1 and d[int(u)] <= k - 1), \
            (eid, u, v)
    for v in range(g.n):
        expect_v = any(edge_mask[eid] for eid, (_, h) in enumerate(ea)
                       if h == v)
        assert vertex_mask[v] == expect_v


@pytest.mark.parametrize("seed", range(10))
@pytest.mark.parametrize("k", [3, 4, 5])
def test_restriction_preserves_cycles(seed, k):
    g = CSRGraph.from_edges(powerlaw_digraph(14, 56, reciprocity=0.4,
                                             seed=seed))
    if g.n == 0:
        return
    before = {tuple(g.to_labels(list(c))) for c in all_simple_cycles(g, 2, k)}
    gr = restrict_to_short_walk_edges(g, k)
    after = ({tuple(gr.to_labels(list(c)))
              for c in all_simple_cycles(gr, 2, k)} if gr.n else set())
    assert before == after


def test_empty_and_trivial():
    g = CSRGraph.from_edges(np.zeros((0, 2)))
    em, vm = short_walk_masks(g, 5)
    assert em.size == 0 and vm.size == 0
    g2 = CSRGraph.from_edges(np.array([[0, 1]]))
    em2, vm2 = short_walk_masks(g2, 5)
    assert not em2.any() and not vm2.any()


def test_pure_cycle_fully_kept():
    g = CSRGraph.from_edges(np.array([[0, 1], [1, 2], [2, 0]]))
    em, vm = short_walk_masks(g, 3)
    assert em.all() and vm.all()
    em2, vm2 = short_walk_masks(g, 2)
    assert not em2.any()
