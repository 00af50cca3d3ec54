"""Theorem 2's reduction, validated by brute force: opt VC == opt HCCC."""
import pytest

from repro.core.brute import all_simple_cycles, optimal_cover_size
from repro.core.theory import optimal_vertex_cover_size, reduce_vertex_cover
from repro.graph.csr import CSRGraph

CASES = {
    "single_edge": [(0, 1)],
    "path3": [(0, 1), (1, 2)],
    "triangle": [(0, 1), (1, 2), (0, 2)],
    "star": [(0, 1), (0, 2), (0, 3)],
    "two_disjoint": [(0, 1), (2, 3)],
    "square": [(0, 1), (1, 2), (2, 3), (3, 0)],
    "paw": [(0, 1), (1, 2), (0, 2), (2, 3)],
}


@pytest.mark.parametrize("name", list(CASES))
def test_reduction_preserves_optimum(name):
    ug = CASES[name]
    directed, virtual = reduce_vertex_cover(ug)
    g = CSRGraph.from_edges(directed)
    cycles_local = all_simple_cycles(g, 3, 3)
    # map back to labels for clarity
    opt_hccc = optimal_cover_size(cycles_local, list(range(g.n)))
    opt_vc = optimal_vertex_cover_size(ug)
    assert opt_hccc == opt_vc, name


def test_gadget_shape():
    directed, virtual = reduce_vertex_cover([(0, 1)])
    assert len(virtual) == 1
    w = virtual[(0, 1)]
    assert w == 2
    s = {tuple(e) for e in directed.tolist()}
    assert s == {(0, 1), (1, 0), (0, w), (w, 0), (1, w), (w, 1)}


def test_duplicate_edges_collapsed():
    directed, virtual = reduce_vertex_cover([(0, 1), (1, 0), (0, 1)])
    assert len(virtual) == 1


def test_only_triangle_cycles_exist():
    directed, _ = reduce_vertex_cover(CASES["path3"])
    g = CSRGraph.from_edges(directed)
    for c in all_simple_cycles(g, 3, 6):
        assert len(c) == 3


def test_empty_instance():
    directed, virtual = reduce_vertex_cover([])
    assert directed.shape == (0, 2) and virtual == {}
    assert optimal_vertex_cover_size([]) == 0
