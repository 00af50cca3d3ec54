"""Theorem 2's NP-hardness reduction, executable.

Vertex Cover on an undirected graph reduces to hop-constrained cycle
cover with ``k = 3``: every undirected edge {u, v} becomes the mutual pair
``u <-> v`` plus a fresh virtual vertex ``w_uv`` with mutual pairs to both
endpoints. The only 3-cycles are the two orientations of each triangle
``(u, v, w_uv)``, 2-cycles are excluded by the problem definition, and any
optimal cover may swap ``w_uv`` for ``u`` (dominance), so
``opt_VC(G) == opt_HCCC(reduce(G), k=3)``. Tests validate the equality by
brute force on small instances.
"""
from __future__ import annotations

from itertools import combinations

import numpy as np


def reduce_vertex_cover(undirected_edges: list[tuple[int, int]]
                        ) -> tuple[np.ndarray, dict[tuple[int, int], int]]:
    """Build the directed HCCC instance for a VC instance.

    Returns ``(directed_edges, virtual)`` where ``virtual[(u, v)]`` is the
    id of the virtual vertex added for edge {u, v}. Virtual ids start
    above the maximum original vertex id.
    """
    if not undirected_edges:
        return np.zeros((0, 2), dtype=np.int64), {}
    next_id = max(max(u, v) for u, v in undirected_edges) + 1
    out: list[tuple[int, int]] = []
    virtual: dict[tuple[int, int], int] = {}
    for u, v in undirected_edges:
        a, b = (u, v) if u < v else (v, u)
        if (a, b) in virtual:
            continue
        w = next_id
        next_id += 1
        virtual[(a, b)] = w
        out += [(a, b), (b, a), (a, w), (w, a), (b, w), (w, b)]
    return np.asarray(out, dtype=np.int64), virtual


def optimal_vertex_cover_size(undirected_edges: list[tuple[int, int]]) -> int:
    """Brute-force minimum vertex cover size (tiny instances only)."""
    edges = {tuple(sorted(e)) for e in undirected_edges}
    verts = sorted({v for e in edges for v in e})
    for size in range(0, len(verts) + 1):
        for cand in combinations(verts, size):
            c = set(cand)
            if all(u in c or v in c for u, v in edges):
                return size
    return 0
