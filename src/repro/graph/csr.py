"""Compressed-sparse-row adjacency for the sequential search kernels.

The distributed layer hands components to executors as pandas edge frames;
:class:`CSRGraph` is the in-process representation those kernels run on.
Vertices are relabelled to ``0..n-1``; ``vertex_ids`` maps back to the
original labels so covers can be re-joined to the Spark world.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd


@dataclass
class CSRGraph:
    """Directed graph in CSR form, both orientations.

    ``indptr_out[v]:indptr_out[v+1]`` slices ``indices_out`` to the
    out-neighbors of ``v`` (sorted); likewise for the in-direction.
    """

    n: int
    m: int
    indptr_out: np.ndarray
    indices_out: np.ndarray
    indptr_in: np.ndarray
    indices_in: np.ndarray
    vertex_ids: np.ndarray  # local index -> original label

    @classmethod
    def from_edges(cls, edges) -> "CSRGraph":
        """Build from an ``(m, 2)`` array / DataFrame of ``src, dst`` labels.

        Deduplicates edges and drops self-loops (the paper's problem
        statement excludes self-loops outright).
        """
        if isinstance(edges, pd.DataFrame):
            arr = edges[["src", "dst"]].to_numpy(dtype=np.int64, copy=True)
        else:
            arr = np.asarray(edges, dtype=np.int64).reshape(-1, 2)
        if arr.size == 0:
            return cls(0, 0, *(np.zeros(1, np.int64),) * 1,
                       np.zeros(0, np.int64), np.zeros(1, np.int64),
                       np.zeros(0, np.int64), np.zeros(0, np.int64))
        arr = arr[arr[:, 0] != arr[:, 1]]
        labels = np.unique(arr)
        n = len(labels)
        src = np.searchsorted(labels, arr[:, 0])
        dst = np.searchsorted(labels, arr[:, 1])
        # dedup on the relabelled pairs
        key = src.astype(np.int64) * n + dst
        _, keep = np.unique(key, return_index=True)
        src, dst = src[keep], dst[keep]
        m = len(src)

        def _csr(a: np.ndarray, b: np.ndarray):
            order = np.lexsort((b, a))
            a_s, b_s = a[order], b[order]
            indptr = np.zeros(n + 1, dtype=np.int64)
            np.add.at(indptr, a_s + 1, 1)
            np.cumsum(indptr, out=indptr)
            return indptr, b_s.astype(np.int64)

        indptr_out, indices_out = _csr(src, dst)
        indptr_in, indices_in = _csr(dst, src)
        return cls(n, m, indptr_out, indices_out, indptr_in, indices_in,
                   labels)

    # -- accessors ---------------------------------------------------------
    def out_neighbors(self, v: int) -> np.ndarray:
        return self.indices_out[self.indptr_out[v]:self.indptr_out[v + 1]]

    def in_neighbors(self, v: int) -> np.ndarray:
        return self.indices_in[self.indptr_in[v]:self.indptr_in[v + 1]]

    def out_degrees(self) -> np.ndarray:
        return np.diff(self.indptr_out)

    def in_degrees(self) -> np.ndarray:
        return np.diff(self.indptr_in)

    def total_degrees(self) -> np.ndarray:
        return self.out_degrees() + self.in_degrees()

    def has_edge(self, u: int, v: int) -> bool:
        nb = self.out_neighbors(u)
        i = np.searchsorted(nb, v)
        return i < len(nb) and nb[i] == v

    def edge_array(self) -> np.ndarray:
        """Return the ``(m, 2)`` local-index edge list in CSR order."""
        src = np.repeat(np.arange(self.n), self.out_degrees())
        return np.column_stack([src, self.indices_out])

    def to_labels(self, local: np.ndarray | list) -> np.ndarray:
        return self.vertex_ids[np.asarray(local, dtype=np.int64)]
