"""FindCycle — the paper's Algorithm 5.

A plain hop-bounded DFS that returns one constrained simple cycle through
the start vertex, or ``None``. No pruning beyond the hop budget and the
simple-path constraint: this is deliberately the *unaccelerated* search
that makes BUR/BUR+ (and plain TDB) slow, which the Top-Down block and
BFS-filter techniques then beat. Worst case ``O(n^k)`` as analyzed in §V.
"""
from __future__ import annotations

import numpy as np

from .engine import OpBudget, Workspace


def find_cycle(g, s: int, k: int, active: np.ndarray, ws: Workspace,
               budget: OpBudget, *, allow_two_cycles: bool = False
               ) -> list[int] | None:
    """Find one simple cycle through ``s`` of length ``min_len..k``.

    ``active`` masks the usable vertices (the reduced graph ``G - R``); the
    start vertex is always usable regardless of its mask bit, which is how
    both Algorithm 4 (start alive) and Algorithm 7 (start re-activated)
    call it. Returns the cycle's vertex list (no repeated endpoint).
    """
    min_len = 2 if allow_two_cycles else 3
    if k < min_len:
        return None
    in_stack = ws.in_stack
    path = [s]
    in_stack[s] = True
    found: list[int] | None = None

    def dfs(u: int, depth: int) -> bool:
        nonlocal found
        nbrs = g.out_neighbors(u)
        budget.spend(len(nbrs))
        for w in nbrs:
            w = int(w)
            if w == s:
                if min_len <= depth + 1 <= k:
                    found = list(path)
                    return True
                continue
            if not active[w] or in_stack[w] or depth + 1 > k - 1:
                continue
            in_stack[w] = True
            path.append(w)
            if dfs(w, depth + 1):
                return True
            path.pop()
            in_stack[w] = False
        return False

    try:
        dfs(s, 0)
    finally:
        # restore the workspace whether we found a cycle, failed, or the
        # budget blew mid-search
        for v in path:
            in_stack[v] = False
    return found
