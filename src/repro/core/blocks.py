"""Block-based node-necessary validation — the paper's Algorithms 9 & 10.

This is the BC-DFS barrier technique (Peng et al., VLDB'19) specialized to
cycle *existence*: a hop-bounded DFS from ``s`` back to ``s`` that records,
on failure at vertex ``u`` explored at depth ``d``, the certificate
``block[u] = k - d + 1`` (a valid lower bound on ``sd(u, s | S)``), which
prunes every later visit of ``u`` at depth ``>= d``. Theorem 6: each vertex
is pushed at most ``k`` times, so one validation costs ``O(k·m)``.

Because the search early-terminates on the first cycle, the UNBLOCK cascade
of Algorithm 10 is only ever invoked on the success path where the caller
immediately stops — blocks are per-search state here (the graph changes
between top-down steps), so no work is needed on success.

Correctness care beyond the pseudocode (see DESIGN.md). The block
soundness argument (Thm 5) rests on: a vertex that *can* reach ``s``
within budget is never unstacked, because its frame would have found the
cycle and terminated. The no-2-cycle rule breaks that premise in exactly
one place: a depth-1 frame ``u`` with a reciprocal edge ``u -> s`` has its
closure *skipped* (length 2 < 3), so it can fail and be unstacked even
though ``sd(u, s) = 1`` — which (a) makes the pessimistic certificate for
``u`` itself wrong, and (b) leaves *stale* certificates on every vertex
blocked during ``u``'s subtree (they were computed assuming ``u`` is
unusable). Counterexample caught by our randomized tests:
``3->10->8`` fails with ``block[8]=3`` while ``8->10->3`` exists once
``10`` leaves the stack. Deeper frames cannot skip closures (depth >= 2
closes at length >= 3), so the repair is local: when a depth-1 frame that
skipped its closure fails, set ``block[u] = 1`` and *roll back every
block recorded during its subtree exploration*. ``allow_two_cycles=True``
never skips closures and needs no rollback (the classic theorem applies).

The §VI-D "Modification to Cycle Cover without Constraints" is the
``k=None`` path: blocks degenerate to an INF/0 flag and the hop guards
disappear (Johnson-style blocking, existence-only).
"""
from __future__ import annotations

import sys

import numpy as np

from .engine import OpBudget, Workspace

_INF = np.iinfo(np.int64).max // 4


def node_necessary(g, s: int, k: int | None, active: np.ndarray,
                   ws: Workspace, budget: OpBudget, *,
                   allow_two_cycles: bool = False) -> list[int] | None:
    """Return a constrained simple cycle through ``s`` or ``None``.

    ``active`` masks the usable vertices; ``s`` is always usable. ``k=None``
    runs the unconstrained variant (any length >= min_len).
    """
    min_len = 2 if allow_two_cycles else 3
    unconstrained = k is None
    if not unconstrained and k < min_len:
        return None
    kk = k if not unconstrained else 0  # only read when constrained
    epoch = ws.new_epoch()
    block = ws.block
    stamp = ws.block_stamp
    in_stack = ws.in_stack
    path = [s]
    in_stack[s] = True
    found: list[int] | None = None
    block_log: list[int] = []  # vertices whose block was set, in set order

    if unconstrained:
        # recursion depth can reach n; kernels only use this path on
        # moderate graphs (tests / small components)
        need = g.n + 100
        if sys.getrecursionlimit() < need:
            sys.setrecursionlimit(need)

    def dfs(u: int, depth: int) -> bool:
        nonlocal found
        skipped_short_closure = False
        log_mark = len(block_log)
        nbrs = g.out_neighbors(u)
        budget.spend(len(nbrs))
        for w in nbrs:
            w = int(w)
            if w == s:
                length = depth + 1
                if (not unconstrained) and length > kk:
                    continue
                if length >= min_len:
                    found = list(path)
                    return True
                skipped_short_closure = True
                continue
            if not active[w] or in_stack[w]:
                continue
            if not unconstrained and depth + 1 > kk - 1:
                continue
            b = block[w] if stamp[w] == epoch else 0
            if unconstrained:
                if b >= _INF:
                    continue
            elif depth + 1 + b > kk:
                continue
            in_stack[w] = True
            path.append(w)
            if dfs(w, depth + 1):
                return True
            path.pop()
            in_stack[w] = False
        # Failure certificate for u at this depth.
        if skipped_short_closure:
            # u -> s exists but the 2-cycle closure was disallowed: u was
            # genuinely able to reach s, so every certificate recorded
            # while u sat on the stack may be stale — roll them back.
            for x in block_log[log_mark:]:
                stamp[x] = 0
            del block_log[log_mark:]
            b_new = 1  # sd(u, s | S) == 1: never prune on it
        elif unconstrained:
            b_new = _INF
        else:
            b_new = kk - depth + 1
        prev = block[u] if stamp[u] == epoch else 0
        if b_new > prev:
            block[u] = b_new
            stamp[u] = epoch
            block_log.append(u)
        return False

    try:
        dfs(s, 0)
    finally:
        for v in path:
            in_stack[v] = False
    return found
