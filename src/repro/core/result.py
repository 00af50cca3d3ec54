"""Result record shared by all cover algorithms and the table harnesses."""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


@dataclass
class CoverResult:
    """Outcome of one cover computation.

    ``cover`` holds *original vertex labels* (not CSR-local indices) so
    results from per-component kernels can be unioned and re-joined in
    Spark. ``ops`` is the kernel's edge-traversal count — the
    deterministic cost measure used alongside wall-clock seconds.
    """

    algorithm: str
    k: int | None
    cover: np.ndarray
    seconds: float
    ops: int
    allow_two_cycles: bool = False
    finished: bool = True
    extra: dict = field(default_factory=dict)

    @property
    def size(self) -> int:
        return len(self.cover)

    def cover_set(self) -> set[int]:
        return set(int(v) for v in self.cover)
