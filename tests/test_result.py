"""CoverResult record."""
import numpy as np

from repro.core.result import CoverResult


def make(cov):
    return CoverResult(algorithm="TDB++", k=5, cover=np.array(cov),
                       seconds=0.5, ops=123)


def test_size_and_set():
    r = make([3, 1, 2])
    assert r.size == 3
    assert r.cover_set() == {1, 2, 3}


def test_defaults():
    r = make([])
    assert r.finished and not r.allow_two_cycles
    assert r.extra == {}


def test_extra_is_per_instance():
    a, b = make([]), make([])
    a.extra["x"] = 1
    assert "x" not in b.extra
