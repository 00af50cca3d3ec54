"""Synthetic graph models and the Table II dataset registry."""
import numpy as np
import pytest

from repro.graph.csr import CSRGraph
from repro.graph.tarjan import tarjan_scc
from repro.graphgen.models import (hierarchical_digraph, powerlaw_digraph,
                                   uniform_digraph)
from repro.graphgen.registry import DATASETS, LARGE, SMALL, generate


@pytest.mark.parametrize("gen", [uniform_digraph, powerlaw_digraph])
def test_deterministic(gen):
    a = gen(50, 200, reciprocity=0.3, seed=11)
    b = gen(50, 200, reciprocity=0.3, seed=11)
    assert a.equals(b)
    c = gen(50, 200, reciprocity=0.3, seed=12)
    assert not a.equals(c)


@pytest.mark.parametrize("gen", [uniform_digraph, powerlaw_digraph])
def test_normal_form(gen):
    df = gen(60, 300, reciprocity=0.4, seed=2)
    assert (df.src != df.dst).all()
    assert not df.duplicated(["src", "dst"]).any()
    assert df.src.max() < 60 and df.dst.max() < 60


@pytest.mark.parametrize("gen", [uniform_digraph, powerlaw_digraph])
def test_edge_count_near_target(gen):
    df = gen(100, 800, seed=5)
    assert 0.8 * 800 <= len(df) <= 1.1 * 800


def test_reciprocity_knob():
    def rec(df):
        s = {(a, b) for a, b in df.to_numpy()}
        return sum((b, a) in s for a, b in s) / len(s)
    lo = rec(powerlaw_digraph(150, 900, reciprocity=0.0, seed=3))
    hi = rec(powerlaw_digraph(150, 900, reciprocity=0.6, seed=3))
    assert hi > lo + 0.2


def test_powerlaw_has_hubs():
    g = CSRGraph.from_edges(powerlaw_digraph(300, 2500, gamma=2.2, seed=4))
    assert g.total_degrees().max() > 6 * g.total_degrees().mean()


def test_forward_frac_reduces_cyclicity():
    def giant_scc(df):
        g = CSRGraph.from_edges(df)
        comp = tarjan_scc(g)
        return np.bincount(comp).max() / max(g.n, 1)
    base = giant_scc(powerlaw_digraph(400, 3000, seed=6))
    dag = giant_scc(powerlaw_digraph(400, 3000, forward_frac=0.9, seed=6))
    assert dag < base


def test_hierarchical_deterministic():
    a = hierarchical_digraph(500, 4000, seed=9)
    assert a.equals(hierarchical_digraph(500, 4000, seed=9))
    assert (a.src != a.dst).all()
    assert not a.duplicated(["src", "dst"]).any()


def test_hierarchical_bulk_is_acyclic():
    """With no core edges the hierarchical model is a pure DAG."""
    df = hierarchical_digraph(1000, 12000, core_m_frac=0.0, seed=3)
    g = CSRGraph.from_edges(df)
    comp = tarjan_scc(g)
    assert np.bincount(comp).max() == 1  # all singleton SCCs


def test_hierarchical_core_brings_cycles():
    df = hierarchical_digraph(1000, 12000, core_frac=0.15,
                              core_m_frac=0.15, seed=3)
    g = CSRGraph.from_edges(df)
    comp = tarjan_scc(g)
    sizes = np.bincount(comp)
    assert sizes.max() >= 2  # cyclic region exists
    assert sizes[sizes >= 2].sum() < g.n  # but not everything


def test_registry_covers_all_16_paper_datasets():
    assert len(DATASETS) == 16
    assert len(SMALL) == 12 and len(LARGE) == 4
    assert set(LARGE) == {"FLK", "LJ", "WKP", "TW"}


def test_registry_paper_stats_present():
    for spec in DATASETS.values():
        assert spec.paper_v > 0 and spec.paper_e > 0
        assert spec.paper_davg > 0
        assert spec.tier in ("small", "large")


def test_registry_preserves_davg_ordering_small_tier():
    """The paper's average-degree ordering across the small tier must be
    preserved by the analogs (it drives relative algorithm cost)."""
    specs = [DATASETS[n] for n in SMALL]
    paper_order = [s.name for s in
                   sorted(specs, key=lambda s: -s.paper_davg)]
    analog_order = [s.name for s in
                    sorted(specs, key=lambda s: -(2 * s.m / s.n))]
    assert paper_order == analog_order


@pytest.mark.parametrize("name", list(DATASETS))
def test_registry_generates(name):
    df = generate(name)
    spec = DATASETS[name]
    assert len(df) >= 0.75 * spec.m
    assert df.src.max() < spec.n and df.dst.max() < spec.n


def test_generate_deterministic():
    assert generate("WKV").equals(generate("WKV"))


def test_unknown_model_rejected():
    import dataclasses
    spec = dataclasses.replace(DATASETS["WKV"], model="bogus")
    with pytest.raises(ValueError):
        spec.generate()
