"""Tests for structural triple generation."""
import numpy as np
import pytest

from repro.kgdata.graphgen import GraphConfig, core_edges, side_triples


@pytest.fixture(scope="module")
def core():
    return core_edges(300, 660, 12, seed=3)


def test_core_shape(core):
    assert list(core.columns) == ["h", "t", "r"]
    # The 1.3x overdraw absorbs dedupe losses: within 5 % of target.
    assert 0.95 * 660 <= len(core) <= 660
    assert core.h.between(0, 299).all() and core.t.between(0, 299).all()
    assert core.r.between(0, 11).all()


def test_core_no_self_loops_or_dups(core):
    assert (core.h != core.t).all()
    assert not core.duplicated(["h", "t"]).any()


def test_core_powerlaw_degrees(core):
    deg = np.bincount(np.concatenate([core.h, core.t]), minlength=300)
    assert deg.max() > 5 * max(1, np.median(deg))


def test_side_respects_budget(core):
    tri = side_triples(core, GraphConfig(950, 12, 0.85), 300, 0, seed=4)
    assert abs(len(tri) - 950) < 150  # dedupe/self-loop removal slack


def test_side_relation_vocab(core):
    tri = side_triples(core, GraphConfig(900, 9, 0.6), 300, 0, seed=5)
    assert tri.r.between(0, 8).all()


def test_no_isolated_entities(core):
    tri = side_triples(core, GraphConfig(900, 9, 0.6), 300, 60, seed=6)
    present = np.unique(np.concatenate([tri.h, tri.t]))
    assert set(present) == set(range(360))


def test_unknowns_link_to_aligned(core):
    tri = side_triples(core, GraphConfig(1200, 9, 0.6), 300, 60, min_unknown_links=5, seed=7)
    known = set(range(300))
    for u in range(300, 360):
        nbrs = set(tri.t[tri.h == u]) | set(tri.h[tri.t == u])
        assert len(nbrs & known) >= 5, f"unknown {u} has too few aligned neighbours"


def test_heterogeneity_between_sides(core):
    a = side_triples(core, GraphConfig(900, 9, 0.85), 300, 0, seed=8)
    b = side_triples(core, GraphConfig(900, 9, 0.55), 300, 0, seed=9)
    ea = set(map(tuple, a[["h", "t"]].to_numpy()))
    eb = set(map(tuple, b[["h", "t"]].to_numpy()))
    jacc = len(ea & eb) / len(ea | eb)
    assert 0.05 < jacc < 0.8  # share the core skeleton but differ


def test_deterministic(core):
    a = side_triples(core, GraphConfig(900, 9, 0.7), 300, 30, seed=11)
    b = side_triples(core, GraphConfig(900, 9, 0.7), 300, 30, seed=11)
    assert a.equals(b)
