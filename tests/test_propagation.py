"""Tests for anchor propagation and Manhattan top-k similarity."""
import numpy as np
import pandas as pd
import pytest

from repro.embedding.propagation import anchor_embeddings, anchor_vector, feature_bytes
from repro.embedding.similarity import bidirectional_topk, manhattan_topk


def _toy():
    """Two isomorphic 6-node path graphs with 2 seeds."""
    tri = pd.DataFrame({"h": [0, 1, 2, 3, 4], "r": [0, 0, 1, 1, 0], "t": [1, 2, 3, 4, 5]})
    seeds = pd.DataFrame({"src": [0, 5], "tgt": [10, 15]})
    tri_t = tri.assign(h=tri.h + 10, t=tri.t + 10)
    ents_s = np.arange(6)
    ents_t = np.arange(10, 16)
    return tri, tri_t, seeds, ents_s, ents_t


@pytest.mark.parametrize("model", ["gcn", "rrea"])
def test_isomorphic_graphs_align(model):
    tri, tri_t, seeds, es, et = _toy()
    H_s, H_t = anchor_embeddings(tri, tri_t, seeds, es, et, model=model, dim=32, seed=1)
    # Counterpart i <-> 10+i must be each entity's nearest neighbour.
    top1 = manhattan_topk(H_s, es, H_t, et, 1)
    assert (top1.tgt.to_numpy() == top1.src.to_numpy() + 10).all()


def test_seeds_clamped_identical():
    tri, tri_t, seeds, es, et = _toy()
    H_s, H_t = anchor_embeddings(tri, tri_t, seeds, es, et, model="gcn", dim=16, seed=2)
    assert np.allclose(H_s[0], H_t[0])  # pair (0, 10)
    assert np.allclose(H_s[5], H_t[5])  # pair (5, 15)


def test_anchor_vector_unit_norm_and_deterministic():
    v1 = anchor_vector(42, 64, 0)
    v2 = anchor_vector(42, 64, 0)
    assert np.allclose(v1, v2)
    assert np.linalg.norm(v1) == pytest.approx(1.0)
    assert not np.allclose(v1, anchor_vector(43, 64, 0))


def test_rrea_differs_from_gcn():
    tri, tri_t, seeds, es, et = _toy()
    Hg, _ = anchor_embeddings(tri, tri_t, seeds, es, et, model="gcn", dim=16, seed=3)
    Hr, _ = anchor_embeddings(tri, tri_t, seeds, es, et, model="rrea", dim=16, seed=3)
    assert not np.allclose(Hg, Hr)


def test_init_changes_output():
    tri, tri_t, seeds, es, et = _toy()
    init = np.random.default_rng(0).standard_normal((6, 16))
    H0, _ = anchor_embeddings(tri, tri_t, seeds, es, et, model="gcn", dim=16, seed=4)
    H1, _ = anchor_embeddings(
        tri, tri_t, seeds, es, et, model="gcn", dim=16, seed=4, init_s=init, init_t=init
    )
    assert not np.allclose(H0, H1)


def test_unknown_model_rejected():
    tri, tri_t, seeds, es, et = _toy()
    with pytest.raises(ValueError):
        anchor_embeddings(tri, tri_t, seeds, es, et, model="bogus")


def test_feature_bytes_monotone():
    assert feature_bytes(100, 64, 2) < feature_bytes(1000, 64, 2)
    assert feature_bytes(100, 64, 2) < feature_bytes(100, 128, 2)


# ------------------------------------------------------------ similarity
def test_manhattan_topk_exact():
    A = np.array([[0.0, 0.0], [1.0, 1.0]])
    B = np.array([[0.0, 0.1], [5.0, 5.0], [1.0, 0.9]])
    out = manhattan_topk(A, np.array([100, 101]), B, np.array([200, 201, 202]), 1)
    assert dict(zip(out.src, out.tgt)) == {100: 200, 101: 202}
    assert out.score.max() == pytest.approx(-0.1)


def test_manhattan_topk_k_clipped():
    A = np.zeros((2, 3))
    B = np.zeros((2, 3))
    out = manhattan_topk(A, np.arange(2), B, np.arange(2), 10)
    assert len(out) == 4  # k clipped to |B| = 2


def test_manhattan_topk_empty():
    out = manhattan_topk(np.zeros((0, 3)), np.array([]), np.zeros((2, 3)), np.arange(2), 5)
    assert out.empty


def test_manhattan_topk_chunking_consistent():
    rng = np.random.default_rng(5)
    A, B = rng.random((50, 8)), rng.random((70, 8))
    ia, ib = np.arange(50), np.arange(70)
    small = manhattan_topk(A, ia, B, ib, 3, chunk=7).sort_values(["src", "tgt"])
    big = manhattan_topk(A, ia, B, ib, 3, chunk=1000).sort_values(["src", "tgt"])
    assert np.allclose(small.score.to_numpy(), big.score.to_numpy())
    assert (small.tgt.to_numpy() == big.tgt.to_numpy()).all()


def test_bidirectional_topk_dedupes():
    rng = np.random.default_rng(6)
    A, B = rng.random((10, 4)), rng.random((12, 4))
    out = bidirectional_topk(A, np.arange(10), B, np.arange(100, 112), 2)
    assert not out.duplicated(["src", "tgt"]).any()
    assert set(out.src) <= set(range(10))
    assert set(out.tgt) <= set(range(100, 112))
