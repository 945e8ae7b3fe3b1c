"""Tests for tokenisation, HashBert, and MinHash-LSH."""
import numpy as np
import pytest

from repro.text.hashbert import HashBert
from repro.text.minhash import band_hashes, estimated_jaccard, signature, signatures
from repro.text.tokenize import shingles, tokens


# ------------------------------------------------------------- tokenize
def test_tokens_basic():
    assert tokens("Alpha Beta") == ["alpha", "beta"]
    assert tokens("") == []


def test_shingles_basic():
    assert shingles("abcd") == {"abc", "bcd"}
    assert shingles("ab") == {"ab"}
    assert shingles("") == set()


def test_shingles_collapse_spaces():
    assert shingles("a  b") == shingles("a b")


# ------------------------------------------------------------- hashbert
@pytest.fixture(scope="module")
def hb():
    lex = {
        "en": {"cat": 0, "house": 1, "blue": 2},
        "fr": {"chat": 0, "maison": 1, "bleu": 2},
    }
    return HashBert(lex, dim=32, sem_noise=0.1, seed=1)


def test_translated_tokens_embed_close(hb):
    en = hb.token_vector("en", "cat")
    fr = hb.token_vector("fr", "chat")
    other = hb.token_vector("fr", "maison")
    assert np.linalg.norm(en - fr) < np.linalg.norm(en - other)


def test_translated_names_more_similar_than_random(hb):
    a = hb.encode("en", "blue house")
    b = hb.encode("fr", "bleu maison")
    c = hb.encode("fr", "chat")
    assert a @ b > a @ c


def test_out_of_lexicon_string_similarity(hb):
    """Unknown but string-similar words embed near each other."""
    v1 = hb.token_vector("en", "zephyrion")
    v2 = hb.token_vector("en", "zephyrios")
    v3 = hb.token_vector("en", "quagmire")
    cos = lambda a, b: a @ b / (np.linalg.norm(a) * np.linalg.norm(b))  # noqa: E731
    assert cos(v1, v2) > cos(v1, v3)


def test_encode_normalised(hb):
    v = hb.encode("en", "cat house")
    assert np.linalg.norm(v) == pytest.approx(1.0, abs=1e-6)


def test_encode_empty(hb):
    assert (hb.encode("en", "") == 0).all()


def test_encode_batch_matches_single(hb):
    batch = hb.encode_batch("en", ["cat", "house"])
    assert np.allclose(batch[0], hb.encode("en", "cat"))


def test_token_matrix_shape(hb):
    m = hb.token_matrix("en", "cat blue house")
    assert m.shape == (3, 32)
    assert np.allclose(np.linalg.norm(m, axis=1), 1.0)


def test_deterministic_across_instances():
    lex = {"en": {"a": 0}}
    v1 = HashBert(lex, dim=16, seed=5).encode("en", "a b")
    v2 = HashBert(lex, dim=16, seed=5).encode("en", "a b")
    assert np.allclose(v1, v2)


# -------------------------------------------------------------- minhash
def test_signature_deterministic():
    assert (signature("hello world") == signature("hello world")).all()


def test_signatures_batch_matches_single():
    batch = signatures(["abc", "xyz"], 16)
    assert (batch[0] == signature("abc", 16)).all()
    assert (batch[1] == signature("xyz", 16)).all()


def test_estimated_jaccard_identical():
    s = signature("entity name")
    assert estimated_jaccard(s, s) == 1.0


def test_estimated_jaccard_tracks_truth():
    """MinHash estimate lands near the exact shingle Jaccard."""
    a, b = "abcdefghij", "abcdefghiz"
    sa, sb = shingles(a), shingles(b)
    exact = len(sa & sb) / len(sa | sb)
    est = estimated_jaccard(signature(a, 128), signature(b, 128))
    assert abs(est - exact) < 0.2


def test_band_hashes_count_and_collision():
    s1, s2 = signature("identical"), signature("identical")
    b1, b2 = band_hashes(s1, 8), band_hashes(s2, 8)
    assert len(b1) == 8
    assert b1 == b2


def test_band_divisibility_checked():
    with pytest.raises(ValueError):
        band_hashes(signature("x", 30), 8)


def test_dissimilar_names_do_not_collide():
    b1 = set(band_hashes(signature("completely different"), 8))
    b2 = set(band_hashes(signature("zzz qqq www"), 8))
    assert not (b1 & b2)
