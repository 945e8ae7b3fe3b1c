"""Tests for entity-name generation and translation noise."""
import numpy as np
import pytest

from repro.kgdata.names import (
    NameNoise,
    generate_pair_names,
    generate_unknown_names,
    sample_name_concepts,
    translate_concepts,
)
from repro.kgdata.vocab import build_vocab


@pytest.fixture(scope="module")
def vocab():
    return build_vocab(200, ("en", "fr"), seed=5)


def test_sample_lengths():
    rng = np.random.default_rng(0)
    lens = [len(sample_name_concepts(rng, 100)) for _ in range(200)]
    assert set(lens) <= {1, 2, 3, 4}
    assert min(lens) == 1 and max(lens) == 4


def test_sample_zipfian_repeats():
    rng = np.random.default_rng(1)
    all_ids = np.concatenate([sample_name_concepts(rng, 500) for _ in range(300)])
    # A zipfian distribution reuses head words heavily.
    _, counts = np.unique(all_ids, return_counts=True)
    assert counts.max() > 5 * counts.mean()


def test_translate_noise_free_identity():
    rng = np.random.default_rng(2)
    c = np.array([3, 1, 4])
    out = translate_concepts(c, rng, 100, NameNoise(0, 0, 0))
    assert (out == c).all()


def test_translate_alias_replaces_everything():
    rng = np.random.default_rng(3)
    c = np.array([3, 1, 4, 1])
    out = translate_concepts(c, rng, 100, NameNoise(0, 0, 1.0))
    assert not np.array_equal(out, c)


def test_pair_names_counts_and_determinism(vocab):
    s1, t1 = generate_pair_names(vocab, 40, noise=NameNoise(), seed=8)
    s2, t2 = generate_pair_names(vocab, 40, noise=NameNoise(), seed=8)
    assert len(s1) == len(t1) == 40
    assert s1 == s2 and t1 == t2


def test_pair_names_mostly_parallel(vocab):
    """With zero noise, translations must be word-concept-parallel."""
    s, t = generate_pair_names(vocab, 60, noise=NameNoise(0, 0, 0), seed=9)
    lex_en, lex_fr = vocab.lexicons["en"], vocab.lexicons["fr"]
    for ns, nt in zip(s, t):
        cs = [lex_en[w] for w in ns.split()]
        ct = [lex_fr[w] for w in nt.split()]
        assert cs == ct


def test_unknown_names(vocab):
    names = generate_unknown_names(vocab, "fr", 25, seed=10)
    assert len(names) == 25
    lex = vocab.lexicons["fr"]
    for n in names:
        assert all(w in lex for w in n.split())
