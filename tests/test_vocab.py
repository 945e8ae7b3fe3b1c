"""Tests for the bilingual vocabulary generator."""
import numpy as np
import pytest

from repro.kgdata.vocab import build_vocab


@pytest.fixture(scope="module")
def vocab():
    return build_vocab(300, ("en", "fr"), seed=3)


def test_size_and_langs(vocab):
    assert vocab.size == 300
    assert set(vocab.surfaces) == {"en", "fr"}
    assert len(vocab.surfaces["fr"]) == 300


def test_surfaces_unique_per_language(vocab):
    for lang in ("en", "fr"):
        assert len(set(vocab.surfaces[lang])) == 300


def test_lexicon_roundtrip(vocab):
    for lang in ("en", "fr"):
        for cid in (0, 7, 299):
            assert vocab.lexicons[lang][vocab.surfaces[lang][cid]] == cid


def test_deterministic():
    a = build_vocab(50, ("en", "de"), seed=9)
    b = build_vocab(50, ("en", "de"), seed=9)
    assert a.surfaces == b.surfaces


def test_seed_changes_output():
    a = build_vocab(50, ("en", "fr"), seed=1)
    b = build_vocab(50, ("en", "fr"), seed=2)
    assert a.surfaces["en"] != b.surfaces["en"]


def test_p_light_controls_string_overlap():
    """Higher p_light -> more translations share a long common prefix."""
    def overlap_rate(v):
        hits = 0
        for e, f in zip(v.surfaces["en"], v.surfaces["fr"]):
            hits += e[:3] in f
        return hits / v.size

    hi = overlap_rate(build_vocab(400, ("en", "fr"), p_light=0.95, seed=4))
    lo = overlap_rate(build_vocab(400, ("en", "fr"), p_light=0.05, seed=4))
    assert hi > lo + 0.3


def test_render(vocab):
    name = vocab.render("en", np.array([0, 1]))
    assert name == f"{vocab.surfaces['en'][0]} {vocab.surfaces['en'][1]}"


def test_two_languages_required():
    with pytest.raises(ValueError):
        build_vocab(10, ("en",))
