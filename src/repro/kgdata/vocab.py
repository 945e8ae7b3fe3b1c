"""Bilingual concept vocabulary with language-specific surface forms.

A vocabulary is a set of word *concepts* (integer ids). Each concept has
one surface form per language, derived from a shared base string by
deterministic language-specific mutation. Translated surface forms are
therefore sometimes string-similar (light mutation) and sometimes not
(heavy mutation), which is exactly the regime the paper's STNS/SENS
split is designed for.

The surface→concept mapping per language (the *lexicon*) doubles as the
"pretrained weights" of the BERT stand-in (:mod:`repro.text.hashbert`):
it encodes word-level translation knowledge, never entity-level
alignment.
"""
from dataclasses import dataclass, field

import numpy as np

_LETTERS = "abcdefghijklmnopqrstuvwxyz"

# Per-language suffix pools used for the "light" mutation path.
_SUFFIXES = {
    "en": ["", "s", "er", "ing"],
    "fr": ["e", "eau", "ie", "eur"],
    "de": ["en", "ung", "heit", "er"],
}


def _rand_word(rng: np.random.Generator, lo: int = 4, hi: int = 9) -> str:
    n = int(rng.integers(lo, hi))
    return "".join(rng.choice(list(_LETTERS), n))


def _mutate_light(base: str, lang: str, rng: np.random.Generator) -> str:
    """One char substitution + a language suffix — high string similarity."""
    chars = list(base)
    i = int(rng.integers(0, len(chars)))
    chars[i] = str(rng.choice(list(_LETTERS)))
    return "".join(chars) + str(rng.choice(_SUFFIXES.get(lang, [""])))


def _mutate_heavy(base: str, lang: str, rng: np.random.Generator) -> str:
    """Unrelated surface form — translation with no string overlap."""
    return _rand_word(rng) + str(rng.choice(_SUFFIXES.get(lang, [""])))


@dataclass
class Vocab:
    """Deterministic bilingual vocabulary.

    Attributes:
        langs: the two language codes, e.g. ``("en", "fr")``.
        surfaces: per-language list of surface forms, indexed by concept id.
        lexicons: per-language dict surface form -> concept id.
    """

    langs: tuple
    surfaces: dict = field(repr=False)
    lexicons: dict = field(repr=False)

    @property
    def size(self) -> int:
        return len(self.surfaces[self.langs[0]])

    def render(self, lang: str, concept_ids) -> str:
        """Render a sequence of concept ids as a space-joined name."""
        table = self.surfaces[lang]
        return " ".join(table[c] for c in concept_ids)


def build_vocab(
    n_words: int,
    langs: tuple = ("en", "fr"),
    *,
    p_light: float = 0.6,
    seed: int = 0,
) -> Vocab:
    """Build an ``n_words``-concept vocabulary for two languages.

    The first language uses the base form verbatim; the second mutates it
    lightly with probability ``p_light`` (string-similar translation) and
    heavily otherwise (string-dissimilar translation). All surfaces are
    unique within a language (collision -> reroll), so lexicon lookup is
    unambiguous.
    """
    if len(langs) != 2:
        raise ValueError(f"exactly two languages expected, got {langs!r}")
    rng = np.random.default_rng(seed)
    l0, l1 = langs
    surfaces = {l0: [], l1: []}
    seen = {l0: set(), l1: set()}

    def _unique(lang: str, gen) -> str:
        for _ in range(100):
            w = gen()
            if w not in seen[lang]:
                seen[lang].add(w)
                return w
        raise RuntimeError("could not generate a unique surface form")

    for _ in range(n_words):
        base = _unique(l0, lambda: _rand_word(rng))
        surfaces[l0].append(base)
        if rng.random() < p_light:
            w1 = _unique(l1, lambda: _mutate_light(base, l1, rng))
        else:
            w1 = _unique(l1, lambda: _mutate_heavy(base, l1, rng))
        surfaces[l1].append(w1)

    lexicons = {
        lang: {w: cid for cid, w in enumerate(surfaces[lang])} for lang in langs
    }
    return Vocab(langs=langs, surfaces=surfaces, lexicons=lexicons)
