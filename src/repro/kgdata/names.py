"""Entity-name generation with cross-lingual translation noise.

Aligned entity pairs share the same underlying word-concept sequence;
the target-side name is the translated rendering with realistic noise
(word drop, reorder, full alias). The noise rates keep the name channel
strong-but-imperfect, mirroring the paper's ~94 %-accurate name-based
data augmentation on DBP1M.
"""
from dataclasses import dataclass

import numpy as np

from repro.kgdata.vocab import Vocab


@dataclass(frozen=True)
class NameNoise:
    """Translation-noise rates applied to the target-side rendering."""

    p_drop: float = 0.10  # drop one word (if the name has >1 word)
    p_swap: float = 0.08  # swap two adjacent words
    p_alias: float = 0.05  # replace the whole name with unrelated words


_ZIPF_CACHE: dict = {}


def _zipf_weights(vocab_size: int, zipf_a: float) -> np.ndarray:
    key = (vocab_size, zipf_a)
    if key not in _ZIPF_CACHE:
        w = 1.0 / np.arange(1, vocab_size + 1) ** zipf_a
        _ZIPF_CACHE[key] = w / w.sum()
    return _ZIPF_CACHE[key]


def sample_name_concepts(
    rng: np.random.Generator, vocab_size: int, *, zipf_a: float = 0.9
) -> np.ndarray:
    """Sample 1–4 word-concept ids, zipfian so words repeat across entities.

    Repeated words create realistic distractors: different entities that
    share name tokens, so neither SENS nor STNS is trivially perfect.
    """
    n = int(rng.integers(1, 5))
    return rng.choice(vocab_size, size=n, p=_zipf_weights(vocab_size, zipf_a))


def translate_concepts(
    concepts: np.ndarray,
    rng: np.random.Generator,
    vocab_size: int,
    noise: NameNoise,
) -> np.ndarray:
    """Apply translation noise to a concept sequence (target-side name)."""
    c = concepts.copy()
    if rng.random() < noise.p_alias:
        return sample_name_concepts(rng, vocab_size)
    if len(c) > 1 and rng.random() < noise.p_drop:
        i = int(rng.integers(0, len(c)))
        c = np.delete(c, i)
    if len(c) > 1 and rng.random() < noise.p_swap:
        i = int(rng.integers(0, len(c) - 1))
        c[i], c[i + 1] = c[i + 1], c[i]
    return c


def generate_pair_names(
    vocab: Vocab,
    n_pairs: int,
    *,
    noise: NameNoise,
    seed: int,
) -> tuple:
    """Names for the aligned core: returns (src_names, tgt_names) lists.

    ``src_names[i]`` and ``tgt_names[i]`` belong to the i-th aligned pair.
    """
    rng = np.random.default_rng(seed)
    l0, l1 = vocab.langs
    src, tgt = [], []
    for _ in range(n_pairs):
        cs = sample_name_concepts(rng, vocab.size)
        ct = translate_concepts(cs, rng, vocab.size, noise)
        src.append(vocab.render(l0, cs))
        tgt.append(vocab.render(l1, ct))
    return src, tgt


def generate_unknown_names(
    vocab: Vocab, lang: str, n: int, *, seed: int
) -> list:
    """Names for unknown (unalignable) entities on one side.

    Drawn from the same zipfian word distribution, so unknowns share
    tokens with aligned entities and act as ranking distractors — the
    mechanism behind the paper's H@1 drop on DBP1M.
    """
    rng = np.random.default_rng(seed)
    return [
        vocab.render(lang, sample_name_concepts(rng, vocab.size))
        for _ in range(n)
    ]
