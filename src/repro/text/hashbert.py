"""HashBert — deterministic bilingual token embeddings (BERT stand-in).

The paper's SENS uses BERT token embeddings, max-pooled per entity. No
pretrained model is available offline, so HashBert reproduces the one
property SENS depends on: *translated tokens embed near each other,
unrelated tokens do not*.

* In-lexicon tokens map to their word-concept vector (shared across
  languages) plus a small per-language perturbation — the analogue of a
  multilingual embedding space. The lexicon is word-level translation
  knowledge shipped with the benchmark (like BERT's pretrained weights);
  it never encodes entity-level alignment.
* Out-of-lexicon tokens fall back to summed char-3-gram hash vectors, so
  string-similar unknown words still land near each other.

Everything is a pure function of (seed, token), so driver and Spark
executors agree without shipping any state beyond the lexicon dict.
"""
import zlib

import numpy as np


def _vec(dim: int, *key: int) -> np.ndarray:
    return np.random.default_rng(list(key)).standard_normal(dim)


class HashBert:
    """Bilingual token embedder with per-call memoisation.

    Args:
        lexicons: {lang: {surface form: concept id}}.
        dim: embedding dimension.
        sem_noise: scale of the per-language perturbation of concept
            vectors (0 = translations embed identically).
        seed: master seed for all derived vectors.
    """

    def __init__(self, lexicons: dict, dim: int = 64, *, sem_noise: float = 0.15, seed: int = 0):
        self.lexicons = lexicons
        self.dim = dim
        self.sem_noise = sem_noise
        self.seed = seed
        self._cache: dict = {}

    def _charngram_vec(self, token: str) -> np.ndarray:
        grams = (
            [token[i : i + 3] for i in range(len(token) - 2)] if len(token) > 3 else [token]
        )
        v = np.zeros(self.dim)
        for g in grams:
            v += _vec(self.dim, self.seed, 2, zlib.crc32(g.encode()))
        return v / max(1, len(grams)) ** 0.5

    def token_vector(self, lang: str, token: str) -> np.ndarray:
        key = (lang, token)
        if key not in self._cache:
            cid = self.lexicons.get(lang, {}).get(token)
            if cid is None:
                v = self._charngram_vec(token)
            else:
                lang_off = zlib.crc32(lang.encode())
                v = _vec(self.dim, self.seed, 0, cid) + self.sem_noise * _vec(
                    self.dim, self.seed, 1, cid, lang_off
                )
            self._cache[key] = v
        return self._cache[key]

    def encode(self, lang: str, name: str) -> np.ndarray:
        """Entity embedding: max-pool over token vectors, L2-normalised.

        Max-pooling over per-token embeddings is the paper's SENS
        construction verbatim.
        """
        toks = name.lower().split()
        if not toks:
            return np.zeros(self.dim)
        pooled = np.max(np.stack([self.token_vector(lang, t) for t in toks]), axis=0)
        return pooled / (np.linalg.norm(pooled) + 1e-12)

    def encode_batch(self, lang: str, names) -> np.ndarray:
        """Vectorised :meth:`encode` over an iterable of names."""
        return np.stack([self.encode(lang, n) for n in names]) if len(names) else np.zeros((0, self.dim))

    def token_matrix(self, lang: str, name: str) -> np.ndarray:
        """Per-token embedding matrix (T, dim), L2-normalised rows.

        Used by the BERT-INT-lite baseline's token-interaction scoring.
        """
        toks = name.lower().split()
        if not toks:
            return np.zeros((1, self.dim))
        m = np.stack([self.token_vector(lang, t) for t in toks])
        return m / (np.linalg.norm(m, axis=1, keepdims=True) + 1e-12)
