"""MinHash signatures + LSH banding (datasketch stand-in).

STNS needs candidate entity pairs whose name Jaccard similarity is
plausibly >= theta, without comparing all |E_s| x |E_t| pairs. Classic
MinHash-LSH: hash each name's char-3-gram set through ``n_hash``
universal hash functions, keep the minimum per function, band the
signature; two names collide iff some band matches exactly.
"""
import zlib

import numpy as np

from repro.text.tokenize import shingles

_MERSENNE = (1 << 61) - 1


def _hash_params(n_hash: int, seed: int) -> tuple:
    rng = np.random.default_rng(seed)
    a = rng.integers(1, _MERSENNE, size=n_hash, dtype=np.int64)
    b = rng.integers(0, _MERSENNE, size=n_hash, dtype=np.int64)
    return a, b


def signature(name: str, n_hash: int = 32, *, seed: int = 0) -> np.ndarray:
    """MinHash signature of a name's shingle set, shape (n_hash,) int64.

    An empty name gets the all-max sentinel signature, which collides
    with nothing.
    """
    sh = shingles(name)
    a, b = _hash_params(n_hash, seed)
    if not sh:
        return np.full(n_hash, _MERSENNE, dtype=np.int64)
    x = np.array([zlib.crc32(s.encode()) for s in sorted(sh)], dtype=np.int64)
    # (n_hash, n_shingle) universal hashes; min over shingles.
    hv = (a[:, None] * x[None, :] + b[:, None]) % _MERSENNE
    return hv.min(axis=1)


def signatures(names, n_hash: int = 32, *, seed: int = 0) -> np.ndarray:
    """Batched :func:`signature`; shape (len(names), n_hash)."""
    a, b = _hash_params(n_hash, seed)
    out = np.full((len(names), n_hash), _MERSENNE, dtype=np.int64)
    for i, name in enumerate(names):
        sh = shingles(name)
        if not sh:
            continue
        x = np.array([zlib.crc32(s.encode()) for s in sorted(sh)], dtype=np.int64)
        out[i] = ((a[:, None] * x[None, :] + b[:, None]) % _MERSENNE).min(axis=1)
    return out


def band_hashes(sig: np.ndarray, bands: int) -> list:
    """LSH band digests: [(band index, digest), ...].

    ``len(sig)`` must be divisible by ``bands``; each band digests
    ``len(sig)/bands`` signature slots.
    """
    n = len(sig)
    if n % bands:
        raise ValueError(f"n_hash={n} not divisible by bands={bands}")
    r = n // bands
    return [
        (i, zlib.crc32(sig[i * r : (i + 1) * r].tobytes()))
        for i in range(bands)
    ]


def estimated_jaccard(sig_a: np.ndarray, sig_b: np.ndarray) -> float:
    """MinHash estimate of Jaccard similarity: fraction of equal slots."""
    return float(np.mean(np.asarray(sig_a) == np.asarray(sig_b)))
