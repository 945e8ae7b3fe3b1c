"""Analytic peak feature-memory model (GPU-memory stand-in).

The paper's "Mem." column (measured with NVIDIA Nsight) tracks which
feature structures a method holds resident at once. With no GPU in the
container, we count exactly those structures from the real run's
shapes: embedding matrices, propagation buffers, similarity blocks,
token-interaction tensors. Absolute numbers are incomparable to an
RTX3090's; the orderings (full-graph vs mini-batch, interaction models
vs propagation models) are the reproduction target.
"""


def mb(n_bytes: int) -> float:
    """Bytes -> MB, rounded to 2 decimals."""
    return round(n_bytes / (1 << 20), 2)


def sparse_matrix_bytes(n_entries: int) -> int:
    """Resident bytes of a sparse (src, tgt, score) matrix."""
    return n_entries * 24  # two int64 ids + one float64 score


def dense_block_bytes(n_a: int, n_b: int) -> int:
    """One dense float32 distance block (the chunked scratch plane)."""
    return n_a * n_b * 4


def interaction_bytes(n_candidates: int, max_tokens: int, dim: int) -> int:
    """BERT-INT-style token-interaction footprint per candidate batch:
    two token matrices plus the T x T interaction plane."""
    return n_candidates * (2 * max_tokens * dim * 8 + max_tokens * max_tokens * 8)
