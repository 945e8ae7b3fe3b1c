"""Manhattan top-k similarity between two embedding matrices.

The paper scores entity pairs by Manhattan distance (structure channel
and SENS alike) and keeps only top-k per entity, giving the O(k|E_s|)
sparse-matrix memory bound. The distance loop accumulates one dimension
at a time in float32, so peak scratch is one (chunk, n_b) plane instead
of a (chunk, n_b, dim) cube.
"""
import numpy as np
import pandas as pd


def manhattan_topk(
    H_a: np.ndarray,
    ids_a: np.ndarray,
    H_b: np.ndarray,
    ids_b: np.ndarray,
    k: int,
    *,
    chunk: int = 1024,
) -> pd.DataFrame:
    """Top-k nearest rows of ``H_b`` for every row of ``H_a``.

    Returns a pandas DataFrame (src, tgt, score) where src comes from
    ``ids_a``, tgt from ``ids_b`` and score = -manhattan distance
    (higher is more similar).
    """
    n_a, n_b = len(H_a), len(H_b)
    if n_a == 0 or n_b == 0:
        return pd.DataFrame({"src": pd.Series(dtype="int64"), "tgt": pd.Series(dtype="int64"), "score": pd.Series(dtype="float64")})
    k = min(k, n_b)
    # Sort candidates by id so distance ties always resolve to the
    # smallest id — this makes the result invariant to how callers
    # segment B (SENS relies on that).
    order = np.argsort(ids_b, kind="stable")
    ids_b = np.asarray(ids_b)[order]
    A = H_a.astype(np.float32)
    B = H_b[order].astype(np.float32)
    out_src, out_tgt, out_score = [], [], []
    for lo in range(0, n_a, chunk):
        hi = min(lo + chunk, n_a)
        acc = np.zeros((hi - lo, n_b), dtype=np.float32)
        for d in range(A.shape[1]):
            acc += np.abs(A[lo:hi, d, None] - B[None, :, d])
        idx = np.argsort(acc, axis=1, kind="stable")[:, :k]
        rows = np.repeat(np.arange(hi - lo), k)
        out_src.append(np.repeat(ids_a[lo:hi], k))
        out_tgt.append(ids_b[idx.ravel()])
        out_score.append(-acc[rows, idx.ravel()].astype(np.float64))
    return pd.DataFrame(
        {
            "src": np.concatenate(out_src).astype(np.int64),
            "tgt": np.concatenate(out_tgt).astype(np.int64),
            "score": np.concatenate(out_score),
        }
    )


def bidirectional_topk(
    H_s: np.ndarray,
    ids_s: np.ndarray,
    H_t: np.ndarray,
    ids_t: np.ndarray,
    k: int,
) -> pd.DataFrame:
    """Union of per-source and per-target top-k (deduplicated).

    Keeping both directions lets one sparse matrix serve both the
    EN->L and L->EN rankings of the paper's tables.
    """
    fwd = manhattan_topk(H_s, ids_s, H_t, ids_t, k)
    bwd = manhattan_topk(H_t, ids_t, H_s, ids_s, k).rename(
        columns={"src": "tgt", "tgt": "src"}
    )[["src", "tgt", "score"]]
    return (
        pd.concat([fwd, bwd], ignore_index=True)
        .drop_duplicates(["src", "tgt"])
        .reset_index(drop=True)
    )
