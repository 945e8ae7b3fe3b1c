"""Property-based tests (hypothesis) for the pure-python substrates."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.embedding.similarity import manhattan_topk
from repro.text.minhash import band_hashes, estimated_jaccard, signature
from repro.text.tokenize import shingles, tokens

_name = st.text(
    alphabet=st.characters(whitelist_categories=("Ll",), max_codepoint=0x024F),
    min_size=0,
    max_size=24,
)


@settings(max_examples=60, deadline=None)
@given(_name)
def test_shingles_cover_string(name):
    sh = shingles(name)
    collapsed = " ".join(name.lower().split())
    if collapsed:
        assert sh
        assert all(s in collapsed for s in sh)
    else:
        assert sh == set()


@settings(max_examples=60, deadline=None)
@given(_name)
def test_tokens_lowercase(name):
    assert all(t == t.lower() for t in tokens(name))


@settings(max_examples=40, deadline=None)
@given(_name, _name)
def test_estimated_jaccard_symmetric(a, b):
    sa, sb = signature(a, 16), signature(b, 16)
    assert estimated_jaccard(sa, sb) == estimated_jaccard(sb, sa)


@settings(max_examples=40, deadline=None)
@given(_name)
def test_identical_names_full_jaccard(name):
    s = signature(name, 16)
    assert estimated_jaccard(s, s) == 1.0


@settings(max_examples=40, deadline=None)
@given(_name, st.sampled_from([2, 4, 8, 16]))
def test_band_count(name, bands):
    assert len(band_hashes(signature(name, 16), bands)) == bands


@settings(max_examples=25, deadline=None)
@given(
    st.integers(2, 12),  # n_a
    st.integers(2, 12),  # n_b
    st.integers(1, 6),  # k
    st.integers(0, 2**31 - 1),
)
def test_topk_row_counts_and_best(n_a, n_b, k, seed):
    rng = np.random.default_rng(seed)
    A, B = rng.random((n_a, 4)), rng.random((n_b, 4))
    out = manhattan_topk(A, np.arange(n_a), B, np.arange(100, 100 + n_b), k)
    kk = min(k, n_b)
    assert len(out) == n_a * kk
    per = out.groupby("src").size()
    assert (per == kk).all()
    # The reported best must match brute force (float32 arithmetic).
    brute = np.abs(A[:, None, :].astype(np.float32) - B[None, :, :].astype(np.float32)).sum(-1)
    for s in range(n_a):
        got_best = -out[out.src == s].score.max()
        assert got_best == pytest.approx(brute[s].min(), rel=1e-5)


@settings(max_examples=25, deadline=None)
@given(st.integers(0, 2**31 - 1))
def test_topk_scores_sorted_consistently(seed):
    rng = np.random.default_rng(seed)
    A, B = rng.random((5, 3)), rng.random((9, 3))
    out = manhattan_topk(A, np.arange(5), B, np.arange(9), 3)
    # every returned score beats or equals every non-returned candidate
    brute = np.abs(A[:, None, :].astype(np.float32) - B[None, :, :].astype(np.float32)).sum(-1)
    for s in range(5):
        kept = set(out[out.src == s].tgt)
        worst_kept = max(brute[s][list(kept)])
        rest = [brute[s][j] for j in range(9) if j not in kept]
        if rest:
            assert worst_kept <= min(rest) + 1e-5
