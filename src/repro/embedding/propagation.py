"""Anchor propagation — the training-free core of a GNN-based EA model.

A GNN EA model (GCN-Align, RREA) learns embeddings such that seed pairs
coincide and the alignment signal propagates to neighbours. The
closed-form essence of that signal: give each seed pair an identical
random *anchor* vector in both KGs, then run L rounds of degree-
normalised neighbour aggregation per KG, re-clamping seeds each round.
Entities whose neighbourhoods touch the same anchors in both KGs end up
with similar embeddings — no gradient training, deterministic, and fast
enough to run inside a Spark ``applyInPandas`` worker per mini-batch.

Two models:

* ``gcn``  — plain mean aggregation (GCN-Align-lite), single pass.
* ``rrea`` — RREA-lite: messages modulated element-wise by per-relation
  hash vectors keyed on the relation's *frequency rank* (ranks, unlike
  raw relation ids, are comparable across KGs — a training-free stand-in
  for learned relational reflections), plus one *bootstrap* round in
  which mutually-nearest non-seed pairs become additional anchors. The
  bootstrap mirrors the semi-supervised iteration that gives the real
  RREA its accuracy lead; it is also the source of RREA's O(n^2)
  pairwise-similarity memory term.
"""
import numpy as np
import pandas as pd


def _vec(dim: int, *key: int) -> np.ndarray:
    return np.random.default_rng(list(key)).standard_normal(dim)


def anchor_vector(src_id: int, dim: int, seed: int) -> np.ndarray:
    """The shared anchor for a seed pair, keyed by its source entity id."""
    v = _vec(dim, seed, 3, int(src_id))
    return v / (np.linalg.norm(v) + 1e-12)


def _relation_mods(
    rels: np.ndarray, dim: int, seed: int, model: str
) -> tuple:
    """Per-edge (forward, backward) modulation vectors.

    RREA-lite keys the vectors on frequency rank so the dominant
    relations of the two KGs (derived from the same concepts) modulate
    consistently, and uses distinct forward/backward tables to keep
    edge direction informative.
    """
    if model == "gcn":
        ones = np.ones((len(rels), dim))
        return ones, ones
    uniq, counts = np.unique(rels, return_counts=True)
    order = uniq[np.argsort(-counts, kind="stable")]
    ranks = {int(u): rk for rk, u in enumerate(order)}
    scale = 0.25
    tab_f = {int(u): 1.0 + scale * np.tanh(_vec(dim, seed, 4, ranks[int(u)])) for u in uniq}
    tab_b = {int(u): 1.0 + scale * np.tanh(_vec(dim, seed, 5, ranks[int(u)])) for u in uniq}
    fwd = np.stack([tab_f[int(r)] for r in rels])
    bwd = np.stack([tab_b[int(r)] for r in rels])
    return fwd, bwd


def _propagate_side(
    triples: pd.DataFrame,
    ents: np.ndarray,
    anchors: dict,
    *,
    model: str,
    dim: int,
    layers: int,
    seed: int,
    damp: float = 0.3,
    init: np.ndarray = None,
) -> np.ndarray:
    """Propagate anchors through one KG; returns (len(ents), dim*(L+1)).

    Per-layer outputs are concatenated: magnitude and mixing ratio at
    every depth carry "how far from which anchors", which Manhattan
    distance then compares.
    """
    pos = {int(e): i for i, e in enumerate(ents)}
    h_idx = np.array([pos[int(x)] for x in triples.h], dtype=np.int64)
    t_idx = np.array([pos[int(x)] for x in triples.t], dtype=np.int64)
    fwd, bwd = _relation_mods(triples.r.to_numpy(), dim, seed, model)

    H = np.zeros((len(ents), dim)) if init is None else init.copy()
    a_pos = np.array([pos[int(e)] for e in anchors if int(e) in pos], dtype=np.int64)
    a_vec = (
        np.stack([anchors[e] for e in anchors if int(e) in pos])
        if len(a_pos)
        else np.zeros((0, dim))
    )

    def _clamp(h: np.ndarray) -> None:
        if len(a_pos):
            h[a_pos] = a_vec

    deg = np.zeros(len(ents))
    np.add.at(deg, h_idx, 1.0)
    np.add.at(deg, t_idx, 1.0)
    deg = np.maximum(deg, 1.0)[:, None]

    _clamp(H)
    acc = [H.copy()]
    for _ in range(layers):
        agg = np.zeros_like(H)
        np.add.at(agg, h_idx, H[t_idx] * fwd)
        np.add.at(agg, t_idx, H[h_idx] * bwd)
        H = damp * H + (1 - damp) * agg / deg
        # Magnitude carries "distance from the anchors" — do NOT
        # renormalise every row (that collapses a path onto its anchor
        # direction). Only clip runaway norms (rrea mods can exceed 1).
        norms = np.linalg.norm(H, axis=1, keepdims=True)
        H = H / np.maximum(norms, 1.0)
        _clamp(H)
        acc.append(H.copy())
    return np.concatenate(acc, axis=1)


def anchor_embeddings(
    tri_s: pd.DataFrame,
    tri_t: pd.DataFrame,
    seeds: pd.DataFrame,
    ents_s: np.ndarray,
    ents_t: np.ndarray,
    *,
    model: str = "rrea",
    dim: int = 64,
    layers: int = 2,
    seed: int = 0,
    init_s: np.ndarray = None,
    init_t: np.ndarray = None,
    bootstrap: int = None,
) -> tuple:
    """Embed both sides of one mini-batch (or whole KGs for baselines).

    Args:
        tri_s / tri_t: (h, r, t) pandas triples, endpoints within ents.
        seeds: (src, tgt) seed pairs inside this batch.
        ents_s / ents_t: global entity ids present on each side.
        init_s / init_t: optional initial features (RDGCN-lite passes
            name embeddings here); default zero.
        bootstrap: semi-supervised rounds; defaults to 1 for ``rrea``
            and 0 for ``gcn`` (RREA's iterative training vs GCN-Align's
            single fit).

    Returns:
        (H_s, H_t) row-aligned with ents_s / ents_t; feature dimension
        is ``dim * (layers + 1)`` (concatenated layer outputs).
    """
    if model not in ("gcn", "rrea"):
        raise ValueError(f"unknown model {model!r}")
    if bootstrap is None:
        bootstrap = 1 if model == "rrea" else 0
    anchors_s = {int(r.src): anchor_vector(r.src, dim, seed) for r in seeds.itertuples()}
    anchors_t = {int(r.tgt): anchors_s[int(r.src)] for r in seeds.itertuples()}
    kw = dict(model=model, dim=dim, layers=layers, seed=seed)

    for round_no in range(bootstrap + 1):
        H_s = _propagate_side(tri_s, ents_s, anchors_s, init=init_s, **kw)
        H_t = _propagate_side(tri_t, ents_t, anchors_t, init=init_t, **kw)
        if round_no == bootstrap:
            break
        _add_bootstrap_anchors(
            H_s, ents_s, H_t, ents_t, anchors_s, anchors_t, dim, seed
        )
    return H_s, H_t


def _add_bootstrap_anchors(
    H_s: np.ndarray,
    ents_s: np.ndarray,
    H_t: np.ndarray,
    ents_t: np.ndarray,
    anchors_s: dict,
    anchors_t: dict,
    dim: int,
    seed: int,
) -> int:
    """Promote mutually-nearest non-anchored pairs to pseudo anchors."""
    from repro.embedding.similarity import manhattan_topk

    free_s = np.array([i for i, e in enumerate(ents_s) if int(e) not in anchors_s])
    free_t = np.array([i for i, e in enumerate(ents_t) if int(e) not in anchors_t])
    if len(free_s) == 0 or len(free_t) == 0:
        return 0
    fwd = manhattan_topk(H_s[free_s], ents_s[free_s], H_t[free_t], ents_t[free_t], 1)
    bwd = manhattan_topk(H_t[free_t], ents_t[free_t], H_s[free_s], ents_s[free_s], 1)
    best_f = dict(zip(fwd.src, fwd.tgt))
    best_b = dict(zip(bwd.src, bwd.tgt))
    added = 0
    for s, t in best_f.items():
        if best_b.get(t) == s:
            # Distinct key-space for pseudo anchors (seed offset).
            v = anchor_vector(int(s), dim, seed + 104729)
            anchors_s[int(s)] = v
            anchors_t[int(t)] = v
            added += 1
    return added


def feature_bytes(n_entities: int, dim: int, layers: int) -> int:
    """Analytic resident bytes of one side's propagation state.

    Counts the live feature matrices (current H, aggregate buffer, and
    the concatenated per-layer outputs) — the structures a GPU
    implementation would hold, which is what the paper's memory column
    tracks.
    """
    return n_entities * dim * 8 * (layers + 3)
