"""Structural triple generation for a heterogeneous cross-lingual KG pair.

Both sides are derived from one *core* edge set over the aligned pairs
(Chung–Lu power-law attachment), then made heterogeneous: each side
keeps a different random subset of core edges, adds its own extra
edges, and maps shared relation concepts onto a side-specific (and
differently sized) relation vocabulary. Unknown entities attach to >=5
aligned entities, following the paper's DBP1M construction rule
(Sun et al.).
"""
from dataclasses import dataclass

import numpy as np
import pandas as pd


@dataclass(frozen=True)
class GraphConfig:
    """Per-side structural parameters.

    Attributes:
        n_triples: approximate triple count for the side.
        n_relations: size of the side's relation vocabulary.
        p_keep_core: fraction of core edges the side retains (lower ->
            more heterogeneous vs the other side).
    """

    n_triples: int
    n_relations: int
    p_keep_core: float


def _powerlaw_weights(n: int, alpha: float = 0.85) -> np.ndarray:
    w = 1.0 / np.arange(1, n + 1) ** alpha
    return w / w.sum()


def core_edges(
    n_pairs: int,
    n_core: int,
    n_rel_concepts: int,
    *,
    n_communities: int = None,
    p_intra: float = 0.85,
    seed: int,
) -> pd.DataFrame:
    """Shared skeleton: (h, t, rel_concept) over pair indices 0..n_pairs-1.

    Entities belong to latent *communities* (topical clusters — the
    locality real KGs have and METIS-style partitioning exploits); a
    ``p_intra`` fraction of edges stays inside one community, the rest
    is global Chung–Lu (prob ∝ degree-weight product, shuffled so hub
    identity is not id-correlated). Self-loops and duplicate (h, t)
    edges are dropped.
    """
    rng = np.random.default_rng(seed)
    n_comm = n_communities or max(1, n_pairs // 50)
    comm = rng.integers(0, n_comm, n_pairs)
    w = _powerlaw_weights(n_pairs)
    perm = rng.permutation(n_pairs)
    w = w[np.argsort(perm)]  # weight of node i = weight of rank perm[i]

    n_draw = int(n_core * 1.3)
    intra = rng.random(n_draw) < p_intra
    h = np.empty(n_draw, dtype=np.int64)
    t = np.empty(n_draw, dtype=np.int64)
    # Global (inter-community) edges.
    n_glob = int((~intra).sum())
    h[~intra] = rng.choice(n_pairs, size=n_glob, p=w)
    t[~intra] = rng.choice(n_pairs, size=n_glob, p=w)
    # Intra-community edges: community chosen ∝ its weight mass.
    members = [np.flatnonzero(comm == c) for c in range(n_comm)]
    mass = np.array([w[m].sum() if len(m) else 0.0 for m in members])
    mass = mass / mass.sum()
    counts = rng.multinomial(int(intra.sum()), mass)
    pos = np.flatnonzero(intra)
    off = 0
    for c, cnt in enumerate(counts):
        if cnt == 0 or len(members[c]) < 2:
            if cnt:  # degenerate community: fall back to global draws
                h[pos[off : off + cnt]] = rng.choice(n_pairs, size=cnt, p=w)
                t[pos[off : off + cnt]] = rng.choice(n_pairs, size=cnt, p=w)
                off += cnt
            continue
        lw = w[members[c]] / w[members[c]].sum()
        h[pos[off : off + cnt]] = rng.choice(members[c], size=cnt, p=lw)
        t[pos[off : off + cnt]] = rng.choice(members[c], size=cnt, p=lw)
        off += cnt

    r = rng.choice(n_rel_concepts, size=n_draw, p=_powerlaw_weights(n_rel_concepts))
    df = pd.DataFrame({"h": h, "t": t, "r": r})
    df = df[df.h != df.t].drop_duplicates(["h", "t"]).head(n_core)
    return df.reset_index(drop=True)


def side_triples(
    core: pd.DataFrame,
    cfg: GraphConfig,
    n_pairs: int,
    n_unknown: int,
    *,
    min_unknown_links: int = 5,
    seed: int,
) -> pd.DataFrame:
    """Materialise one side's triples over local raw ids.

    Raw id layout: 0..n_pairs-1 are the aligned entities (pair index),
    n_pairs..n_pairs+n_unknown-1 are unknown entities. Returns columns
    (h, r, t) with relation ids local to the side.
    """
    rng = np.random.default_rng(seed)
    n_total = n_pairs + n_unknown

    kept = core[rng.random(len(core)) < cfg.p_keep_core].copy()
    # Side-specific relation vocabulary: concepts folded onto n_relations
    # ids through a random map, so the two sides disagree on granularity.
    rel_map = rng.integers(0, cfg.n_relations, size=int(core.r.max()) + 1)
    kept["r"] = rel_map[kept.r.to_numpy()]
    parts = [kept[["h", "r", "t"]]]

    # Unknown entities: each links to >= min_unknown_links *distinct*
    # aligned ones (sampled without replacement, so dedupe below can
    # never drop an unknown under the neighbour threshold).
    if n_unknown > 0:
        per = np.maximum(
            min_unknown_links, rng.poisson(min_unknown_links + 1, n_unknown)
        )
        u_list, k_list = [], []
        for u, cnt in zip(range(n_pairs, n_total), per):
            picks = rng.choice(n_pairs, size=min(cnt, n_pairs), replace=False)
            u_list.append(np.full(len(picks), u))
            k_list.append(picks)
        u_ids = np.concatenate(u_list)
        known = np.concatenate(k_list)
        flip = rng.random(len(u_ids)) < 0.5
        parts.append(
            pd.DataFrame(
                {
                    "h": np.where(flip, u_ids, known),
                    "r": rng.integers(0, cfg.n_relations, len(u_ids)),
                    "t": np.where(flip, known, u_ids),
                }
            )
        )

    # Extra side-specific edges up to the triple budget.
    n_so_far = sum(len(p) for p in parts)
    n_extra = max(0, cfg.n_triples - n_so_far)
    if n_extra:
        w_all = _powerlaw_weights(n_total)
        parts.append(
            pd.DataFrame(
                {
                    "h": rng.choice(n_total, n_extra, p=w_all),
                    "r": rng.integers(0, cfg.n_relations, n_extra),
                    "t": rng.choice(n_total, n_extra, p=w_all),
                }
            )
        )

    df = pd.concat(parts, ignore_index=True)
    df = df[df.h != df.t].drop_duplicates().reset_index(drop=True)

    # No isolated entities: anything never mentioned gets one edge.
    present = np.zeros(n_total, dtype=bool)
    present[df.h.to_numpy()] = True
    present[df.t.to_numpy()] = True
    missing = np.flatnonzero(~present)
    if len(missing):
        anchor = rng.choice(n_pairs, len(missing))
        anchor = np.where(anchor == missing, (anchor + 1) % n_pairs, anchor)
        df = pd.concat(
            [
                df,
                pd.DataFrame(
                    {
                        "h": missing,
                        "r": rng.integers(0, cfg.n_relations, len(missing)),
                        "t": anchor,
                    }
                ),
            ],
            ignore_index=True,
        )
    return df.astype(np.int64)
