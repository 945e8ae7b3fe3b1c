"""BERT-INT (Tang et al., IJCAI 2020) — lite.

BERT-INT ignores graph *structure learning* and scores candidate pairs
with interaction models over BERT embeddings: a name/description view
(entity-level), a token-level interaction view, and a neighbour-view
interaction (pairwise similarities between the two entities' neighbour
name embeddings). The lite equivalent keeps all three: SENS-style
candidate generation (entity view), a token x token cosine-interaction
matrix, and a neighbour x neighbour interaction over HashBert name
embeddings. The interaction stages dominate runtime — reproducing the
paper's "most accurate, most expensive" profile — and the memory model
counts the token/neighbour embedding stores plus interaction planes,
the footprint that blocks BERT-INT from DBP1M-scale data in the paper.
"""
import time

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.core.fusion import minmax_normalize
from repro.core.sens import sens
from repro.eval.memory import interaction_bytes, sparse_matrix_bytes
from repro.eval.metrics import evaluate
from repro.kgdata.benchmark import KGPair
from repro.text.hashbert import HashBert

_MAX_TOKENS = 4
_MAX_NEIGHBOURS = 8


def _neighbour_map(triples: pd.DataFrame, cap: int) -> dict:
    """eid -> up to ``cap`` neighbour eids (undirected, deterministic)."""
    both = pd.concat(
        [triples[["h", "t"]], triples.rename(columns={"h": "t", "t": "h"})[["h", "t"]]]
    )
    return (
        both.drop_duplicates()
        .sort_values(["h", "t"])
        .groupby("h")["t"]
        .apply(lambda s: list(s.head(cap)))
        .to_dict()
    )


def run_bert_int(
    spark: SparkSession,
    kg: KGPair,
    *,
    dim: int = 64,
    k_top: int = 25,
    n_segments: int = 4,
    seed: int = 0,
) -> dict:
    t0 = time.perf_counter()
    m_se, _ = sens(
        spark, kg.names_s, kg.names_t, kg.lexicons, kg.langs,
        dim=dim, k_top=k_top, n_segments=n_segments, seed=seed,
    )
    cands = (
        minmax_normalize(m_se)
        .withColumnRenamed("score", "sens")
        .join(kg.names_s.select(F.col("eid").alias("src"), F.col("name").alias("name_s")), "src")
        .join(kg.names_t.select(F.col("eid").alias("tgt"), F.col("name").alias("name_t")), "tgt")
        .select("src", "tgt", "sens", "name_s", "name_t")
    )

    # Neighbour-view inputs, shipped to executors via closure: neighbour
    # lists plus every entity's (normalised) name embedding.
    hb0 = HashBert(kg.lexicons, dim, seed=seed)
    names_s_pdf = kg.names_s.toPandas()
    names_t_pdf = kg.names_t.toPandas()
    emb_s = dict(zip(names_s_pdf.eid, hb0.encode_batch(kg.langs[0], list(names_s_pdf.name))))
    emb_t = dict(zip(names_t_pdf.eid, hb0.encode_batch(kg.langs[1], list(names_t_pdf.name))))
    nbr_s = _neighbour_map(kg.triples_s.toPandas(), _MAX_NEIGHBOURS)
    nbr_t = _neighbour_map(kg.triples_t.toPandas(), _MAX_NEIGHBOURS)
    lex, langs = kg.lexicons, kg.langs

    def _interaction(a: np.ndarray, b: np.ndarray) -> float:
        inter = a @ b.T
        return 0.5 * (inter.max(axis=1).mean() + inter.max(axis=0).mean())

    def _interact(it):
        hb = HashBert(lex, dim, seed=seed)
        for pdf in it:
            scores = np.empty(len(pdf))
            for i, row in enumerate(pdf.itertuples()):
                tok = _interaction(
                    hb.token_matrix(langs[0], row.name_s),
                    hb.token_matrix(langs[1], row.name_t),
                )
                ns = [emb_s[n] for n in nbr_s.get(row.src, []) if n in emb_s]
                nt = [emb_t[n] for n in nbr_t.get(row.tgt, []) if n in emb_t]
                nbr = _interaction(np.stack(ns), np.stack(nt)) if ns and nt else 0.0
                # Aggregate the three views (entity, token, neighbour).
                scores[i] = row.sens + tok + 0.5 * nbr
            yield pd.DataFrame({"src": pdf.src, "tgt": pdf.tgt, "score": scores})

    m = cands.mapInPandas(_interact, schema="src long, tgt long, score double").localCheckpoint(
        eager=True
    )
    n_entries = m.count()
    metrics = evaluate(m, kg.test, by="src")
    n_s, n_t = len(names_s_pdf), len(names_t_pdf)
    peak = (
        (n_s + n_t) * _MAX_TOKENS * dim * 8  # token embedding store
        + (n_s + n_t) * dim * 8  # neighbour-view name embedding store
        + interaction_bytes(n_entries, _MAX_NEIGHBOURS, dim)  # pair features
        + sparse_matrix_bytes(n_entries)
    )
    return {
        "method": "BERT-INT",
        **metrics,
        "time_s": time.perf_counter() - t0,
        "mem_bytes": peak,
    }
