"""SENS — semantic name similarity (Section 2.3, Function SENS).

Entity names are embedded with HashBert (max-pooled token embeddings,
L2-normalised — the paper's construction over its BERT stand-in). The
embedding matrices are split into K segments "for saving memory"; all
K x K segment pairs are fanned out as Spark groups (the Faiss stand-in)
and each group computes Manhattan top-k both ways; a window keeps the
global top-k per entity. Only top-k scores are retained, giving the
O(k|E_s|) memory bound the paper argues for.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F

from repro.embedding.similarity import manhattan_topk
from repro.text.hashbert import HashBert


def embed_names(
    spark: SparkSession,
    names: DataFrame,
    lexicons: dict,
    lang: str,
    *,
    dim: int = 64,
    seed: int = 0,
) -> DataFrame:
    """(eid, emb array<double>) — HashBert entity embeddings via Spark."""

    def _embed(it):
        hb = HashBert(lexicons, dim, seed=seed)
        for pdf in it:
            emb = hb.encode_batch(lang, list(pdf["name"]))
            yield pd.DataFrame({"eid": pdf.eid, "emb": list(emb)})

    return names.mapInPandas(_embed, schema="eid long, emb array<double>")


def _top_per(df: DataFrame, key: str, other: str, k: int) -> DataFrame:
    w = Window.partitionBy(key).orderBy(F.desc("score"), F.asc(other))
    return df.withColumn("rn", F.row_number().over(w)).where(F.col("rn") <= k).drop("rn")


def sens(
    spark: SparkSession,
    names_s: DataFrame,
    names_t: DataFrame,
    lexicons: dict,
    langs: tuple,
    *,
    dim: int = 64,
    k_top: int = 50,
    n_segments: int = 4,
    seed: int = 0,
) -> tuple:
    """Sparse semantic similarity M_se (src, tgt, score = -manhattan).

    Returns (M_se, info) where info carries the analytic peak memory of
    one segment-pair comparison plus the embedding matrices.
    """
    emb_s = embed_names(spark, names_s, lexicons, langs[0], dim=dim, seed=seed)
    emb_t = embed_names(spark, names_t, lexicons, langs[1], dim=dim, seed=seed)

    segs = F.array(*[F.lit(i) for i in range(n_segments)])
    rep_s = emb_s.select(
        F.pmod(F.hash("eid", F.lit(seed)), F.lit(n_segments)).alias("i"),
        F.explode(segs).alias("j"),
        F.lit(0).alias("flag"),
        "eid",
        "emb",
    )
    rep_t = emb_t.select(
        F.explode(segs).alias("i"),
        F.pmod(F.hash("eid", F.lit(seed + 1)), F.lit(n_segments)).alias("j"),
        F.lit(1).alias("flag"),
        "eid",
        "emb",
    )

    def _pair_topk(pdf: pd.DataFrame) -> pd.DataFrame:
        s = pdf[pdf.flag == 0]
        t = pdf[pdf.flag == 1]
        if s.empty or t.empty:
            return pd.DataFrame({"src": [], "tgt": [], "score": []})
        H_s = np.stack(s.emb.to_numpy())
        H_t = np.stack(t.emb.to_numpy())
        fwd = manhattan_topk(H_s, s.eid.to_numpy(), H_t, t.eid.to_numpy(), k_top)
        bwd = manhattan_topk(H_t, t.eid.to_numpy(), H_s, s.eid.to_numpy(), k_top).rename(
            columns={"src": "tgt", "tgt": "src"}
        )[["src", "tgt", "score"]]
        return pd.concat([fwd, bwd], ignore_index=True).drop_duplicates(["src", "tgt"])

    pair_scores = (
        rep_s.unionByName(rep_t)
        .groupBy("i", "j")
        .applyInPandas(_pair_topk, schema="src long, tgt long, score double")
    )
    m_se = (
        _top_per(pair_scores, "src", "tgt", k_top)
        .unionByName(_top_per(pair_scores, "tgt", "src", k_top))
        .dropDuplicates(["src", "tgt"])
    )

    n_s, n_t = names_s.count(), names_t.count()
    seg_pair_bytes = ((n_s + n_t) // max(1, n_segments)) * dim * 8
    info = {
        "peak_bytes": (n_s + n_t) * dim * 8 + seg_pair_bytes,
        "n_segments": n_segments,
    }
    return m_se, info
