"""Structure channel (Section 2.2.2, Appendix A Algorithm 1).

Mini-batch "training" is a black box per the paper; here the black box
is the anchor-propagation EA model. The whole channel is one Spark
``applyInPandas`` over a batch-keyed payload union: every group holds
one mini-batch's intra-batch triples (both sides) and its in-batch
seeds, embeds both subgraphs, and emits its block of the sparse
structural similarity matrix M_s. Blocks are disjoint by construction —
the paper's block-diagonal, O(|E_s|)-memory M_s.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.embedding.propagation import anchor_embeddings, feature_bytes
from repro.embedding.similarity import bidirectional_topk
from repro.kgdata.benchmark import KGPair

_KIND_EDGE_S, _KIND_EDGE_T, _KIND_SEED, _KIND_ENT_S, _KIND_ENT_T = range(5)


def _batch_payload(kg: KGPair, batches: DataFrame, seeds: DataFrame) -> DataFrame:
    """Union payload (batch, kind, a, b, c) consumed by the batch worker.

    Intra-batch edges only: an edge whose endpoints fall in different
    batches is cut (that loss is the paper's Challenge II). Seeds are
    kept only when both endpoints share a batch.
    """
    b_s = batches.where("side = 's'").select("eid", "batch")
    b_t = batches.where("side = 't'").select("eid", "batch")

    def _edges(triples: DataFrame, b: DataFrame, kind: int) -> DataFrame:
        return (
            triples.join(b.select(F.col("eid").alias("h"), F.col("batch").alias("bh")), "h")
            .join(b.select(F.col("eid").alias("t"), F.col("batch").alias("bt")), "t")
            .where(F.col("bh") == F.col("bt"))
            .select(
                F.col("bh").alias("batch"),
                F.lit(kind).alias("kind"),
                F.col("h").alias("a"),
                F.col("t").alias("b"),
                F.col("r").alias("c"),
            )
        )

    in_seeds = (
        seeds.join(b_s.select(F.col("eid").alias("src"), F.col("batch").alias("bs")), "src")
        .join(b_t.select(F.col("eid").alias("tgt"), F.col("batch").alias("bt")), "tgt")
        .where(F.col("bs") == F.col("bt"))
        .select(
            F.col("bs").alias("batch"),
            F.lit(_KIND_SEED).alias("kind"),
            F.col("src").alias("a"),
            F.col("tgt").alias("b"),
            F.lit(0).alias("c"),
        )
    )
    ents = lambda b, kind: b.select(  # noqa: E731
        "batch", F.lit(kind).alias("kind"), F.col("eid").alias("a"),
        F.lit(0).alias("b"), F.lit(0).alias("c"),
    )
    return (
        _edges(kg.triples_s, b_s, _KIND_EDGE_S)
        .unionByName(_edges(kg.triples_t, b_t, _KIND_EDGE_T))
        .unionByName(in_seeds)
        .unionByName(ents(b_s, _KIND_ENT_S))
        .unionByName(ents(b_t, _KIND_ENT_T))
    )


def structure_channel(
    spark: SparkSession,
    kg: KGPair,
    batches: DataFrame,
    seeds: DataFrame,
    *,
    model: str = "rrea",
    dim: int = 64,
    layers: int = 2,
    k_top: int = 10,
    seed: int = 0,
) -> tuple:
    """Compute the sparse structural similarity matrix M_s.

    Returns (M_s DataFrame(src, tgt, score), info dict). Info carries
    the analytic peak feature-memory in bytes (max over mini-batches —
    batches run sequentially on one GPU in the paper) and batch sizes.
    """
    payload = _batch_payload(kg, batches, seeds)

    def _run_batch(pdf: pd.DataFrame) -> pd.DataFrame:
        tri_s = pdf[pdf.kind == _KIND_EDGE_S].rename(columns={"a": "h", "b": "t", "c": "r"})
        tri_t = pdf[pdf.kind == _KIND_EDGE_T].rename(columns={"a": "h", "b": "t", "c": "r"})
        batch_seeds = pdf[pdf.kind == _KIND_SEED].rename(columns={"a": "src", "b": "tgt"})
        ents_s = pdf[pdf.kind == _KIND_ENT_S].a.to_numpy()
        ents_t = pdf[pdf.kind == _KIND_ENT_T].a.to_numpy()
        if len(ents_s) == 0 or len(ents_t) == 0:
            return pd.DataFrame({"src": [], "tgt": [], "score": []})
        H_s, H_t = anchor_embeddings(
            tri_s, tri_t, batch_seeds, ents_s, ents_t,
            model=model, dim=dim, layers=layers, seed=seed,
        )
        return bidirectional_topk(H_s, ents_s, H_t, ents_t, k_top)

    m_s = payload.groupBy("batch").applyInPandas(
        _run_batch, schema="src long, tgt long, score double"
    )

    sizes = (
        batches.groupBy("batch", "side").agg(F.count("*").alias("n")).toPandas()
        .pivot_table(index="batch", columns="side", values="n", fill_value=0)
    )
    # RREA's triplet loss uses nearest-neighbour negative sampling,
    # which materialises an in-scope pairwise similarity plane — the
    # O(n^2) term behind the paper's RREA OOM at 100K entities. GCN-
    # Align samples negatives randomly and has no such plane.
    quad = (lambda ns, nt: ns * nt * 4) if model == "rrea" else (lambda ns, nt: 0)
    per_batch = [
        feature_bytes(int(row.get("s", 0)), dim, layers)
        + feature_bytes(int(row.get("t", 0)), dim, layers)
        + quad(int(row.get("s", 0)), int(row.get("t", 0)))
        for _, row in sizes.iterrows()
    ]
    info = {
        "peak_bytes": int(max(per_batch)) if per_batch else 0,
        "n_batches": len(per_batch),
        "batch_sizes": sizes.to_dict("index"),
    }
    return m_s, info


def single_batch(spark: SparkSession, kg: KGPair) -> DataFrame:
    """A trivial one-batch assignment — the paper's "w/o partition"
    setting and the substrate for full-graph baselines."""
    s = kg.names_s.select(F.lit("s").alias("side"), "eid", F.lit(0).alias("batch"))
    t = kg.names_t.select(F.lit("t").alias("side"), "eid", F.lit(0).alias("batch"))
    return s.unionByName(t)
