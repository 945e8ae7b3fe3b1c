"""RDGCN (Wu et al., IJCAI 2019) — lite.

RDGCN initialises entity embeddings from entity *names* and refines
them with a relation-aware dual GCN. The lite equivalent initialises
anchor propagation with HashBert name embeddings (instead of zeros) and
propagates relation-modulated messages over the whole graphs. Name
information and structure are inseparable here — which is exactly why
the paper cannot strip RDGCN's structural module into LargeEA.
"""
import time

import numpy as np
from pyspark.sql import SparkSession

from repro.core.fusion import minmax_normalize
from repro.embedding.propagation import anchor_embeddings, feature_bytes
from repro.embedding.similarity import bidirectional_topk
from repro.eval.memory import sparse_matrix_bytes
from repro.eval.metrics import evaluate
from repro.kgdata.benchmark import KGPair
from repro.text.hashbert import HashBert


def run_rdgcn(
    spark: SparkSession,
    kg: KGPair,
    *,
    dim: int = 64,
    layers: int = 2,
    k_top: int = 10,
    seed: int = 0,
) -> dict:
    t0 = time.perf_counter()
    names_s = kg.names_s.toPandas().sort_values("eid")
    names_t = kg.names_t.toPandas().sort_values("eid")
    hb = HashBert(kg.lexicons, dim, seed=seed)
    init_s = hb.encode_batch(kg.langs[0], list(names_s.name))
    init_t = hb.encode_batch(kg.langs[1], list(names_t.name))
    H_s, H_t = anchor_embeddings(
        kg.triples_s.toPandas(),
        kg.triples_t.toPandas(),
        kg.train.toPandas(),
        names_s.eid.to_numpy(),
        names_t.eid.to_numpy(),
        model="rrea",
        dim=dim,
        layers=layers,
        seed=seed,
        init_s=init_s,
        init_t=init_t,
        bootstrap=0,  # RDGCN has no semi-supervised iteration (that is RREA's trick)
    )
    topk = bidirectional_topk(H_s, names_s.eid.to_numpy(), H_t, names_t.eid.to_numpy(), k_top)
    m = minmax_normalize(spark.createDataFrame(topk)).localCheckpoint(eager=True)
    metrics = evaluate(m, kg.test, by="src")
    # Dual-graph design holds primal + dual feature sets (2x) plus the
    # name-initialisation matrices.
    peak = 2 * (
        feature_bytes(len(names_s), dim, layers) + feature_bytes(len(names_t), dim, layers)
    ) + sparse_matrix_bytes(len(topk))
    return {
        "method": "RDGCN",
        **metrics,
        "time_s": time.perf_counter() - t0,
        "mem_bytes": peak,
    }
