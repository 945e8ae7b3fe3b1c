"""RREA (Mao et al., CIKM 2020) — lite.

Whole-graph relational-reflection propagation (relation-modulated
messages), structure only. Stronger than GCN-Align but carries the
O(|E_s| x |E_t|) nearest-neighbour-sampling plane in its memory
footprint — the term that makes the real RREA OOM at 100K entities
(the "-" cells of the paper's Table 2).
"""
from pyspark.sql import SparkSession

from repro.baselines._common import structure_only_run
from repro.kgdata.benchmark import KGPair


def run_rrea(spark: SparkSession, kg: KGPair, *, dim: int = 64, layers: int = 2, k_top: int = 10, seed: int = 0) -> dict:
    return structure_only_run(
        "RREA", spark, kg, model="rrea", dim=dim, layers=layers, k_top=k_top, seed=seed
    )
