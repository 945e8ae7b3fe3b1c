"""GCN-Align (Wang et al., EMNLP 2018) — lite.

The variant used here is the structure-only vanilla-GCN configuration
(the same variant LargeEA-G embeds): whole-graph mean-aggregation
anchor propagation, no partitioning, no name features. Weak accuracy,
tiny memory — the paper's Table 2 profile for GCNAlign.
"""
from pyspark.sql import SparkSession

from repro.baselines._common import structure_only_run
from repro.kgdata.benchmark import KGPair


def run_gcn_align(spark: SparkSession, kg: KGPair, *, dim: int = 64, layers: int = 2, k_top: int = 10, seed: int = 0) -> dict:
    return structure_only_run(
        "GCNAlign", spark, kg, model="gcn", dim=dim, layers=layers, k_top=k_top, seed=seed
    )
