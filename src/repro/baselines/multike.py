"""MultiKE (Zhang et al., IJCAI 2019) — lite.

MultiKE unifies multiple *views* of entities (name, relation,
attribute) into one alignment. The lite equivalent fuses two views over
our substrates: a whole-graph structural view (mean-aggregation
propagation) and a literal name view (STNS string similarity), combined
with equal weights. Views are trained jointly in the original — hence,
like RDGCN, its structure cannot be stripped into LargeEA.
"""
import time

from pyspark.sql import SparkSession

from repro.baselines._common import full_graph_structure
from repro.core.fusion import fuse, minmax_normalize
from repro.core.stns import stns
from repro.eval.memory import sparse_matrix_bytes
from repro.eval.metrics import evaluate
from repro.kgdata.benchmark import KGPair


def run_multike(
    spark: SparkSession,
    kg: KGPair,
    *,
    dim: int = 64,
    layers: int = 2,
    k_top: int = 10,
    theta: float = 0.5,
    seed: int = 0,
) -> dict:
    t0 = time.perf_counter()
    m_struct, struct_bytes = full_graph_structure(
        spark, kg, model="gcn", dim=dim, layers=layers, k_top=k_top, seed=seed
    )
    m_name = stns(spark, kg.names_s, kg.names_t, theta=theta, seed=seed).localCheckpoint(
        eager=True
    )
    m = fuse((minmax_normalize(m_struct), 1.0), (m_name, 1.0)).localCheckpoint(eager=True)
    metrics = evaluate(m, kg.test, by="src")
    # Joint multi-view training holds both views' features resident.
    peak = 2 * struct_bytes + sparse_matrix_bytes(m_name.count())
    return {
        "method": "MultiKE",
        **metrics,
        "time_s": time.perf_counter() - t0,
        "mem_bytes": peak,
    }
