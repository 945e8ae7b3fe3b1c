"""Shared harness for full-graph structure-channel baselines."""
import time

from pyspark.sql import SparkSession

from repro.core.fusion import minmax_normalize
from repro.core.structure_channel import single_batch, structure_channel
from repro.eval.memory import sparse_matrix_bytes
from repro.eval.metrics import evaluate
from repro.kgdata.benchmark import KGPair


def full_graph_structure(
    spark: SparkSession,
    kg: KGPair,
    *,
    model: str,
    dim: int,
    layers: int,
    k_top: int,
    seed: int,
) -> tuple:
    """Whole-KG (single mini-batch) structural similarity + peak bytes."""
    batches = single_batch(spark, kg)
    m_s, info = structure_channel(
        spark, kg, batches, kg.train,
        model=model, dim=dim, layers=layers, k_top=k_top, seed=seed,
    )
    m_s = m_s.localCheckpoint(eager=True)
    return m_s, info["peak_bytes"] + sparse_matrix_bytes(m_s.count())


def structure_only_run(
    name: str,
    spark: SparkSession,
    kg: KGPair,
    *,
    model: str,
    dim: int = 64,
    layers: int = 2,
    k_top: int = 10,
    seed: int = 0,
) -> dict:
    """Run a structure-only competitor end to end and evaluate it."""
    t0 = time.perf_counter()
    m_s, peak = full_graph_structure(
        spark, kg, model=model, dim=dim, layers=layers, k_top=k_top, seed=seed
    )
    m = minmax_normalize(m_s).localCheckpoint(eager=True)
    metrics = evaluate(m, kg.test, by="src")
    return {
        "method": name,
        **metrics,
        "time_s": time.perf_counter() - t0,
        "mem_bytes": peak,
    }
