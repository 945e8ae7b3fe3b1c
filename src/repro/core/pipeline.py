"""End-to-end LargeEA pipeline (Figure 2 + Algorithm 1).

Order follows Algorithm 1: name channel first (its matrix feeds the
data augmentation), pseudo seeds join the real seeds, METIS-CPS (or
VPS) generates mini-batches, the structure channel emits M_s, and the
channels fuse as M = M_s + M_n. One run evaluates both ranking
directions (EN->L per-source ranks, L->EN per-target ranks) from the
same sparse matrix.
"""
import time
from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.augment import augment_seeds, augmentation_accuracy
from repro.core.fusion import fuse, minmax_normalize
from repro.core.metis_cps import metis_cps_batches
from repro.core.name_channel import name_channel
from repro.core.structure_channel import single_batch, structure_channel
from repro.core.vps import vps_batches
from repro.eval.memory import sparse_matrix_bytes
from repro.eval.metrics import evaluate
from repro.kgdata.benchmark import KGPair


@dataclass
class LargeEAResult:
    """Everything the table jobs need from one pipeline run."""

    m: DataFrame
    m_s: DataFrame
    m_n: DataFrame
    metrics_src: dict  # EN->L: rank candidates per source entity
    metrics_tgt: dict  # L->EN: rank candidates per target entity
    timings: dict = field(default_factory=dict)
    memory: dict = field(default_factory=dict)
    da_stats: dict = field(default_factory=dict)
    batches: DataFrame = None


def run_largeea(
    spark: SparkSession,
    kg: KGPair,
    *,
    model: str = "rrea",
    k: int = None,
    partitioner: str = "metis_cps",
    supervised: bool = True,
    use_name_channel: bool = True,
    use_structure_channel: bool = True,
    use_augmentation: bool = True,
    dim: int = 64,
    layers: int = 2,
    k_top_struct: int = 10,
    k_top_name: int = 50,
    gamma: float = 0.05,
    theta: float = 0.5,
    n_segments: int = 4,
    seed: int = 0,
) -> LargeEAResult:
    """Run LargeEA on a KG pair and evaluate on its test split.

    Args:
        model: structure-channel EA model, ``"rrea"`` (LargeEA-R) or
            ``"gcn"`` (LargeEA-G).
        k: number of mini-batches (default: the dataset's paper value).
        partitioner: ``"metis_cps"``, ``"vps"``, or ``"none"`` (single
            batch — the paper's w/o-partition setting).
        supervised: use the 20 % train seeds; False reproduces the
            Section 3.5 unsupervised case study (pseudo seeds only).
        use_*: ablation switches (Figure 5).
    """
    k = k or kg.default_k
    timings, memory = {}, {}

    # ---- Name channel (NFF) ------------------------------------------
    t0 = time.perf_counter()
    m_n = None
    components = {}
    if use_name_channel or use_augmentation:
        m_n, components = name_channel(
            spark, kg, gamma=gamma, theta=theta, k_top=k_top_name,
            dim=dim, n_segments=n_segments, seed=seed,
        )
        m_n = m_n.localCheckpoint(eager=True)
        memory["name_bytes"] = components["sens_info"]["peak_bytes"] + sparse_matrix_bytes(
            m_n.count()
        )
    timings["name_channel_s"] = time.perf_counter() - t0

    # ---- Seeds: real + pseudo (Algorithm 1, lines 1-2) ---------------
    t0 = time.perf_counter()
    train = kg.train if supervised else kg.train.limit(0)
    seeds = train
    da_stats = {}
    if use_augmentation and m_n is not None:
        pseudo = augment_seeds(m_n, existing=train).localCheckpoint(eager=True)
        da_stats = augmentation_accuracy(pseudo, kg.alignment)
        seeds = train.unionByName(pseudo).dropDuplicates(["src", "tgt"])
    seeds = seeds.localCheckpoint(eager=True)
    timings["augmentation_s"] = time.perf_counter() - t0

    # ---- Structure channel -------------------------------------------
    m_s = None
    batches = None
    if use_structure_channel:
        t0 = time.perf_counter()
        if partitioner == "metis_cps":
            batches = metis_cps_batches(spark, kg, seeds, k, seed=seed)
        elif partitioner == "vps":
            batches = vps_batches(kg, seeds, k, seed=seed)
        elif partitioner == "none":
            batches = single_batch(spark, kg)
        else:
            raise ValueError(f"unknown partitioner {partitioner!r}")
        batches = batches.localCheckpoint(eager=True)
        timings["partition_s"] = time.perf_counter() - t0

        t0 = time.perf_counter()
        m_s, s_info = structure_channel(
            spark, kg, batches, seeds,
            model=model, dim=dim, layers=layers, k_top=k_top_struct, seed=seed,
        )
        m_s = m_s.localCheckpoint(eager=True)
        memory["structure_bytes"] = s_info["peak_bytes"] + sparse_matrix_bytes(m_s.count())
        memory["structure_info"] = s_info
        timings["structure_channel_s"] = time.perf_counter() - t0

    # ---- Channel fusion ----------------------------------------------
    t0 = time.perf_counter()
    parts = []
    if m_s is not None:
        # Distance -> similarity via exp(-d/tau): a clamped match
        # (d ~ 0) scores ~1 while a merely-best-in-row candidate decays
        # sharply, so a partial structure channel reinforces the name
        # channel instead of overriding it. tau scales with the feature
        # dimension because Manhattan distance grows linearly in it.
        tau = 0.0026 * dim * (layers + 1)
        m_s_sim = m_s.select(
            "src", "tgt", F.exp(F.col("score") / F.lit(tau)).alias("score")
        )
        parts.append((m_s_sim, 1.0))
    if use_name_channel and m_n is not None:
        parts.append((m_n, 1.0))
    if not parts:
        raise ValueError("both channels disabled — nothing to align with")
    m = fuse(*parts).localCheckpoint(eager=True)
    timings["fusion_s"] = time.perf_counter() - t0

    t0 = time.perf_counter()
    metrics_src = evaluate(m, kg.test, by="src")
    metrics_tgt = evaluate(m, kg.test, by="tgt")
    timings["eval_s"] = time.perf_counter() - t0
    timings["total_s"] = sum(v for k_, v in timings.items() if k_.endswith("_s"))

    memory["peak_bytes"] = max(
        memory.get("name_bytes", 0), memory.get("structure_bytes", 0)
    )
    return LargeEAResult(
        m=m,
        m_s=m_s,
        m_n=m_n,
        metrics_src=metrics_src,
        metrics_tgt=metrics_tgt,
        timings=timings,
        memory=memory,
        da_stats=da_stats,
        batches=batches,
    )
