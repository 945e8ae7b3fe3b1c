"""METIS-CPS — the collaborative partition strategy (Section 2.2.1).

Workflow, exactly as the paper's Figure 3:

1. Partition the source KG with the (METIS-stand-in) balanced
   partitioner on unit edge weights.
2. Phase 1 — for each source part i, take the target-side counterparts
   L_t^i of its seeds; add *virtual* star edges from q=1 hub per group
   and raise all intra-group edges (virtual and existing) to w' >> 1, so
   the group resists being split.
3. Phase 2 — target edges whose endpoints counterpart-map into
   *different* source parts get weight 0, so they stop attracting.
4. Partition the reweighted target KG.
5. Pair each source part with the target part sharing the most seeds
   (greedy max matching on the K x K seed-count table) to form the K
   mini-batches.
"""
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.kgdata.benchmark import KGPair
from repro.partition import lpa


def _edges(triples: DataFrame) -> DataFrame:
    return triples.select(
        F.col("h").alias("src"), F.col("t").alias("dst"), F.lit(1.0).alias("weight")
    )


def _nodes(names: DataFrame) -> DataFrame:
    return names.select(F.col("eid").alias("node"))


def cps_reweight(
    triples_t: DataFrame, seed_parts: DataFrame, *, w_high: float = 1000.0
) -> DataFrame:
    """Reweighted target edge list (phases 1 and 2).

    Args:
        triples_t: target triples (h, r, t).
        seed_parts: (tgt, part) — target-side seed entities with the
            source part of their counterpart.
        w_high: the w' >> 1 attraction weight.

    Returns:
        (src, dst, weight) edges: original edges reweighted {w_high if
        both endpoints are seeds of the same source part; 0 if seeds of
        different parts; 1 otherwise} plus the virtual star edges.
    """
    pu = seed_parts.select(F.col("tgt").alias("src"), F.col("part").alias("pu"))
    pv = seed_parts.select(F.col("tgt").alias("dst"), F.col("part").alias("pv"))
    real = (
        _edges(triples_t)
        .join(pu, "src", "left")
        .join(pv, "dst", "left")
        .select(
            "src",
            "dst",
            F.when(
                F.col("pu").isNotNull() & F.col("pv").isNotNull(),
                F.when(F.col("pu") == F.col("pv"), F.lit(w_high)).otherwise(F.lit(0.0)),
            )
            .otherwise(F.lit(1.0))
            .alias("weight"),
        )
    )
    # q = 1 virtual hub per group: the minimum tgt id, as a deterministic
    # stand-in for the paper's random singleton Q.
    hubs = seed_parts.groupBy("part").agg(F.min("tgt").alias("hub"))
    virtual = (
        seed_parts.join(hubs, "part")
        .where(F.col("tgt") != F.col("hub"))
        .select(
            F.col("hub").alias("src"),
            F.col("tgt").alias("dst"),
            F.lit(w_high).alias("weight"),
        )
    )
    return real.unionByName(virtual)


def _greedy_match(counts: list, k: int) -> dict:
    """Greedy max matching src part -> tgt part on seed co-counts."""
    taken_s, taken_t, mapping = set(), set(), {}
    for ps, pt, _ in sorted(counts, key=lambda r: (-r[2], r[0], r[1])):
        if ps in taken_s or pt in taken_t:
            continue
        mapping[pt] = ps
        taken_s.add(ps)
        taken_t.add(pt)
    free_s = [p for p in range(k) if p not in taken_s]
    for pt in range(k):
        if pt not in mapping:
            mapping[pt] = free_s.pop() if free_s else pt
    return mapping


def metis_cps_batches(
    spark: SparkSession,
    kg: KGPair,
    seeds: DataFrame,
    k: int,
    *,
    w_high: float = 1000.0,
    seed: int = 0,
    lpa_kwargs: dict = None,
) -> DataFrame:
    """Mini-batch assignment (side, eid, batch) via METIS-CPS.

    Batch ids equal source part ids; each target part maps onto the
    source part it shares the most seeds with.
    """
    lpa_kwargs = lpa_kwargs or {}
    src_parts = lpa.partition(
        spark, _edges(kg.triples_s), _nodes(kg.names_s), k, seed=seed, **lpa_kwargs
    )
    seed_parts = seeds.join(
        src_parts.select(F.col("node").alias("src"), "part"), "src"
    ).select("tgt", "part")
    tgt_edges = cps_reweight(kg.triples_t, seed_parts, w_high=w_high)
    tgt_parts = lpa.partition(
        spark, tgt_edges, _nodes(kg.names_t), k, seed=seed + 1, **lpa_kwargs
    )

    counts = [
        (r["ps"], r["pt"], r["cnt"])
        for r in seeds.join(src_parts.select(F.col("node").alias("src"), F.col("part").alias("ps")), "src")
        .join(tgt_parts.select(F.col("node").alias("tgt"), F.col("part").alias("pt")), "tgt")
        .groupBy("ps", "pt")
        .agg(F.count("*").alias("cnt"))
        .collect()
    ]
    mapping = _greedy_match(counts, k)
    map_df = spark.createDataFrame(
        [(int(pt), int(ps)) for pt, ps in mapping.items()], "pt int, batch int"
    )
    out_s = src_parts.select(
        F.lit("s").alias("side"), F.col("node").alias("eid"), F.col("part").cast("int").alias("batch")
    )
    out_t = (
        tgt_parts.join(map_df, tgt_parts.part == map_df.pt)
        .select(F.lit("t").alias("side"), F.col("node").alias("eid"), F.col("batch").cast("int"))
    )
    return out_s.unionByName(out_t)
