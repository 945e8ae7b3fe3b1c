"""VPS — the vanilla partition strategy (Section 2.2.1).

Seeds are dealt round-robin into the K mini-batches (so every batch has
an equal seed share, the paper's stated requirement); all remaining
entities are hashed uniformly into batches. O(|E_s|+|E_t|) time/space.
"""
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.kgdata.benchmark import KGPair


def vps_batches(kg: KGPair, seeds: DataFrame, k: int, *, seed: int = 0) -> DataFrame:
    """Assign every entity of both KGs to one of ``k`` mini-batches.

    Returns DataFrame (side, eid, batch) with side in {'s', 't'}; a
    seed pair's two entities always share a batch.
    """
    w = Window.orderBy("src", "tgt")
    seeded = seeds.withColumn("batch", ((F.row_number().over(w) - 1) % k).cast("int"))
    seed_s = seeded.select(F.lit("s").alias("side"), F.col("src").alias("eid"), "batch")
    seed_t = seeded.select(F.lit("t").alias("side"), F.col("tgt").alias("eid"), "batch")

    def _rest(names: DataFrame, side: str, taken: DataFrame) -> DataFrame:
        return (
            names.select(F.col("eid"))
            .join(taken.select("eid"), "eid", "left_anti")
            .select(
                F.lit(side).alias("side"),
                "eid",
                F.pmod(F.hash("eid", F.lit(seed)), F.lit(k)).cast("int").alias("batch"),
            )
        )

    return (
        seed_s.unionByName(seed_t)
        .unionByName(_rest(kg.names_s, "s", seed_s))
        .unionByName(_rest(kg.names_t, "t", seed_t))
    )
