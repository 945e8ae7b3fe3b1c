"""Partition-quality metrics: edge-cut rate, balance, seed co-location.

``edge_cut_rate`` is the paper's Appendix-B metric R_ec (fraction of
triples whose endpoints land in different parts). ``co_location_rate``
is the Table 5 metric (fraction of equivalent pairs placed in the same
mini-batch).
"""
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def edge_cut_rate(triples: DataFrame, parts: DataFrame) -> float:
    """Fraction of (h, r, t) triples with h and t in different parts."""
    total = triples.count()
    if total == 0:
        return 0.0
    joined = (
        triples.join(parts.select(F.col("node").alias("h"), F.col("part").alias("ph")), "h")
        .join(parts.select(F.col("node").alias("t"), F.col("part").alias("pt")), "t")
    )
    cut = joined.where(F.col("ph") != F.col("pt")).count()
    return cut / total


def balance(parts: DataFrame, k: int) -> float:
    """Max part load divided by the ideal load n/k (1.0 = perfect)."""
    loads = [r["cnt"] for r in parts.groupBy("part").agg(F.count("*").alias("cnt")).collect()]
    n = sum(loads)
    if n == 0:
        return 1.0
    return max(loads) / (n / k)


def co_location_rate(pairs: DataFrame, batches: DataFrame) -> float:
    """Fraction of (src, tgt) pairs whose entities share a mini-batch.

    ``batches`` has columns (side, eid, batch) with side in {'s', 't'}.
    Pairs whose either endpoint is missing from ``batches`` count as
    not co-located.
    """
    total = pairs.count()
    if total == 0:
        return 0.0
    b_s = batches.where("side = 's'").select(F.col("eid").alias("src"), F.col("batch").alias("bs"))
    b_t = batches.where("side = 't'").select(F.col("eid").alias("tgt"), F.col("batch").alias("bt"))
    same = (
        pairs.join(b_s, "src").join(b_t, "tgt").where(F.col("bs") == F.col("bt")).count()
    )
    return same / total
