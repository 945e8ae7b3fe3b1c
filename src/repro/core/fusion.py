"""Score normalisation and sparse-matrix fusion.

Channels produce scores on incomparable scales (negative Manhattan vs
[0, 1] edit similarity), so each matrix is min-max normalised globally
before the paper's additive fusions M_n = M_se + γ·M_st and
M = M_s + M_n. Fusion of sparse matrices is a union + groupBy sum —
a missing entry is an implicit 0, as in the paper's sparse storage.
"""
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def minmax_normalize(m: DataFrame) -> DataFrame:
    """Min-max normalise the ``score`` column to [0, 1] globally.

    A constant (or empty) matrix maps to all-ones to keep ordering
    stable under the downstream additive fusion.
    """
    row = m.agg(F.min("score").alias("lo"), F.max("score").alias("hi")).collect()[0]
    lo, hi = row["lo"], row["hi"]
    if lo is None or hi is None or hi - lo < 1e-12:
        return m.select("src", "tgt", F.lit(1.0).alias("score"))
    return m.select(
        "src", "tgt", ((F.col("score") - F.lit(lo)) / F.lit(hi - lo)).alias("score")
    )


def fuse(*weighted: tuple) -> DataFrame:
    """Weighted sparse sum: ``fuse((m1, w1), (m2, w2), ...)``.

    Each ``m`` is a (src, tgt, score) DataFrame; the result sums
    ``w * score`` over all matrices, with absent entries contributing 0.
    """
    if not weighted:
        raise ValueError("need at least one matrix")
    parts = [
        m.select("src", "tgt", (F.col("score") * F.lit(float(w))).alias("score"))
        for m, w in weighted
    ]
    out = parts[0]
    for p in parts[1:]:
        out = out.unionByName(p)
    return out.groupBy("src", "tgt").agg(F.sum("score").alias("score"))
