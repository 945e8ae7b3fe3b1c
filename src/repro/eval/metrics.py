"""Ranking metrics over a sparse similarity matrix (Spark windows).

Hits@N and MRR follow the paper's protocol: for each ground-truth test
pair, rank the true counterpart among the stored candidates of the
query entity (score descending, id ascending ties). A pair whose true
counterpart is absent from the sparse matrix counts as a miss (rank
infinity -> contributes 0 to every metric), so sparsity is penalised,
never hidden.
"""
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F


def evaluate(m: DataFrame, truth: DataFrame, *, by: str = "src") -> dict:
    """Hits@1/5 and MRR of matrix ``m`` against ``truth`` pairs.

    Args:
        m: sparse similarity (src, tgt, score).
        truth: ground-truth pairs (src, tgt) — normally the test split.
        by: ``"src"`` ranks candidates per source entity (EN->L in the
            tables); ``"tgt"`` ranks per target entity (L->EN).
    """
    other = "tgt" if by == "src" else "src"
    w = Window.partitionBy(by).orderBy(F.desc("score"), F.asc(other))
    ranked = m.withColumn("rank", F.row_number().over(w))
    n = truth.count()
    if n == 0:
        return {"hits1": 0.0, "hits5": 0.0, "mrr": 0.0, "n": 0}
    row = (
        truth.join(ranked, ["src", "tgt"], "left")
        .agg(
            F.sum(F.when(F.col("rank") == 1, 1).otherwise(0)).alias("h1"),
            F.sum(F.when(F.col("rank") <= 5, 1).otherwise(0)).alias("h5"),
            F.sum(F.coalesce(1.0 / F.col("rank"), F.lit(0.0))).alias("rr"),
        )
        .collect()[0]
    )
    return {
        "hits1": (row["h1"] or 0) / n,
        "hits5": (row["h5"] or 0) / n,
        "mrr": (row["rr"] or 0.0) / n,
        "n": n,
    }
