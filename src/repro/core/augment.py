"""Name-based data augmentation (Section 2.3).

Pseudo seeds are pairs that are *mutually* most similar under the name
matrix M_n — the cycle-consistency constraint the paper borrows from
word translation. Entities already covered by real seeds are excluded
so augmentation only adds new supervision.
"""
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F


def augment_seeds(m_n: DataFrame, existing: DataFrame = None) -> DataFrame:
    """Pseudo seed pairs (src, tgt): mutual top-1 matches in M_n."""
    w_src = Window.partitionBy("src").orderBy(F.desc("score"), F.asc("tgt"))
    w_tgt = Window.partitionBy("tgt").orderBy(F.desc("score"), F.asc("src"))
    mutual = (
        m_n.withColumn("rs", F.row_number().over(w_src))
        .withColumn("rt", F.row_number().over(w_tgt))
        .where((F.col("rs") == 1) & (F.col("rt") == 1))
        .select("src", "tgt")
    )
    if existing is not None:
        mutual = mutual.join(existing.select("src"), "src", "left_anti").join(
            existing.select("tgt"), "tgt", "left_anti"
        )
    return mutual.select("src", "tgt")


def augmentation_accuracy(pseudo: DataFrame, alignment: DataFrame) -> dict:
    """Case-study stats (Section 3.5): seed count and precision.

    Precision counts a pseudo seed as correct iff it appears in the
    ground-truth alignment (pairs touching unknown entities are wrong by
    definition, as in the paper).
    """
    n = pseudo.count()
    correct = pseudo.join(alignment, ["src", "tgt"]).count()
    return {"n_seeds": n, "accuracy": correct / n if n else 0.0}
