"""STNS — string name similarity (Section 2.3, Function STNS).

MinHash-LSH (the datasketch stand-in) proposes candidate pairs, pairs
with estimated Jaccard >= theta survive, and only survivors pay for a
Levenshtein computation (Spark's built-in ``levenshtein``). The final
score is a normalised edit similarity in [0, 1].
"""
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import DoubleType

from repro.text.minhash import band_hashes, signatures


def _band_rows(
    names: DataFrame, *, n_hash: int, bands: int, seed: int
) -> DataFrame:
    """(eid, name, band, digest, sig) — one row per LSH band per entity."""

    def _expand(it):
        for pdf in it:
            sig = signatures(list(pdf["name"]), n_hash, seed=seed)
            rows = []
            for i, (eid, name) in enumerate(zip(pdf.eid, pdf.name)):
                for band, digest in band_hashes(sig[i], bands):
                    rows.append((int(eid), name, band, int(digest), sig[i].tolist()))
            yield pd.DataFrame(
                rows, columns=["eid", "name", "band", "digest", "sig"]
            )

    return names.mapInPandas(
        _expand, schema="eid long, name string, band int, digest long, sig array<long>"
    )


@F.pandas_udf(DoubleType())
def _est_jaccard(sig_a: pd.Series, sig_b: pd.Series) -> pd.Series:
    import numpy as np

    return pd.Series(
        [float(np.mean(np.asarray(a) == np.asarray(b))) for a, b in zip(sig_a, sig_b)]
    )


def stns(
    spark: SparkSession,
    names_s: DataFrame,
    names_t: DataFrame,
    *,
    theta: float = 0.5,
    n_hash: int = 32,
    bands: int = 8,
    seed: int = 0,
) -> DataFrame:
    """Sparse string similarity M_st (src, tgt, score in [0, 1]).

    score = 1 - levenshtein / max(|name_s|, |name_t|), computed only for
    LSH candidates whose MinHash-estimated Jaccard >= theta.
    """
    bs = _band_rows(names_s, n_hash=n_hash, bands=bands, seed=seed).select(
        F.col("eid").alias("src"), F.col("name").alias("name_s"),
        "band", "digest", F.col("sig").alias("sig_s"),
    )
    bt = _band_rows(names_t, n_hash=n_hash, bands=bands, seed=seed).select(
        F.col("eid").alias("tgt"), F.col("name").alias("name_t"),
        "band", "digest", F.col("sig").alias("sig_t"),
    )
    cands = (
        bs.join(bt, ["band", "digest"])
        .select("src", "tgt", "name_s", "name_t", "sig_s", "sig_t")
        .dropDuplicates(["src", "tgt"])
    )
    return (
        cands.withColumn("jac", _est_jaccard("sig_s", "sig_t"))
        .where(F.col("jac") >= theta)
        .select(
            "src",
            "tgt",
            (
                F.lit(1.0)
                - F.levenshtein("name_s", "name_t")
                / F.greatest(F.length("name_s"), F.length("name_t"))
            ).alias("score"),
        )
    )
