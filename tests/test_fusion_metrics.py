"""Tests for score fusion and ranking metrics (oracle-checked)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.fusion import fuse, minmax_normalize
from repro.eval.metrics import evaluate
from repro.oracle import assert_equivalent


@pytest.fixture()
def m(spark):
    return spark.createDataFrame(
        pd.DataFrame(
            {
                "src": [1, 1, 2, 2, 3],
                "tgt": [10, 11, 10, 11, 12],
                "score": [5.0, 1.0, 2.0, 4.0, 3.0],
            }
        )
    )


def test_minmax_bounds(spark, m):
    out = minmax_normalize(m)
    row = out.agg(F.min("score"), F.max("score")).collect()[0]
    assert row[0] == pytest.approx(0.0)
    assert row[1] == pytest.approx(1.0)


def test_minmax_oracle(spark, m):
    assert_equivalent(
        minmax_normalize(m),
        """
        SELECT src, tgt,
               (score - MIN(score) OVER ()) / (MAX(score) OVER () - MIN(score) OVER ()) AS score
        FROM m
        """,
        m=m,
    )


def test_minmax_constant_matrix(spark):
    m = spark.createDataFrame(pd.DataFrame({"src": [1], "tgt": [2], "score": [7.0]}))
    assert minmax_normalize(m).collect()[0]["score"] == 1.0


def test_fuse_outer_sum(spark, m):
    m2 = spark.createDataFrame(
        pd.DataFrame({"src": [1, 9], "tgt": [10, 90], "score": [1.0, 2.0]})
    )
    out = fuse((m, 1.0), (m2, 0.5))
    assert_equivalent(
        out,
        """
        SELECT src, tgt, SUM(score) AS score FROM (
          SELECT src, tgt, score * 1.0 AS score FROM a
          UNION ALL
          SELECT src, tgt, score * 0.5 AS score FROM b
        ) GROUP BY src, tgt
        """,
        a=m,
        b=m2,
    )


def test_fuse_requires_input():
    with pytest.raises(ValueError):
        fuse()


def test_evaluate_by_src(spark, m):
    truth = spark.createDataFrame(pd.DataFrame({"src": [1, 2, 3], "tgt": [10, 11, 12]}))
    got = evaluate(m, truth, by="src")
    # ranks: (1,10) rank1; (2,11) rank1; (3,12) rank1 -> perfect
    assert got["hits1"] == 1.0 and got["mrr"] == 1.0


def test_evaluate_by_tgt(spark, m):
    truth = spark.createDataFrame(pd.DataFrame({"src": [1, 2], "tgt": [10, 11]}))
    got = evaluate(m, truth, by="tgt")
    # per-tgt ranks: tgt 10 candidates {1:5, 2:2} -> (1,10) rank1;
    # tgt 11 candidates {2:4, 1:1} -> (2,11) rank1
    assert got["hits1"] == 1.0


def test_evaluate_missing_pair_counts_as_miss(spark, m):
    truth = spark.createDataFrame(pd.DataFrame({"src": [1, 99], "tgt": [10, 990]}))
    got = evaluate(m, truth, by="src")
    assert got["hits1"] == 0.5
    assert got["mrr"] == pytest.approx(0.5)


def test_evaluate_rank_oracle(spark, m):
    """Cross-check the window-rank logic against DuckDB."""
    ranked = m.withColumn(
        "rank",
        F.row_number().over(
            __import__("pyspark.sql.window", fromlist=["Window"]).Window.partitionBy(
                "src"
            ).orderBy(F.desc("score"), F.asc("tgt"))
        ),
    )
    assert_equivalent(
        ranked,
        """
        SELECT src, tgt, score,
               ROW_NUMBER() OVER (PARTITION BY src ORDER BY score DESC, tgt ASC) AS rank
        FROM m
        """,
        m=m,
    )


def test_evaluate_empty_truth(spark, m):
    empty = spark.createDataFrame([], "src long, tgt long")
    got = evaluate(m, empty)
    assert got == {"hits1": 0.0, "hits5": 0.0, "mrr": 0.0, "n": 0}


def test_hits5_between_hits1_and_one(spark, m):
    truth = spark.createDataFrame(pd.DataFrame({"src": [1, 2, 3], "tgt": [11, 10, 12]}))
    got = evaluate(m, truth, by="src")
    assert got["hits1"] <= got["hits5"] <= 1.0
