"""Tests for SENS, STNS, NFF fusion, and data augmentation."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.augment import augment_seeds, augmentation_accuracy
from repro.core.name_channel import name_channel
from repro.core.sens import embed_names, sens
from repro.core.stns import stns
from repro.eval.metrics import evaluate
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def nff(spark, unit_kg):
    m_n, comp = name_channel(
        spark, unit_kg, dim=32, k_top=20, n_segments=2, seed=0
    )
    return m_n.localCheckpoint(eager=True), comp


# ----------------------------------------------------------------- SENS
def test_embed_names_shape(spark, unit_kg):
    emb = embed_names(spark, unit_kg.names_s, unit_kg.lexicons, "en", dim=32).limit(5).toPandas()
    assert len(emb) == 5
    assert all(len(e) == 32 for e in emb.emb)


def test_sens_topk_bound(spark, unit_kg):
    m_se, info = sens(
        spark, unit_kg.names_s, unit_kg.names_t, unit_kg.lexicons,
        unit_kg.langs, dim=32, k_top=10, n_segments=2, seed=0,
    )
    # The O(k(|E_s|+|E_t|)) sparsity bound: per-src top-k plus per-tgt
    # top-k can never exceed k rows per entity per direction.
    assert m_se.count() <= 10 * (300 + 300)
    assert info["n_segments"] == 2


def test_sens_segmentation_invariant(spark, unit_kg):
    """Segment count must not change the per-src top-k result set."""
    kw = dict(dim=32, k_top=5, seed=0)
    m1, _ = sens(spark, unit_kg.names_s, unit_kg.names_t, unit_kg.lexicons, unit_kg.langs, n_segments=1, **kw)
    m3, _ = sens(spark, unit_kg.names_s, unit_kg.names_t, unit_kg.lexicons, unit_kg.langs, n_segments=3, **kw)
    a = m1.toPandas().sort_values(["src", "tgt"]).reset_index(drop=True)
    b = m3.toPandas().sort_values(["src", "tgt"]).reset_index(drop=True)
    pd.testing.assert_frame_equal(a, b, check_dtype=False, atol=1e-9)


def test_sens_finds_true_pairs(spark, unit_kg, nff):
    _, comp = nff
    metrics = evaluate(comp["m_se"], unit_kg.test, by="src")
    assert metrics["hits1"] > 0.4  # semantic names alone are informative


# ----------------------------------------------------------------- STNS
@pytest.fixture(scope="module")
def m_st(spark, unit_kg):
    return stns(spark, unit_kg.names_s, unit_kg.names_t, theta=0.4, seed=0).localCheckpoint(
        eager=True
    )


def test_stns_scores_in_unit_interval(m_st):
    row = m_st.agg(F.min("score"), F.max("score")).collect()[0]
    assert row[0] >= 0.0 and row[1] <= 1.0


def test_stns_is_sparse(m_st, unit_kg):
    assert m_st.count() < 300 * 300 * 0.05


def test_stns_levenshtein_matches_oracle(spark):
    # bands == n_hash (one row per band) makes any shared minhash slot a
    # candidate, so the pair is guaranteed to surface for verification.
    names_s = spark.createDataFrame(pd.DataFrame({"eid": [1], "name": ["abcdef"]}))
    names_t = spark.createDataFrame(pd.DataFrame({"eid": [2], "name": ["abcdxf"]}))
    out = stns(spark, names_s, names_t, theta=0.15, n_hash=32, bands=32)
    rows = out.collect()
    assert len(rows) == 1
    assert rows[0]["score"] == pytest.approx(1 - 1 / 6)


def test_stns_theta_filters(spark):
    names_s = spark.createDataFrame(pd.DataFrame({"eid": [1], "name": ["aaaaaa"]}))
    names_t = spark.createDataFrame(pd.DataFrame({"eid": [2], "name": ["zzzzzz"]}))
    assert stns(spark, names_s, names_t, theta=0.5).count() == 0


# ------------------------------------------------------------------ NFF
def test_nff_combines_channels(nff, unit_kg):
    m_n, comp = nff
    # Fused matrix covers at least the semantic entries.
    assert m_n.count() >= comp["m_se"].count()
    metrics = evaluate(m_n, unit_kg.test, by="src")
    se_metrics = evaluate(comp["m_se"], unit_kg.test, by="src")
    assert metrics["hits1"] >= se_metrics["hits1"] - 0.02


# ---------------------------------------------------------- augmentation
def test_augment_mutual_top1(spark):
    m = spark.createDataFrame(
        pd.DataFrame(
            {
                "src": [1, 1, 2, 2, 3],
                "tgt": [10, 11, 10, 11, 12],
                "score": [0.9, 0.2, 0.3, 0.8, 0.7],
            }
        )
    )
    got = {tuple(r) for r in augment_seeds(m).collect()}
    assert got == {(1, 10), (2, 11), (3, 12)}


def test_augment_excludes_existing(spark):
    m = spark.createDataFrame(
        pd.DataFrame({"src": [1, 2], "tgt": [10, 11], "score": [0.9, 0.8]})
    )
    existing = spark.createDataFrame(pd.DataFrame({"src": [1], "tgt": [10]}))
    got = {tuple(r) for r in augment_seeds(m, existing).collect()}
    assert got == {(2, 11)}


def test_augmentation_quality_on_unit(nff, unit_kg):
    m_n, _ = nff
    pseudo = augment_seeds(m_n, existing=unit_kg.train)
    stats = augmentation_accuracy(pseudo, unit_kg.alignment)
    # Paper reports ~94 % DA accuracy; the lite generator should land high.
    assert stats["n_seeds"] > 50
    assert stats["accuracy"] > 0.8


def test_augmentation_accuracy_empty(spark, unit_kg):
    empty = spark.createDataFrame([], "src long, tgt long")
    assert augmentation_accuracy(empty, unit_kg.alignment) == {"n_seeds": 0, "accuracy": 0.0}
