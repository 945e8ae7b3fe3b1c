"""Tests for VPS and METIS-CPS mini-batch generation."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.metis_cps import _greedy_match, cps_reweight, metis_cps_batches
from repro.core.vps import vps_batches
from repro.partition.quality import co_location_rate


K = 3


@pytest.fixture(scope="module")
def vps_b(spark, unit_kg):
    return vps_batches(unit_kg, unit_kg.train, K, seed=0).localCheckpoint(eager=True)


@pytest.fixture(scope="module")
def cps_b(spark, unit_kg):
    return metis_cps_batches(spark, unit_kg, unit_kg.train, K, seed=0).localCheckpoint(
        eager=True
    )


def _coverage(batches, kg):
    n_s = batches.where("side = 's'").count()
    n_t = batches.where("side = 't'").count()
    return n_s, n_t


# ------------------------------------------------------------------ VPS
def test_vps_covers_all_entities(vps_b, unit_kg):
    assert _coverage(vps_b, unit_kg) == (300, 300)
    assert vps_b.select("batch").distinct().count() == K


def test_vps_train_seeds_fully_colocated(vps_b, unit_kg):
    assert co_location_rate(unit_kg.train, vps_b) == 1.0


def test_vps_seeds_balanced_across_batches(vps_b, unit_kg):
    per = (
        unit_kg.train.join(
            vps_b.where("side='s'").select(F.col("eid").alias("src"), "batch"), "src"
        )
        .groupBy("batch").count().toPandas()
    )
    assert per["count"].max() - per["count"].min() <= 1


def test_vps_test_colocation_is_poor(vps_b, unit_kg):
    # Random placement co-locates ~1/K of unseen pairs.
    rate = co_location_rate(unit_kg.test, vps_b)
    assert rate < 0.55


# ------------------------------------------------------------ METIS-CPS
def test_cps_covers_all_entities(cps_b, unit_kg):
    assert _coverage(cps_b, unit_kg) == (300, 300)
    assert cps_b.select("batch").distinct().count() == K


def test_cps_beats_vps_on_test_colocation(cps_b, vps_b, unit_kg):
    """The paper's Table 5 headline: METIS-CPS >> VPS on the test set."""
    cps_rate = co_location_rate(unit_kg.test, cps_b)
    vps_rate = co_location_rate(unit_kg.test, vps_b)
    assert cps_rate > vps_rate + 0.1, (cps_rate, vps_rate)


def test_cps_train_colocation_high(cps_b, unit_kg):
    assert co_location_rate(unit_kg.train, cps_b) > 0.6


def test_cps_batches_roughly_balanced(cps_b):
    for side in ("s", "t"):
        loads = (
            cps_b.where(f"side = '{side}'").groupBy("batch").count().toPandas()["count"]
        )
        assert loads.max() <= 1.35 * (300 / K)


# ------------------------------------------------------- CPS reweighting
def test_cps_reweight_rules(spark):
    triples_t = spark.createDataFrame(
        pd.DataFrame({"h": [1, 1, 3, 5], "r": [0] * 4, "t": [2, 3, 4, 6]})
    )
    # seeds' target counterparts: 1, 2 in source part 0; 3, 4 in part 1.
    seed_parts = spark.createDataFrame(
        pd.DataFrame({"tgt": [1, 2, 3, 4], "part": [0, 0, 1, 1]})
    )
    out = cps_reweight(triples_t, seed_parts, w_high=99.0).toPandas()
    w = {(r.src, r.dst): r.weight for r in out.itertuples()}
    assert w[(1, 2)] == 99.0  # same-part seed pair -> w'
    assert w[(1, 3)] == 0.0  # cross-part seed pair -> 0 (phase 2)
    assert w[(3, 4)] == 99.0  # same-part seed pair -> w'
    assert w[(5, 6)] == 1.0  # non-seed edge keeps weight 1
    # virtual hub stars: hub is min tgt per part (1 and 3)
    assert w[(1, 2)] == 99.0 and (3, 4) in w
    assert (1, 1) not in w


def test_cps_virtual_star_connects_group(spark):
    triples_t = spark.createDataFrame(pd.DataFrame({"h": [9], "r": [0], "t": [8]}))
    seed_parts = spark.createDataFrame(
        pd.DataFrame({"tgt": [10, 11, 12], "part": [0, 0, 0]})
    )
    out = cps_reweight(triples_t, seed_parts, w_high=50.0).toPandas()
    stars = out[(out.src == 10) & (out.weight == 50.0)]
    assert set(stars.dst) == {11, 12}


# ---------------------------------------------------------- batch match
def test_greedy_match_prefers_heavy_pairs():
    counts = [(0, 1, 10), (0, 0, 3), (1, 0, 7), (1, 1, 9)]
    m = _greedy_match(counts, 2)
    assert m == {1: 0, 0: 1}


def test_greedy_match_fills_unmatched():
    m = _greedy_match([], 3)
    assert sorted(m) == [0, 1, 2]
    assert sorted(m.values()) == [0, 1, 2]
