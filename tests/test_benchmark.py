"""Tests for benchmark assembly (KGPair)."""
import pytest
from pyspark.sql import functions as F

from repro.kgdata import dataset_stats, make_benchmark
from repro.oracle import assert_equivalent


def test_unit_sizes(unit_kg):
    assert unit_kg.names_s.count() == 300
    assert unit_kg.names_t.count() == 300
    assert unit_kg.alignment.count() == 300


def test_split_ratio(unit_kg):
    assert unit_kg.train.count() == 60  # 20 % of 300
    assert unit_kg.test.count() == 240
    # train and test are disjoint and cover the alignment
    assert unit_kg.train.join(unit_kg.test, ["src", "tgt"]).count() == 0
    assert unit_kg.train.count() + unit_kg.test.count() == unit_kg.alignment.count()


def test_alignment_is_one_to_one(unit_kg):
    a = unit_kg.alignment
    assert a.select("src").distinct().count() == a.count()
    assert a.select("tgt").distinct().count() == a.count()


def test_unknown_entities_not_in_alignment(unitk_kg):
    n_s, n_t = unitk_kg.meta["n_entities"]
    assert (n_s, n_t) == (420, 360)
    aligned_src = unitk_kg.alignment.select("src").distinct().count()
    assert aligned_src == 300  # the other 120 source entities are unknown


def test_triples_reference_known_ids(unit_kg):
    ids = unit_kg.names_s.select(F.col("eid").alias("h"))
    bad = unit_kg.triples_s.join(ids, "h", "left_anti").count()
    assert bad == 0


def test_stats_match_oracle(spark, unit_kg):
    st = dataset_stats(unit_kg)
    agg = unit_kg.triples_s.agg(
        F.count(F.lit(1)).alias("n_triples"), F.countDistinct("r").alias("n_relations")
    )
    assert_equivalent(
        agg,
        "SELECT COUNT(*) AS n_triples, COUNT(DISTINCT r) AS n_relations FROM t",
        t=unit_kg.triples_s,
    )
    assert st["source"]["triples"] == unit_kg.triples_s.count()


def test_swapped_roundtrip(unit_kg):
    sw = unit_kg.swapped()
    assert sw.langs == ("fr", "en")
    assert sw.triples_s.count() == unit_kg.triples_t.count()
    pairs = set(map(tuple, unit_kg.alignment.toPandas().to_numpy()))
    sw_pairs = set(map(tuple, sw.alignment.select("tgt", "src").toPandas().to_numpy()))
    assert pairs == sw_pairs


def test_train_ratio_zero(spark):
    kg = make_benchmark(spark, "unit", "en-fr", train_ratio=0.0, seed=7)
    assert kg.train.count() == 0
    assert kg.test.count() == kg.alignment.count()


def test_deterministic(spark, unit_kg):
    again = make_benchmark(spark, "unit", "en-fr", seed=7)
    a = unit_kg.alignment.toPandas().sort_values(["src", "tgt"]).reset_index(drop=True)
    b = again.alignment.toPandas().sort_values(["src", "tgt"]).reset_index(drop=True)
    assert a.equals(b)
    assert unit_kg.names_s.toPandas().sort_values("eid").name.tolist() == \
        again.names_s.toPandas().sort_values("eid").name.tolist()


def test_unknown_benchmark_rejected(spark):
    with pytest.raises(KeyError):
        make_benchmark(spark, "nope", "en-fr")


@pytest.mark.parametrize("ds,langs", [("ids15k", "en-fr"), ("ids15k", "en-de")])
def test_scaled_paper_configs(spark, ds, langs):
    kg = make_benchmark(spark, ds, langs, scale=0.1, seed=7)
    n_s, n_t = kg.meta["n_entities"]
    assert n_s == n_t == 150
    assert kg.default_k == 5
