"""Tests for the structure channel (Algorithm 1)."""
import pytest
from pyspark.sql import functions as F

from repro.core.metis_cps import metis_cps_batches
from repro.core.structure_channel import single_batch, structure_channel
from repro.eval.metrics import evaluate


@pytest.fixture(scope="module")
def channel(spark, unit_kg):
    batches = metis_cps_batches(spark, unit_kg, unit_kg.train, 3, seed=0)
    m_s, info = structure_channel(
        spark, unit_kg, batches, unit_kg.train, model="rrea", dim=32, k_top=8, seed=0
    )
    return m_s.localCheckpoint(eager=True), info, batches.localCheckpoint(eager=True)


def test_ms_is_sparse(channel, unit_kg):
    m_s, _, _ = channel
    n = m_s.count()
    assert 0 < n < 300 * 300 * 0.2  # far from dense


def test_ms_block_diagonal(channel):
    """All similarity entries stay within one mini-batch (the paper's
    block-diagonal M_s)."""
    m_s, _, batches = channel
    b_s = batches.where("side='s'").select(F.col("eid").alias("src"), F.col("batch").alias("bs"))
    b_t = batches.where("side='t'").select(F.col("eid").alias("tgt"), F.col("batch").alias("bt"))
    crossing = m_s.join(b_s, "src").join(b_t, "tgt").where("bs <> bt").count()
    assert crossing == 0


def test_structure_alone_beats_random(channel, unit_kg):
    m_s, _, _ = channel
    metrics = evaluate(m_s, unit_kg.test, by="src")
    assert metrics["hits1"] > 0.05  # random over 300 would be ~0.003


def test_info_reports_batches(channel):
    _, info, _ = channel
    assert info["n_batches"] == 3
    assert info["peak_bytes"] > 0


def test_rrea_peak_includes_quadratic_term(spark, unit_kg):
    b = single_batch(spark, unit_kg)
    _, info_r = structure_channel(spark, unit_kg, b, unit_kg.train, model="rrea", dim=16, k_top=4)
    _, info_g = structure_channel(spark, unit_kg, b, unit_kg.train, model="gcn", dim=16, k_top=4)
    assert info_r["peak_bytes"] - info_g["peak_bytes"] == 300 * 300 * 4


def test_partition_shrinks_peak_memory(spark, unit_kg, channel):
    _, info_part, _ = channel
    b = single_batch(spark, unit_kg)
    _, info_full = structure_channel(
        spark, unit_kg, b, unit_kg.train, model="rrea", dim=32, k_top=8
    )
    assert info_part["peak_bytes"] < info_full["peak_bytes"]


def test_single_batch_covers_everything(spark, unit_kg):
    b = single_batch(spark, unit_kg)
    assert b.count() == 600
    assert b.select("batch").distinct().collect()[0][0] == 0
