"""End-to-end pipeline tests (supervised, unsupervised, ablations)."""
import pytest

from repro.core.pipeline import run_largeea

_FAST = dict(dim=32, k_top_name=20, n_segments=2, k_top_struct=8, k=3)


@pytest.fixture(scope="module")
def result(spark, unit_kg):
    return run_largeea(spark, unit_kg, model="rrea", **_FAST)


def test_metrics_reasonable(result):
    assert result.metrics_src["hits1"] > 0.6
    assert result.metrics_tgt["hits1"] > 0.6
    assert result.metrics_src["hits5"] >= result.metrics_src["hits1"]
    assert 0 < result.metrics_src["mrr"] <= 1


def test_timings_and_memory_populated(result):
    for key in ("name_channel_s", "partition_s", "structure_channel_s", "fusion_s", "total_s"):
        assert result.timings[key] >= 0
    assert result.memory["peak_bytes"] > 0
    assert result.memory["structure_bytes"] > 0


def test_da_stats(result):
    assert result.da_stats["n_seeds"] > 0
    assert result.da_stats["accuracy"] > 0.8


def test_full_beats_structure_only(spark, unit_kg, result):
    s_only = run_largeea(spark, unit_kg, model="rrea", use_name_channel=False,
                         use_augmentation=False, **_FAST)
    assert result.metrics_src["hits1"] > s_only.metrics_src["hits1"]


def test_full_beats_name_only(spark, unit_kg, result):
    n_only = run_largeea(spark, unit_kg, model="rrea", use_structure_channel=False, **_FAST)
    assert result.metrics_src["hits1"] >= n_only.metrics_src["hits1"] - 0.02


def test_augmentation_helps_structure_channel(spark, unit_kg):
    with_da = run_largeea(spark, unit_kg, model="rrea", use_name_channel=False, **_FAST)
    without = run_largeea(spark, unit_kg, model="rrea", use_name_channel=False,
                          use_augmentation=False, **_FAST)
    assert with_da.metrics_src["hits1"] >= without.metrics_src["hits1"]


def test_unsupervised_runs(spark, unit_kg):
    res = run_largeea(spark, unit_kg, model="gcn", supervised=False, **_FAST)
    assert res.metrics_src["hits1"] > 0.5
    assert res.da_stats["n_seeds"] > 0


def test_vps_partitioner(spark, unit_kg):
    res = run_largeea(spark, unit_kg, model="gcn", partitioner="vps", **_FAST)
    assert res.metrics_src["hits1"] > 0.4


def test_metis_cps_beats_vps_structure_only(spark, unit_kg):
    """Figure 6 shape: structural channel accuracy, METIS-CPS > VPS."""
    kw = dict(model="rrea", use_name_channel=False, use_augmentation=False, **_FAST)
    cps = run_largeea(spark, unit_kg, partitioner="metis_cps", **kw)
    vps = run_largeea(spark, unit_kg, partitioner="vps", **kw)
    assert cps.metrics_src["hits1"] > vps.metrics_src["hits1"]


def test_no_partition_beats_partitioned_structure(spark, unit_kg):
    """Section 3.4: accuracy after partition <= accuracy without."""
    kw = dict(model="rrea", use_name_channel=False, use_augmentation=False, **_FAST)
    part = run_largeea(spark, unit_kg, partitioner="metis_cps", **kw)
    full = run_largeea(spark, unit_kg, partitioner="none", **kw)
    assert full.metrics_src["hits1"] >= part.metrics_src["hits1"] - 0.02
    # ... while partitioning shrinks the structure-channel memory.
    assert part.memory["structure_bytes"] < full.memory["structure_bytes"]


def test_both_channels_disabled_rejected(spark, unit_kg):
    with pytest.raises(ValueError):
        run_largeea(spark, unit_kg, use_name_channel=False, use_structure_channel=False,
                    use_augmentation=False, **_FAST)


def test_unknown_partitioner_rejected(spark, unit_kg):
    with pytest.raises(ValueError):
        run_largeea(spark, unit_kg, partitioner="bogus", **_FAST)


def test_unknown_entities_depress_da_precision(spark, unit_kg, unitk_kg, result):
    """Section 3.3 mechanism: unknown entities act as distractors, so
    name-based augmentation produces more wrong pseudo seeds (at full
    dbp1m-lite scale this compounds into the H@1 drop of Table 3)."""
    res_k = run_largeea(spark, unitk_kg, model="rrea", **_FAST)
    assert res_k.da_stats["accuracy"] <= result.da_stats["accuracy"] + 1e-9
    assert res_k.metrics_src["hits1"] <= result.metrics_src["hits1"] + 0.05
