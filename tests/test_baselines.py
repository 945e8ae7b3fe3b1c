"""Tests for the five competitor baselines."""
import pytest

from repro.baselines import BASELINES

_KW = dict(dim=32, seed=0)


@pytest.fixture(scope="module")
def results(spark, unit_kg):
    out = {}
    for name, fn in BASELINES.items():
        kwargs = dict(_KW)
        if name != "BERT-INT":
            kwargs["k_top"] = 8
        out[name] = fn(spark, unit_kg, **kwargs)
    return out


@pytest.mark.parametrize("name", list(BASELINES))
def test_baseline_contract(results, name):
    r = results[name]
    assert r["method"] == name
    assert 0.0 <= r["hits1"] <= r["hits5"] <= 1.0
    assert 0.0 <= r["mrr"] <= 1.0
    assert r["time_s"] > 0
    assert r["mem_bytes"] > 0


def test_structure_only_baselines_beat_random(results):
    for name in ("GCNAlign", "RREA"):
        assert results[name]["hits1"] > 0.03  # random over 300 ~ 0.003


def test_rrea_beats_gcn_align(results):
    """Table 2 ordering: RREA > GCNAlign on accuracy."""
    assert results["RREA"]["hits1"] >= results["GCNAlign"]["hits1"]


def test_name_aware_beat_structure_only(results):
    """Table 2 ordering: side-information models dominate vanilla GCN."""
    for name in ("RDGCN", "BERT-INT", "MultiKE"):
        assert results[name]["hits1"] > results["GCNAlign"]["hits1"]


def test_bert_int_most_accurate(results):
    """Table 2: BERT-INT is the accuracy (non-LargeEA) state of the art."""
    others = [r["hits1"] for n, r in results.items() if n != "BERT-INT"]
    assert results["BERT-INT"]["hits1"] >= max(others) - 0.05


def test_rrea_memory_exceeds_gcn(results):
    """The quadratic NN-sampling plane shows up in RREA's footprint."""
    assert results["RREA"]["mem_bytes"] > results["GCNAlign"]["mem_bytes"]


def test_largeea_memory_below_full_graph_rrea(spark, unit_kg, results):
    from repro.core.pipeline import run_largeea

    res = run_largeea(spark, unit_kg, model="rrea", k=3, dim=32,
                      k_top_name=20, n_segments=2, k_top_struct=8)
    assert res.memory["structure_bytes"] < results["RREA"]["mem_bytes"]
