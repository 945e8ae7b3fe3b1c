"""Shape checks for all six lite datasets (paper Table 1 properties)."""
import pytest

from repro.kgdata import dataset_stats, make_benchmark

_SCALE = 0.05
_ALL = [
    ("ids15k", "en-fr"), ("ids15k", "en-de"),
    ("ids100k", "en-fr"), ("ids100k", "en-de"),
    ("dbp1m", "en-fr"), ("dbp1m", "en-de"),
]


@pytest.fixture(scope="module")
def stats(spark):
    return {
        (ds, lg): dataset_stats(make_benchmark(spark, ds, lg, scale=_SCALE, seed=7))
        for ds, lg in _ALL
    }


@pytest.mark.parametrize("ds,lg", _ALL)
def test_sides_nonempty(stats, ds, lg):
    st = stats[(ds, lg)]
    for side in ("source", "target"):
        assert st[side]["entities"] > 0
        assert st[side]["triples"] > 0
        assert st[side]["relations"] >= 3


@pytest.mark.parametrize("ds,lg", _ALL)
def test_english_side_has_more_relations(stats, ds, lg):
    """Paper Table 1: the EN KG always has the richer relation vocab."""
    st = stats[(ds, lg)]
    assert st["source"]["relations"] >= st["target"]["relations"]


@pytest.mark.parametrize("ds", ["ids15k", "ids100k"])
def test_ids_symmetric_entities(stats, ds):
    for lg in ("en-fr", "en-de"):
        st = stats[(ds, lg)]
        assert st["source"]["entities"] == st["target"]["entities"]


@pytest.mark.parametrize("lg", ["en-fr", "en-de"])
def test_dbp1m_asymmetric_and_unknowns(stats, lg):
    """DBP1M: EN side larger; both sides exceed the alignment count."""
    st = stats[("dbp1m", lg)]
    assert st["source"]["entities"] > st["target"]["entities"]
    assert st["source"]["entities"] > st["alignment"]
    assert st["target"]["entities"] > st["alignment"]


@pytest.mark.parametrize("lg", ["en-fr", "en-de"])
def test_dbp1m_target_sparser(stats, lg):
    """Non-English DBP1M KGs have fewer triples per entity (Table 1)."""
    st = stats[("dbp1m", lg)]
    src_density = st["source"]["triples"] / st["source"]["entities"]
    tgt_density = st["target"]["triples"] / st["target"]["entities"]
    assert src_density > tgt_density


@pytest.mark.parametrize("ds,k", [("ids15k", 5), ("ids100k", 10), ("dbp1m", 20)])
def test_paper_default_k(spark, ds, k):
    kg = make_benchmark(spark, ds, "en-fr", scale=_SCALE, seed=7)
    assert kg.default_k == k
