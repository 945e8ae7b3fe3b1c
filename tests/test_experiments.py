"""Smoke tests for the table harnesses (tiny scale, fast params)."""
import pytest

from repro.eval.report import format_markdown
from repro.experiments import run_table1, run_table2, run_table3, run_table4, run_table5, run_table6

_SCALE = 0.05  # shrinks every lite dataset ~20x for the smoke runs


def test_table1_smoke(spark):
    rows, md = run_table1(spark, scale=_SCALE)
    assert len(rows) == 6
    assert "Table 1" in md
    for row in rows:
        a, b = row["entities"].split("-")
        assert int(a) > 0 and int(b) > 0


def test_table2_smoke(spark):
    rows, md = run_table2(
        spark, datasets=("ids15k",), langs_list=("en-fr",), scale=_SCALE, fast=True
    )
    methods = [r["method"] for r in rows]
    assert "BERT-INT" in methods
    assert any(m.startswith("LargeEA-R") for m in methods)
    assert len(rows) == 5 + 4  # 5 baselines + G/R x 2 directions


def test_table3_smoke(spark):
    rows, md = run_table3(spark, langs_list=("en-fr",), scale=_SCALE, fast=True)
    assert len(rows) == 4
    assert all(0 <= r["hits1"] <= 1 for r in rows)


def test_table4_smoke(spark):
    rows, md = run_table4(spark, langs_list=("en-fr",), scale=_SCALE, fast=True)
    da = [r for r in rows if "n_seeds" in r]
    assert da and da[0]["n_seeds"] > 0
    assert "case study" in md


def test_table5_smoke(spark):
    rows, md = run_table5(spark, datasets=("ids15k",), langs_list=("en-fr",), scale=_SCALE)
    assert len(rows) == 4  # 2 directions x 2 methods
    vps_train = [r["train"] for r in rows if r["method"] == "VPS"]
    assert all(v == 1.0 for v in vps_train)  # VPS co-locates all train seeds


def test_table6_smoke(spark):
    rows, md = run_table6(spark, datasets=("ids15k",), langs_list=("en-fr",), scale=_SCALE, fast=True)
    assert len(rows) == 1
    r = rows[0]
    assert r["R_part_mb"] <= r["R_full_mb"]
    assert r["G_part_mb"] <= r["G_full_mb"]
    assert r["R_full_mb"] > r["G_full_mb"]  # quadratic sampling plane


def test_format_markdown():
    md = format_markdown(
        [{"a": 1, "b": 0.5}, {"a": 2}], [("a", "A"), ("b", "B")], "T"
    )
    assert "### T" in md
    assert "| 1 | 0.500 |" in md
    assert "| 2 | - |" in md
