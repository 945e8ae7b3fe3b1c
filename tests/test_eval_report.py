"""Tests for the memory model and report rendering."""
import pytest

from repro.eval.memory import dense_block_bytes, interaction_bytes, mb, sparse_matrix_bytes
from repro.eval.report import format_markdown


def test_mb_conversion():
    assert mb(1 << 20) == 1.0
    assert mb(0) == 0.0


def test_sparse_matrix_bytes_linear():
    assert sparse_matrix_bytes(10) == 240
    assert sparse_matrix_bytes(0) == 0


def test_dense_block_bytes():
    assert dense_block_bytes(100, 200) == 100 * 200 * 4


def test_interaction_bytes_grows_with_tokens():
    assert interaction_bytes(10, 8, 64) > interaction_bytes(10, 4, 64)


@pytest.mark.parametrize(
    "rows,expect",
    [
        ([{"x": 1.5}], "| 1.500 |"),
        ([{"x": 123.456}], "| 123.46 |"),
        ([{"x": None}], "| - |"),
        ([{"x": "s"}], "| s |"),
    ],
)
def test_format_markdown_cells(rows, expect):
    assert expect in format_markdown(rows, [("x", "X")])


def test_format_markdown_header_only():
    md = format_markdown([], [("a", "A"), ("b", "B")])
    assert md.splitlines()[0] == "| A | B |"
