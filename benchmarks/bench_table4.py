"""Benchmark: regenerate paper Table 4 at lite scale (see DESIGN.md)."""
from benchmarks._shared import BENCH_SCALE, run_and_save

from repro.experiments import run_table4


def test_table4(benchmark, spark):
    rows = run_and_save(
        benchmark, "table4", run_table4, spark, scale=BENCH_SCALE
    )
    assert rows, "table 4 produced no rows"
