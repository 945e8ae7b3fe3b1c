"""Benchmark: regenerate paper Table 3 at lite scale (see DESIGN.md)."""
from benchmarks._shared import BENCH_SCALE, run_and_save

from repro.experiments import run_table3


def test_table3(benchmark, spark):
    rows = run_and_save(
        benchmark, "table3", run_table3, spark, scale=BENCH_SCALE
    )
    assert rows, "table 3 produced no rows"
