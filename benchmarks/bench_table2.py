"""Benchmark: regenerate paper Table 2 at lite scale (see DESIGN.md)."""
from benchmarks._shared import BENCH_SCALE, run_and_save

from repro.experiments import run_table2


def test_table2(benchmark, spark):
    rows = run_and_save(
        benchmark, "table2", run_table2, spark, scale=BENCH_SCALE
    )
    assert rows, "table 2 produced no rows"
