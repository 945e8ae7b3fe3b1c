"""Benchmark: regenerate paper Table 1 at lite scale (see DESIGN.md)."""
from benchmarks._shared import BENCH_SCALE, run_and_save

from repro.experiments import run_table1


def test_table1(benchmark, spark):
    rows = run_and_save(
        benchmark, "table1", run_table1, spark, scale=BENCH_SCALE
    )
    assert rows, "table 1 produced no rows"
