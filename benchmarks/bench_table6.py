"""Benchmark: regenerate paper Table 6 at lite scale (see DESIGN.md)."""
from benchmarks._shared import BENCH_SCALE, run_and_save

from repro.experiments import run_table6


def test_table6(benchmark, spark):
    rows = run_and_save(
        benchmark, "table6", run_table6, spark, scale=BENCH_SCALE
    )
    assert rows, "table 6 produced no rows"
