"""Benchmark: regenerate paper Table 5 at lite scale (see DESIGN.md)."""
from benchmarks._shared import BENCH_SCALE, run_and_save

from repro.experiments import run_table5


def test_table5(benchmark, spark):
    rows = run_and_save(
        benchmark, "table5", run_table5, spark, scale=BENCH_SCALE
    )
    assert rows, "table 5 produced no rows"
