"""Shared helpers for the per-table pytest-benchmark targets.

Each bench runs its table harness exactly once (``rounds=1`` — a table
reproduction is a batch job, not a microbenchmark), prints the markdown
table into the benchmark output, and persists it under ``jobs/out/`` so
EXPERIMENTS.md can be diffed against the latest run.
"""
import os

OUT_DIR = os.path.join(os.path.dirname(os.path.dirname(os.path.abspath(__file__))), "jobs", "out")

# Knob for quick local iterations: REPRO_BENCH_SCALE=0.3 shrinks every
# dataset; tables in EXPERIMENTS.md were produced at the default 1.0.
BENCH_SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "1.0"))


def run_and_save(benchmark, name: str, fn, *args, **kwargs):
    result = benchmark.pedantic(lambda: fn(*args, **kwargs), rounds=1, iterations=1)
    rows, md = result
    os.makedirs(OUT_DIR, exist_ok=True)
    with open(os.path.join(OUT_DIR, f"{name}.md"), "w") as f:
        f.write(md)
    print("\n" + md)
    return rows
