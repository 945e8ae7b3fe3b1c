"""Shared spark-submit plumbing for the per-table jobs.

Each job builds (or joins) a local SparkSession, runs its table harness
from ``repro.experiments``, prints the markdown table, and writes it to
``jobs/out/<table>.md``.
"""
import argparse
import os
import sys


def get_spark(app: str):
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def run_job(name: str, runner, **extra) -> None:
    """Parse --scale/--seed, run the table, print + persist markdown."""
    ap = argparse.ArgumentParser(description=f"Reproduce paper {name}")
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--seed", type=int, default=7)
    ap.add_argument("--fast", action="store_true")
    args = ap.parse_args()
    spark = get_spark(name)
    spark.sparkContext.setLogLevel("ERROR")
    kwargs = dict(scale=args.scale, seed=args.seed, **extra)
    if "fast" in runner.__code__.co_varnames:
        kwargs["fast"] = args.fast
    _, md = runner(spark, **kwargs)
    print(md)
    out = os.path.join(os.path.dirname(os.path.abspath(__file__)), "out")
    os.makedirs(out, exist_ok=True)
    with open(os.path.join(out, f"{name}.md"), "w") as f:
        f.write(md)
    print(f"[{name}] written to {out}/{name}.md", file=sys.stderr)
