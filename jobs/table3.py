"""spark-submit entrypoint reproducing paper Table 3 (see DESIGN.md)."""
from common import run_job

from repro.experiments import run_table3

if __name__ == "__main__":
    run_job("table3", run_table3)
