"""spark-submit entrypoint reproducing paper Table 1 (see DESIGN.md)."""
from common import run_job

from repro.experiments import run_table1

if __name__ == "__main__":
    run_job("table1", run_table1)
