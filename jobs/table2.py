"""spark-submit entrypoint reproducing paper Table 2 (see DESIGN.md)."""
from common import run_job

from repro.experiments import run_table2

if __name__ == "__main__":
    run_job("table2", run_table2)
