"""spark-submit entrypoint reproducing paper Table 4 (see DESIGN.md)."""
from common import run_job

from repro.experiments import run_table4

if __name__ == "__main__":
    run_job("table4", run_table4)
