"""spark-submit entrypoint reproducing paper Table 5 (see DESIGN.md)."""
from common import run_job

from repro.experiments import run_table5

if __name__ == "__main__":
    run_job("table5", run_table5)
