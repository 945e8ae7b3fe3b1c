"""spark-submit entrypoint reproducing paper Table 6 (see DESIGN.md)."""
from common import run_job

from repro.experiments import run_table6

if __name__ == "__main__":
    run_job("table6", run_table6)
