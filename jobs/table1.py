"""spark-submit entrypoint reproducing paper Table 1 (see DESIGN.md index)."""
from _common import run_table
from repro.harness.tables import table1

if __name__ == "__main__":
    run_table(table1, "table1")
