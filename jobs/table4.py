"""spark-submit entrypoint reproducing paper Table 4 (see DESIGN.md index)."""
from _common import run_table
from repro.harness.tables import table4

if __name__ == "__main__":
    run_table(table4, "table4")
