"""spark-submit entrypoint reproducing paper Table 2 (see DESIGN.md index)."""
from _common import run_table
from repro.harness.tables import table2

if __name__ == "__main__":
    run_table(table2, "table2")
