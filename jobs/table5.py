"""spark-submit entrypoint reproducing paper Table 5 (see DESIGN.md index)."""
from _common import run_table
from repro.harness.tables import table5

if __name__ == "__main__":
    run_table(table5, "table5")
