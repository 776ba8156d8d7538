"""spark-submit entrypoint reproducing paper Table 6 (see DESIGN.md index)."""
from _common import run_table
from repro.harness.tables import table6

if __name__ == "__main__":
    run_table(table6, "table6")
