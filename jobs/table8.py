"""spark-submit entrypoint reproducing paper Table 8 (see DESIGN.md index)."""
from _common import run_table
from repro.harness.tables import table8

if __name__ == "__main__":
    run_table(table8, "table8")
