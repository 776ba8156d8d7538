"""spark-submit entrypoint reproducing paper Table 7 (see DESIGN.md index)."""
from _common import run_table
from repro.harness.tables import table7

if __name__ == "__main__":
    run_table(table7, "table7")
