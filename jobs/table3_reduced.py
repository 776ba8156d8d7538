"""Reduced Table 3 sweep: every shape-relevant cell, skipping the cells whose
cost is pure dataflow-round latency already reported elsewhere (BFS sampling
on RO appears in Table 6; system baselines run on four representative
graphs)."""
import sys

from _common import get_spark
from repro.harness.tables import df_to_markdown, table3, to_markdown

if __name__ == "__main__":
    scale = sys.argv[1] if len(sys.argv) > 1 else "mini"
    spark = get_spark(8)
    df = table3(
        spark,
        scale,
        minbased_nosample_graphs=("LJ", "CO", "CW", "RO"),
        systems_graphs=("LJ", "CO", "CW"),
    )
    path = to_markdown(df, f"table3_{scale}")
    print(df_to_markdown(df))
    print(f"wrote {path}")
    spark.stop()
