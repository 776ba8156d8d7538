"""Minimal Table 3 sweep: none + k-out on all graphs, all algorithm families
(BFS/LDD columns for the full matrix are covered by the CW exhibit and by
Tables 6/7's sampling costs)."""
from _common import get_spark
from repro.harness.tables import df_to_markdown, table3, to_markdown

if __name__ == "__main__":
    spark = get_spark(8)
    df = table3(
        spark, "test",
        minbased_nosample_graphs=(),
        schemes=("none", "kout"),
        include_systems=False,
    )
    print(df_to_markdown(df))
    print(f"wrote {to_markdown(df, 'table3_test')}")
    spark.stop()
