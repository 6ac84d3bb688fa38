"""Table 1: TPC-H loading times (graph build vs RDBMS load+index)."""
import _common  # noqa: F401
from repro.harness import tables


def main():
    spark = tables.job_session("table01")
    spark.sparkContext.setLogLevel("ERROR")
    text, data = tables.table_loading(spark, "tpch")
    print(text)
    print("saved:", tables.save_json(data, "table01_tpch_loading.json"))
    spark.stop()


if __name__ == "__main__":
    main()
