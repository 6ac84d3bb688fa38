"""Table 7: peak RAM during workload execution (process-tree RSS)."""
import _common  # noqa: F401
from repro.harness import tables


def main():
    spark = tables.job_session("table07")
    spark.sparkContext.setLogLevel("ERROR")
    text, data = tables.table_07(spark)
    print(text)
    tables.save_json(data, "table07.json")
    spark.stop()


if __name__ == "__main__":
    main()
