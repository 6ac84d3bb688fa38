"""Table 17: distributed-mode TPC-DS — TAG-join vs Spark SQL + traffic."""
import _common  # noqa: F401
from repro.harness import tables


def main():
    spark = tables.job_session("table17")
    spark.sparkContext.setLogLevel("ERROR")
    text, data = tables.table_distributed(spark, "tpcds")
    print(text)
    tables.save_json(data, "table17.json")
    spark.stop()


if __name__ == "__main__":
    main()
