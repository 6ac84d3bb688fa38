"""Table 16: distributed-mode TPC-H — TAG-join vs Spark SQL + traffic."""
import _common  # noqa: F401
from repro.harness import tables


def main():
    spark = tables.job_session("table16")
    spark.sparkContext.setLogLevel("ERROR")
    text, data = tables.table_distributed(spark, "tpch")
    print(text)
    tables.save_json(data, "table16.json")
    spark.stop()


if __name__ == "__main__":
    main()
