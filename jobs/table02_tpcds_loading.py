"""Table 2: TPC-DS loading times."""
import _common  # noqa: F401
from repro.harness import tables


def main():
    spark = tables.job_session("table02")
    spark.sparkContext.setLogLevel("ERROR")
    text, data = tables.table_loading(spark, "tpcds")
    print(text)
    print("saved:", tables.save_json(data, "table02_tpcds_loading.json"))
    spark.stop()


if __name__ == "__main__":
    main()
