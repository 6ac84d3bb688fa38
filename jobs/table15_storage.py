"""Table 15: in-memory vs compressed columnar data sizes."""
import _common  # noqa: F401
from repro.harness import tables


def main():
    spark = tables.job_session("table15")
    spark.sparkContext.setLogLevel("ERROR")
    text, data = tables.table_15(spark)
    print(text)
    tables.save_json(data, "table15.json")
    spark.stop()


if __name__ == "__main__":
    main()
