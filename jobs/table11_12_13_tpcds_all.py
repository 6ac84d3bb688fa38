"""Tables 11/12/13: all TPC-DS-lite queries at three SFs, all systems.

Also feeds Tables 5/6 and Table 14."""
import _common  # noqa: F401
from repro.harness import tables


def main():
    spark = tables.job_session("table11_12_13")
    spark.sparkContext.setLogLevel("ERROR")
    suite = tables.run_suite(spark, "tpcds")
    tables.save_json(suite, "suite_tpcds.json")
    text, _ = tables.table_all_queries(suite, "tpcds")
    print(text)
    largest = suite["sfs"][str(max(float(s) for s in suite["sfs"]))]
    for fn, name in ((tables.table_05, "table05.json"), (tables.table_06, "table06.json")):
        t, d = fn(largest)
        print()
        print(t)
        tables.save_json(d, name)
    spark.stop()


if __name__ == "__main__":
    main()
