"""Tables 8/9/10: all TPC-H-lite queries at three SFs, all systems.

Also feeds Tables 3/4 (selected queries) and Table 14 (aggregates)."""
import _common  # noqa: F401
from repro.harness import tables


def main():
    spark = tables.job_session("table08_09_10")
    spark.sparkContext.setLogLevel("ERROR")
    suite = tables.run_suite(spark, "tpch")
    tables.save_json(suite, "suite_tpch.json")
    text, _ = tables.table_all_queries(suite, "tpch")
    print(text)
    largest = suite["sfs"][str(max(float(s) for s in suite["sfs"]))]
    for fn, name in ((tables.table_03, "table03.json"), (tables.table_04, "table04.json")):
        t, d = fn(largest)
        print()
        print(t)
        tables.save_json(d, name)
    spark.stop()


if __name__ == "__main__":
    main()
