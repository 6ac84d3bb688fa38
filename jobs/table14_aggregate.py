"""Table 14: aggregate runtimes (needs both saved suites)."""
import _common  # noqa: F401
from repro.harness import tables


def main():
    suite_h = tables.load_json("suite_tpch.json")
    suite_ds = tables.load_json("suite_tpcds.json")
    text, data = tables.table_14(suite_h, suite_ds)
    print(text)
    tables.save_json(data, "table14.json")


if __name__ == "__main__":
    main()
