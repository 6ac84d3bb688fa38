"""Table 4: selected TPC-H GA/scalar queries (from the saved suite)."""
import _common  # noqa: F401
from repro.harness import tables


def main():
    suite = tables.load_json("suite_tpch.json")
    largest = suite["sfs"][str(max(float(s) for s in suite["sfs"]))]
    text, data = tables.table_04(largest)
    print(text)
    tables.save_json(data, "table04.json")


if __name__ == "__main__":
    main()
