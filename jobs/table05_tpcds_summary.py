"""Table 5: TPC-DS win/competitive/worse counts (from the saved suite)."""
import _common  # noqa: F401
from repro.harness import tables


def main():
    suite = tables.load_json("suite_tpcds.json")
    largest = suite["sfs"][str(max(float(s) for s in suite["sfs"]))]
    text, data = tables.table_05(largest)
    print(text)
    tables.save_json(data, "table05.json")


if __name__ == "__main__":
    main()
