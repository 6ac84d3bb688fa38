"""Run every table job in sequence (full reproduction), then refresh the
measured blocks in EXPERIMENTS.md."""
import table01_tpch_loading
import table02_tpcds_loading
import table07_memory
import table08_09_10_tpch_all
import table11_12_13_tpcds_all
import table14_aggregate
import table15_storage
import table16_distributed_tpch
import table17_distributed_tpcds

if __name__ == "__main__":
    for mod in (
        table01_tpch_loading,
        table02_tpcds_loading,
        table15_storage,
        table08_09_10_tpch_all,
        table11_12_13_tpcds_all,
        table14_aggregate,
        table07_memory,
        table16_distributed_tpch,
        table17_distributed_tpcds,
    ):
        print(f"\n===== {mod.__name__} =====")
        mod.main()

    import update_experiments

    update_experiments.main()
