"""Figure 20: RocksDB seek throughput vs block-cache size."""
from repro.experiments.rocksdb_bench import print_fig20, run_fig20

if __name__ == "__main__":
    print(print_fig20(run_fig20()))
