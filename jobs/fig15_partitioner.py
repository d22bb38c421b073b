"""Figure 15: LeCo-var vs angle-based PLA partitioning."""
from repro.experiments.partitioner_bench import print_fig15, run_fig15

if __name__ == "__main__":
    print(print_fig15(run_fig15()))
