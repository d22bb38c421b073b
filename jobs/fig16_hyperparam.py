"""Figure 16: hyperparameter sensitivity (epsilon vs tau) on books."""
from repro.experiments.partitioner_bench import print_fig16, run_fig16

if __name__ == "__main__":
    print(print_fig16(run_fig16()))
