"""Figure 12: multi-column compression ratios over nine tables."""
from repro.experiments.multicol import print_fig12, run_multicol

if __name__ == "__main__":
    print(print_fig12(run_multicol()))
