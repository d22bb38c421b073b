"""Figure 11: order-preserving dictionary compression under memory budgets."""
from repro.experiments.dict_bench import print_fig11, run_dict_bench

if __name__ == "__main__":
    print(print_fig11(run_dict_bench()))
