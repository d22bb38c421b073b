"""Figure 13: LeCo string extension vs FSST on email/hex/word."""
from repro.experiments.strings import print_fig13, run_strings

if __name__ == "__main__":
    print(print_fig13(run_strings()))
