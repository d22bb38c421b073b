"""Figure 10 (all three rows) + weighted Figure 2 summary.

Usage: python jobs/fig10_micro.py [n]
"""
import sys

from repro.experiments.micro import print_fig10, run_micro, weighted_summary

if __name__ == "__main__":
    n = int(sys.argv[1]) if len(sys.argv) > 1 else 100_000
    rows = run_micro(n=n)
    print(print_fig10(rows))
    print("== Fig 2: weighted summary (ratio / access us / decompress Mv/s) ==")
    for scheme, m in sorted(weighted_summary(rows).items()):
        print(f"{scheme:12s} ratio={m['ratio']:.4f} access={m['access_us']:.2f}us "
              f"decompress={m['decompress_mvps']:.2f}Mv/s")
