"""Table 1: weighted-average compression throughput (GB/s) per scheme.

Usage: python jobs/table1_compression_throughput.py [n]
"""
import sys

from repro.experiments.micro import run_micro, table1

if __name__ == "__main__":
    n = int(sys.argv[1]) if len(sys.argv) > 1 else 100_000
    rows = run_micro(n=n, schemes=["FOR", "Elias-Fano", "Delta-fix", "Delta-var", "LeCo-fix", "LeCo-var"])
    print("== Table 1: Compression throughput (GB/s, weighted mean ± std) ==")
    for scheme, (m, s) in table1(rows).items():
        print(f"{scheme:12s} {m:.4f} ± {s:.4f}")
