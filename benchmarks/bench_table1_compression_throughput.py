"""Paper Table 1: compression throughput (GB/s), weighted across data sets."""
import numpy as np

from _record import record
from repro.core.leco import LeCoFix
from repro.datasets import load_int

from _shared import micro_rows


def test_table1_compression_throughput(benchmark):
    from repro.experiments.micro import table1

    rows = micro_rows()
    t1 = table1(rows)
    text = "\n".join(f"{k:12s} {m:.4f} ± {s:.4f} GB/s" for k, (m, s) in t1.items())
    record("Table 1 — compression throughput (GB/s)", text)
    v, bits = load_int("books", 100_000)
    codec = LeCoFix()
    benchmark(lambda: codec.encode(v, dtype_bits=bits))
    # sanity: LeCo-fix compresses within the same magnitude as FOR (paper:
    # 0.78 vs 0.81 GB/s)
    assert t1["LeCo-fix"][0] > t1["FOR"][0] / 5
