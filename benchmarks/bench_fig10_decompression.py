"""Fig 10 row 3: full decompression throughput per (data set × scheme)."""
from _record import record
from repro.core.leco import LeCoFix
from repro.datasets import load_int

from _shared import micro_rows


def test_fig10_decompression(benchmark):
    rows = micro_rows()
    lines = ["dataset      scheme       decompress_Mv/s"]
    for r in rows:
        lines.append(f"{r.dataset:12s} {r.scheme:12s} {r.decompress_mvps:12.2f}")
    record("Fig 10 (row 3) — decompression throughput (Mvalues/s)", "\n".join(lines))
    by = {(r.dataset, r.scheme): r for r in rows}
    # §4.3.3 highlight: var partitioning excels on house_price's repetition
    assert by[("house_price", "LeCo-var")].decompress_mvps > by[("house_price", "FOR")].decompress_mvps * 0.5
    v, bits = load_int("books", 100_000)
    enc = LeCoFix().encode(v, dtype_bits=bits)
    codec = LeCoFix()
    benchmark(lambda: codec.decode(enc))
