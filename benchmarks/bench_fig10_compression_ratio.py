"""Fig 10 row 1: compression ratio per (data set × scheme)."""
from _record import record
from repro.core.leco import LeCoVar
from repro.datasets import load_int

from _shared import micro_rows


def test_fig10_compression_ratio(benchmark):
    rows = micro_rows()
    lines = ["dataset      scheme       ratio   model_share"]
    for r in rows:
        lines.append(f"{r.dataset:12s} {r.scheme:12s} {r.ratio:.4f}  {r.model_ratio:.4f}")
    record("Fig 10 (row 1) — compression ratio", "\n".join(lines))
    by = {(r.dataset, r.scheme): r for r in rows}
    # paper §4.3.1: LeCo strictly better than FOR; huge gain on linear
    for ds in ("linear", "normal", "books", "fb", "wiki"):
        assert by[(ds, "LeCo-fix")].ratio <= by[(ds, "FOR")].ratio * 1.01
    assert by[("linear", "LeCo-var")].ratio < 0.01
    v, bits = load_int("movieid", 50_000)
    codec = LeCoVar()
    benchmark.pedantic(lambda: codec.encode(v, dtype_bits=bits), rounds=1, iterations=1)
