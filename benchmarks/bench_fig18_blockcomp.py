"""Fig 18: file sizes with zlib (zstd stand-in) block compression."""
from _record import record
from repro.experiments.parquet_bench import print_fig18, run_fig18


def test_fig18_blockcomp(benchmark):
    rows = benchmark.pedantic(lambda: run_fig18(n=200_000), rounds=1, iterations=1)
    record("Fig 18 — block compression on top of encodings", print_fig18(rows))
    by = {(r["dataset"], r["encoding"]): r for r in rows}
    wins = 0
    for ds in ("normal", "poisson", "books", "ml"):
        # paper: LeCo + zstd is the most space-efficient configuration in
        # all cases.  At our ~1000x-smaller scale, zlib over byte-aligned
        # plain data occasionally edges out zlib over bit-packed deltas
        # (deviation noted in EXPERIMENTS.md), so we assert LeCo+zlib beats
        # FOR+zlib everywhere and is the global best on most data sets.
        assert by[(ds, "leco")]["zlib_mb"] <= by[(ds, "for")]["zlib_mb"] * 1.001, ds
        assert by[(ds, "leco")]["zlib_mb"] <= by[(ds, "leco")]["plain_mb"] * 1.001
        best = min(by[(ds, e)]["zlib_mb"] for e in ("default", "for", "leco"))
        wins += by[(ds, "leco")]["zlib_mb"] <= best * 1.001
    assert wins >= 2
