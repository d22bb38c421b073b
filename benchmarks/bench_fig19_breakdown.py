"""Fig 19: time breakdown of block compression on bitmap selection."""
from _record import record
from repro.experiments.parquet_bench import print_fig19, run_fig19


def test_fig19_breakdown(spark, benchmark):
    rows = benchmark.pedantic(lambda: run_fig19(spark, n=200_000), rounds=1, iterations=1)
    record("Fig 19 — zlib time breakdown (ml, sel=0.01)", print_fig19(rows))
    plain = {r.encoding: r for bc, r in rows if bc == "plain"}
    z = {r.encoding: r for bc, r in rows if bc == "zlib"}
    for enc in plain:
        # block compression never reduces decompression work...
        assert z[enc].decompress_s > plain[enc].decompress_s
    for enc in ("for", "leco"):
        # ...and on already-lightweight-encoded files its CPU cost is not
        # repaid by I/O savings, so the query gets slower (the paper's §5.1.3
        # conclusion about zstd on top of LeCo).  Asserted on the modeled-I/O
        # + measured-decompress components, which are deterministic; wall
        # clock scan time is too noisy under a concurrently running suite.
        assert z[enc].io_s >= plain[enc].io_s * 0.95
        assert z[enc].io_s + z[enc].decompress_s > plain[enc].io_s + plain[enc].decompress_s
