"""Fig 20: RocksDB seek throughput vs block-cache size."""
from _record import record
from repro.experiments.rocksdb_bench import print_fig20, run_fig20


def test_fig20_rocksdb(benchmark):
    rows = benchmark.pedantic(
        lambda: run_fig20(n=60_000, n_queries=10_000, cache_mbs=(0.25, 0.5, 1, 2)),
        rounds=1, iterations=1,
    )
    record("Fig 20 — RocksDB seek throughput", print_fig20(rows))
    by = {(r.index_kind, r.cache_mb): r for r in rows}
    # index ratio ordering: RI1 (uncompressed-ish) worst; LeCo strongly compressed
    assert by[("ri1", 1)].index_ratio > 0.6
    assert by[("leco", 1)].index_ratio < 0.4
    # LeCo's smaller pinned index leaves more cache for data blocks →
    # strictly fewer I/Os than Baseline_1 at every cache size, and the gap
    # is largest at the smallest cache (the paper's §5.2 observation)
    for mb in (0.25, 0.5, 1, 2):
        assert by[("leco", mb)].misses < by[("ri1", mb)].misses
    # where the cache is scarcest, LeCo's I/O time (modeled, deterministic)
    # is strictly lower than Baseline_1's — the quantity behind the paper's
    # throughput win; wall-clock cpu_s is too load-sensitive to assert on
    # (seek-path CPU in Python is ~1000x the paper's C++, see EXPERIMENTS.md)
    for mb in (0.25, 0.5, 1, 2):
        assert by[("leco", mb)].io_s < by[("ri1", mb)].io_s
    # RI=128 pays a sequential unit decode per seek — the slowest index
    assert by[("ri128", 1)].throughput_ops < by[("leco", 1)].throughput_ops * 1.1
