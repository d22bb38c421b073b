"""Fig 14: Parquet filter-scan with Default / FOR / LeCo encodings."""
import shutil
import tempfile

from _record import record
from repro.experiments.parquet_bench import (
    fig14_table,
    print_fig14,
    run_fig14,
    write_fig14_files,
)


def test_fig14_filter_scan(spark, benchmark):
    base = tempfile.mkdtemp(prefix="bench-f14-")
    try:
        paths = write_fig14_files(fig14_table(1_000_000), base_dir=base)
        results = benchmark.pedantic(
            lambda: run_fig14(spark, paths, windows=(600, 3600, 14400)),
            rounds=1, iterations=1,
        )
        record("Fig 14 — Parquet filter scan", print_fig14(results))
        by = {(r.encoding, r.selectivity): r for r in results}
        sels = sorted({r.selectivity for r in results})
        # paper: LeCo 3.7x faster than Default, 1.4x faster than FOR (avg).
        # Per-window wall clock is noisy under a loaded machine, so the
        # Default comparison is per-window at the selective end and the FOR
        # comparison is aggregated across windows with tolerance.
        for sel in sels[:2]:
            assert by[("leco", sel)].total_s < by[("default", sel)].total_s
        leco_sum = sum(by[("leco", s_)].total_s for s_ in sels)
        for_sum = sum(by[("for", s_)].total_s for s_ in sels)
        assert leco_sum <= for_sum * 1.2
        # file sizes: LeCo < FOR < Default (paper: 1.1 / 1.3 / 3.0 GB)
        assert by[("leco", sel)].file_mb < by[("for", sel)].file_mb < by[("default", sel)].file_mb
    finally:
        shutil.rmtree(base, ignore_errors=True)
