"""Shared benchmark-scale microbenchmark run, computed once per session."""
from __future__ import annotations

from functools import lru_cache

BENCH_N = 100_000


@lru_cache(maxsize=1)
def micro_rows():
    from repro.experiments.micro import run_micro

    return run_micro(n=BENCH_N, n_access=1000)
