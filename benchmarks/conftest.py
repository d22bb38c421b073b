"""Benchmark-suite plumbing.

Each ``bench_*`` module computes its paper table at benchmark scale inside
a session-scoped fixture, times a representative operation with
pytest-benchmark, and registers the rendered table via :func:`record` —
the ``pytest_terminal_summary`` hook then prints every reproduced table at
the end of the run, so ``bench_output.txt`` contains the same rows the
paper reports (compare them in EXPERIMENTS.md).
"""
from __future__ import annotations

from _record import TABLES


def pytest_terminal_summary(terminalreporter):
    for name in sorted(TABLES):
        terminalreporter.write_sep("=", f"reproduced: {name}")
        for line in TABLES[name].splitlines():
            terminalreporter.write_line(line)
