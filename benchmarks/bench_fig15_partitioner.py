"""Fig 15 + Fig 16: variable-length partitioner vs angle-based PLA."""
from _record import record
from repro.experiments.partitioner_bench import (
    print_fig15,
    print_fig16,
    run_fig15,
    run_fig16,
)


def test_fig15_fig16_partitioner(benchmark):
    rows15 = benchmark.pedantic(lambda: run_fig15(n=60_000), rounds=1, iterations=1)
    record("Fig 15 — LeCo-var vs LeCo-angle", print_fig15(rows15))
    rows16 = run_fig16(n=60_000)
    record("Fig 16 — hyperparameter sweep (books)", print_fig16(rows16))
    by = {(r.dataset, r.method): r for r in rows15}
    worse = [by[(d, "LeCo-angle")].ratio / by[(d, "LeCo-var")].ratio for d, m in by if m == "LeCo-var"]
    assert max(worse) > 1.5  # paper: up to 722% worse
    angle = [r.ratio for r in rows16 if r.method == "LeCo-angle"]
    var = [r.ratio for r in rows16 if r.method == "LeCo-var"]
    assert (max(angle) - min(angle)) > 3 * (max(var) - min(var))
