"""Fig 13: LeCo string extension vs FSST."""
from _record import record
from repro.experiments.strings import print_fig13, run_strings


def test_fig13_strings(benchmark):
    rows = benchmark.pedantic(
        lambda: run_strings(n=8000, n_access=400), rounds=1, iterations=1
    )
    record("Fig 13 — string ratio vs random access", print_fig13(rows))
    by = {}
    for r in rows:
        by.setdefault(r.dataset, {})[r.method] = r
    # LeCo wins hex; FSST wins word (paper §4.6)
    assert by["hex"]["LeCo(base=M)"].ratio < min(
        r.ratio for m, r in by["hex"].items() if m.startswith("FSST")
    )
    assert min(r.ratio for m, r in by["word"].items() if m.startswith("FSST")) < by["word"][
        "LeCo(base=M)"
    ].ratio
