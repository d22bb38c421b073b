"""Fig 12: multi-column compression ratios over nine tables."""
from _record import record
from repro.experiments.multicol import print_fig12, run_multicol


def test_fig12_multicolumn(benchmark):
    results = benchmark.pedantic(lambda: run_multicol(n=40_000), rounds=1, iterations=1)
    record("Fig 12 — multi-column compression ratio", print_fig12(results))
    assert len(results) == 9
    for r in results:
        assert r.ratios["LeCo-fix"] <= r.ratios["FOR"] * 1.01, r.table
