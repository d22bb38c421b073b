"""Fig 11: dictionary-compressed hash-join under a memory budget."""
from _record import record
from repro.experiments.dict_bench import print_fig11, run_dict_bench


def test_fig11_dictionary(benchmark):
    results = benchmark.pedantic(
        lambda: run_dict_bench(n_unique=1_000_000, n_probe=300_000, budgets_mb=(0.5, 1, 2, 4, 8)),
        rounds=1, iterations=1,
    )
    record("Fig 11 — dictionary query throughput", print_fig11(results))
    by = {(r.method, r.budget_mb): r for r in results}
    # paper: LeCo's dictionary is tiny (0.23%) vs FOR (17%) and it wins big
    # under memory pressure
    assert by[("LeCo", 0.5)].dict_ratio < 0.02
    assert 0.05 < by[("FOR", 0.5)].dict_ratio < 0.4
    assert by[("LeCo", 0.5)].throughput_mbps > 2 * by[("FOR", 0.5)].throughput_mbps
