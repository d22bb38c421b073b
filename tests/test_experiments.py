"""Experiment-harness tests: each table's harness runs at miniature scale
and its outputs satisfy the paper's qualitative claims (the shape checks
EXPERIMENTS.md reports at full benchmark scale)."""
import numpy as np
import pytest

from repro.experiments.dict_bench import medicare_like, print_fig11, run_dict_bench
from repro.experiments.micro import (
    applicable,
    print_fig10,
    run_micro,
    table1,
    weighted_summary,
)
from repro.experiments.multicol import print_fig12, run_multicol, sortedness
from repro.experiments.partitioner_bench import (
    print_fig15,
    print_fig16,
    run_fig15,
    run_fig16,
)
from repro.experiments.rocksdb_bench import make_workload, print_fig20, run_fig20
from repro.experiments.strings import print_fig13, run_strings


@pytest.fixture(scope="module")
def micro_rows():
    return run_micro(n=8000, n_access=100, datasets=["linear", "wiki", "movieid"])


def test_micro_rows_complete(micro_rows):
    # Elias-Fano skipped on movieid → 3×7 − 1 rows
    assert len(micro_rows) == 20
    assert all(r.ratio > 0 and r.decompress_mvps > 0 for r in micro_rows)


def test_micro_applicability():
    assert not applicable("Elias-Fano", "poisson")
    assert applicable("FOR", "poisson")


def test_micro_leco_beats_for_on_ratio(micro_rows):
    by = {(r.dataset, r.scheme): r for r in micro_rows}
    for ds in ("linear", "wiki", "movieid"):
        assert by[(ds, "LeCo-fix")].ratio <= by[(ds, "FOR")].ratio * 1.01


def test_micro_delta_slower_random_access(micro_rows):
    """§4.3.2: Delta variants are ~an order of magnitude slower to access."""
    by = {(r.dataset, r.scheme): r for r in micro_rows}
    for ds in ("linear", "wiki"):
        assert by[(ds, "Delta-fix")].access_us > 3 * by[(ds, "LeCo-fix")].access_us


def test_micro_rans_has_no_access(micro_rows):
    assert all(r.access_us is None for r in micro_rows if r.scheme == "rANS")


def test_micro_printers(micro_rows):
    text = print_fig10(micro_rows)
    assert "Fig 10" in text and "Table 1" in text and "linear" in text
    t1 = table1(micro_rows)
    assert set(t1) <= {"FOR", "Elias-Fano", "Delta-fix", "Delta-var", "LeCo-fix", "LeCo-var"}
    ws = weighted_summary(micro_rows)
    assert all(0 < m["ratio"] < 1.5 for m in ws.values())


def test_dict_bench_shape():
    rows = run_dict_bench(n_unique=50_000, n_probe=20_000, budgets_mb=(0.05, 1))
    by = {(r.method, r.budget_mb): r for r in rows}
    # LeCo dictionary is far smaller than FOR's, which is smaller than raw
    assert by[("LeCo", 1)].dict_ratio < by[("FOR", 1)].dict_ratio < 1
    # at the starved budget LeCo outperforms Raw (its dict stays resident)
    assert by[("LeCo", 0.05)].throughput_mbps > by[("Raw", 0.05)].throughput_mbps
    assert "Fig 11" in print_fig11(rows)


def test_medicare_like_is_sorted_unique():
    v = medicare_like(10_000)
    assert (np.diff(v) > 0).all()


def test_sortedness_metric():
    assert sortedness(np.arange(1000)) > 0.99
    assert sortedness(np.arange(1000)[::-1]) < 0.05
    g = np.random.default_rng(0)
    mid = sortedness(g.permutation(1000))
    assert 0 <= mid < 0.2  # random ≈ 0 under the 1−2·inv metric


def test_multicol_shape():
    rows = run_multicol(n=4000, tables=["date_dim", "stock"])
    assert len(rows) == 2
    for r in rows:
        # §4.5 headline: LeCo-fix beats FOR on every table
        assert r.ratios["LeCo-fix"] <= r.ratios["FOR"] * 1.01
        assert 0 <= r.sortedness <= 1
    assert "Fig 12" in print_fig12(rows)


def test_strings_shape():
    rows = run_strings(n=1200, n_access=60, datasets=["hex", "word"])
    by_ds = {}
    for r in rows:
        by_ds.setdefault(r.dataset, {})[r.method] = r
    # §4.6: LeCo wins ratio on hex; FSST wins on word
    hex_leco = by_ds["hex"]["LeCo(base=M)"].ratio
    hex_fsst = min(r.ratio for m, r in by_ds["hex"].items() if m.startswith("FSST"))
    assert hex_leco < hex_fsst
    word_leco = by_ds["word"]["LeCo(base=M)"].ratio
    word_fsst = min(r.ratio for m, r in by_ds["word"].items() if m.startswith("FSST"))
    assert word_fsst < word_leco
    assert "Fig 13" in print_fig13(rows)


def test_fig15_angle_worse_than_var():
    rows = run_fig15(n=8000, datasets=("normal", "books", "movieid"))
    by = {(r.dataset, r.method): r for r in rows}
    for ds in ("normal", "books", "movieid"):
        assert by[(ds, "LeCo-angle")].ratio >= by[(ds, "LeCo-var")].ratio
    assert "Fig 15" in print_fig15(rows)


def test_fig16_var_is_stable_angle_is_not():
    rows = run_fig16(n=8000, eps_bits=(3, 8, 13), taus=(0.0, 0.1, 0.2))
    angle = [r.ratio for r in rows if r.method == "LeCo-angle"]
    var = [r.ratio for r in rows if r.method == "LeCo-var"]
    assert (max(angle) - min(angle)) > 3 * (max(var) - min(var))
    assert "Fig 16" in print_fig16(rows)


def test_rocksdb_workload_skew():
    keys, value, qkeys = make_workload(5000, 4000)
    assert len(keys) == 5000 and len(value) == 400
    counts = {k: 0 for k in keys}
    for k in qkeys:
        counts[k] += 1
    top = sorted(counts.values(), reverse=True)
    # 80/20 skew: the hottest 20% of the keyspace absorbs most queries
    assert sum(top[: len(keys) // 5]) > 0.7 * len(qkeys)


def test_fig20_smoke():
    rows = run_fig20(n=4000, n_queries=1500, cache_mbs=(0.2, 1.0))
    by = {(r.index_kind, r.cache_mb): r for r in rows}
    # ratios: RI1 biggest, LeCo compressed
    assert by[("ri1", 1.0)].index_ratio > by[("leco", 1.0)].index_ratio
    # bigger cache → no more misses than smaller cache (every index kind)
    for k in ("leco", "ri1", "ri16", "ri128"):
        assert by[(k, 1.0)].misses <= by[(k, 0.2)].misses
    assert "Fig 20" in print_fig20(rows)
