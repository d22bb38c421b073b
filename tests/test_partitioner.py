"""Unit tests for the Partitioner (§3.2): fixed, variable, DP-optimal, PLA."""
import numpy as np
import pytest

from repro.baselines.delta_codec import _delta_width
from repro.core.leco import _linear_width
from repro.core.partitioner import (
    MIN_PARTITION,
    dp_optimal_partitions,
    fixed_partitions,
    search_fixed_length,
    var_partitions,
)
from repro.core.pla import angle_partitions
from repro.core.regressor import LinearRegressor


def test_fixed_partitions_cover():
    starts = fixed_partitions(1000, 128)
    assert starts[0] == 0
    assert list(np.diff(starts)) == [128] * (len(starts) - 1)
    assert starts[-1] < 1000


def test_fixed_partitions_rejects_nonpositive():
    with pytest.raises(ValueError):
        fixed_partitions(10, 0)


def _starts_valid(starts, n):
    s = list(starts)
    assert s[0] == 0
    assert all(a < b for a, b in zip(s, s[1:]))
    assert s[-1] < n


@pytest.mark.parametrize("tau", [0.0, 0.05, 0.1, 0.2])
def test_var_partitions_valid(tau):
    g = np.random.default_rng(3)
    v = np.cumsum(g.integers(0, 50, 5000)).astype(np.int64)
    starts = var_partitions(v, tau=tau, model_bits=128, exact_width=_linear_width)
    _starts_valid(starts, len(v))


def test_var_partitions_tiny_input():
    starts = var_partitions(np.array([1, 2, 3]), tau=0.1, model_bits=128, exact_width=_linear_width)
    assert list(starts) == [0]


def test_var_partitions_detects_regime_change():
    """Two clean linear regimes with different slopes should be split."""
    v = np.concatenate([7 * np.arange(500), 100000 - 90 * np.arange(500)]).astype(np.int64)
    starts = var_partitions(v, tau=0.1, model_bits=128, exact_width=_linear_width)
    assert len(starts) >= 2
    # some boundary near the regime switch at 500
    assert any(abs(int(s) - 500) <= MIN_PARTITION * 2 for s in starts)


def test_var_partitions_merges_uniform_data():
    """One clean line should end as very few partitions."""
    v = (11 * np.arange(4000)).astype(np.int64)
    starts = var_partitions(v, tau=0.1, model_bits=128, exact_width=_linear_width)
    assert len(starts) <= 4


def _enc_bits(sub):
    return 128 + len(sub) * _linear_width(np.asarray(sub))


@pytest.mark.parametrize("seed", range(5))
def test_greedy_within_envelope_of_dp(seed):
    """§3.2.2 validation: greedy var-partitioning stays within a small factor
    of the DP optimum (the paper reports <3%; we allow 15% at tiny scale
    where header granularity dominates)."""
    g = np.random.default_rng(seed)
    v = np.cumsum(g.integers(0, 2 ** int(g.integers(1, 8)), 250)).astype(np.int64)
    starts = var_partitions(v, tau=0.05, model_bits=128, exact_width=_linear_width)
    bounds = list(starts) + [len(v)]
    greedy = sum(_enc_bits(v[bounds[i] : bounds[i + 1]]) for i in range(len(starts)))
    opt_starts = dp_optimal_partitions(v, _enc_bits, min_len=1)
    ob = list(opt_starts) + [len(v)]
    optimal = sum(_enc_bits(v[ob[i] : ob[i + 1]]) for i in range(len(opt_starts)))
    assert greedy <= optimal * 1.15 + 256


def test_dp_is_no_worse_than_single_partition():
    g = np.random.default_rng(9)
    v = np.cumsum(g.integers(0, 100, 200)).astype(np.int64)
    opt = dp_optimal_partitions(v, _enc_bits, min_len=1)
    ob = list(opt) + [len(v)]
    total = sum(_enc_bits(v[ob[i] : ob[i + 1]]) for i in range(len(opt)))
    assert total <= _enc_bits(v)


def test_search_fixed_length_finds_u_shape_minimum():
    """On clean linear data larger partitions amortize headers: search should
    not return the smallest size probed."""
    v = (3 * np.arange(60_000)).astype(np.int64)

    def cost(sample, L):
        total = 0
        for s in range(0, len(sample), L):
            sub = sample[s : s + L]
            total += 25 + (len(sub) * _linear_width(sub) + 7) // 8
        return total

    L = search_fixed_length(v, cost)
    assert L >= 128


def test_search_fixed_length_small_input():
    v = np.arange(100, dtype=np.int64)

    def cost(sample, L):
        return len(sample) // L + 1

    assert search_fixed_length(v, cost) >= 16


def test_angle_partitions_respect_error_bound():
    g = np.random.default_rng(4)
    v = np.cumsum(g.integers(0, 20, 2000)).astype(np.int64)
    eps = 64.0
    starts = angle_partitions(v, eps)
    _starts_valid(starts, len(v))
    bounds = list(starts) + [len(v)]
    reg = LinearRegressor()
    for i in range(len(starts)):
        sub = v[bounds[i] : bounds[i + 1]].astype(np.float64)
        if len(sub) < 2:
            continue
        # a feasible line through the anchor exists within ±eps; the LSM fit
        # must then achieve max error within ~2*eps
        m = reg.fit(sub)
        err = np.abs(sub - (m.theta0 + m.theta1 * np.arange(len(sub))))
        assert err.max() <= 2 * eps + 2


def test_angle_partitions_single_segment_for_line():
    v = (5 * np.arange(1000)).astype(np.int64)
    assert len(angle_partitions(v, 8.0)) == 1


def test_angle_partitions_empty_raises():
    with pytest.raises(ValueError):
        angle_partitions(np.array([]), 8.0)


def test_delta_width_metric():
    assert _delta_width(np.array([10, 12, 14, 16])) == 2  # raw diffs of 2
    assert _delta_width(np.array([5])) == 0
    # single negative diff: bias −1 absorbs it entirely → width 0
    assert _delta_width(np.array([10, 9])) == 0
    # mixed diffs: bias −1, spread 2−(−1)=3 → 2 bits
    assert _delta_width(np.array([10, 9, 11])) == 2
