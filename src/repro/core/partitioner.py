"""Partitioners (§3.2): split a sequence so Model+Delta compresses best.

Three schemes:

* :func:`fixed_partitions` + :func:`search_fixed_length` — fixed-length
  partitions with the paper's sampling-based "U-shape" size search (§3.2.1).
* :func:`var_partitions` — the greedy **split/merge** variable-length
  algorithm (§3.2.2) using the approximate difficulty metric
  ``Δ̃(v[i,j)) = bits(max(dₖ) − min(dₖ))`` over the first differences, with
  the cost rule ``C = (len+1)·Δ̃_new − len·Δ̃_old ≤ τ·S_M`` in the split
  phase, followed by merge passes (with exact widths) until fixpoint.
* :func:`dp_optimal_partitions` — exact dynamic program, O(n²); the test
  oracle the paper's §3.2.2 validates against (greedy ≤ ~3% worse).

Deviation from the paper (documented in DESIGN.md §4): the split phase scans
left-to-right instead of seeding at minimum second-order-delta positions;
tests bound the gap against the DP optimum.
"""
from __future__ import annotations

from typing import Callable, Sequence

import numpy as np

from .bitpack import bits_needed

__all__ = [
    "fixed_partitions",
    "search_fixed_length",
    "var_partitions",
    "dp_optimal_partitions",
]

#: minimum values per starting partition for a linear Regressor (§3.2.2).
MIN_PARTITION = 3


def fixed_partitions(n: int, length: int) -> np.ndarray:
    """Start indices of fixed-``length`` partitions covering ``[0, n)``."""
    if length <= 0:
        raise ValueError(f"partition length must be positive, got {length}")
    return np.arange(0, n, length, dtype=np.uint32)


def search_fixed_length(
    values: np.ndarray,
    cost_of: Callable[[np.ndarray, int], int],
    *,
    sample_rate: float = 0.01,
    min_exp: int = 4,
    max_exp: int = 17,
    seed: int = 0,
) -> int:
    """Sampling-based partition-size search (§3.2.1).

    ``cost_of(sample, L)`` returns the compressed size in bytes of ``sample``
    split into length-``L`` partitions.  We sample a few contiguous
    subsequences (sampling rate <1% suffices per the paper), sweep ``L`` over
    powers of two until past the U-shape minimum (exponential phase), then
    refine around the best with two midpoint probes.
    """
    n = len(values)
    target = max(4096, int(n * sample_rate))
    if n <= target * 2:
        sample = np.asarray(values)
    else:
        g = np.random.default_rng(seed)
        chunk = max(512, target // 8)
        starts = g.integers(0, n - chunk, size=max(1, target // chunk))
        sample = np.concatenate([values[s : s + chunk] for s in np.sort(starts)])
    best_l, best_c = None, None
    prev_c = None
    rising = 0
    for e in range(min_exp, max_exp + 1):
        L = 1 << e
        if L > len(sample):
            break
        c = cost_of(sample, L)
        if best_c is None or c < best_c:
            best_l, best_c = L, c
        rising = rising + 1 if prev_c is not None and c > prev_c else 0
        prev_c = c
        if rising >= 2:  # past the global minimum of the U-shape
            break
    if best_l is None:  # input smaller than the smallest candidate size
        return max(1, len(sample))
    # refine: probe the midpoints of the neighbouring octaves.
    for L in (best_l * 3 // 4, best_l * 3 // 2):
        if MIN_PARTITION <= L <= len(sample):
            c = cost_of(sample, L)
            if c < best_c:
                best_l, best_c = L, c
    return int(best_l)


def _diff_width(dmax: int, dmin: int) -> int:
    """Δ̃: bit-width implied by the spread of first differences."""
    return bits_needed(dmax - dmin)


def var_partitions(
    values: np.ndarray,
    *,
    tau: float,
    model_bits: int,
    exact_width: Callable[[np.ndarray], int],
    max_merge_passes: int = 8,
) -> np.ndarray:
    """Greedy split/merge variable-length partitioning (§3.2.2).

    ``exact_width(sub)`` returns the true delta bit-width the codec would use
    for a partition holding ``sub`` (invoking its Regressor); the split phase
    only uses the cheap Δ̃ approximation, the merge phase uses exact widths.
    Returns the partition start indices (uint32, first element 0).
    """
    v = np.asarray(values, dtype=np.int64)
    n = len(v)
    if n <= MIN_PARTITION:
        return np.zeros(1, dtype=np.uint32)
    d = np.diff(v)
    threshold = tau * model_bits

    # --- split phase: grow left-to-right under the cost rule ---------------
    starts = [0]
    p_start = 0
    dmax = dmin = None
    for j in range(1, n):
        dj = int(d[j - 1])
        length = j - p_start
        if length < MIN_PARTITION:
            dmax = dj if dmax is None else max(dmax, dj)
            dmin = dj if dmin is None else min(dmin, dj)
            continue
        w_old = _diff_width(dmax, dmin)
        nmax, nmin = max(dmax, dj), min(dmin, dj)
        w_new = _diff_width(nmax, nmin)
        cost = (length + 1) * w_new - length * w_old
        if cost <= threshold:
            dmax, dmin = nmax, nmin
        else:
            starts.append(j)
            p_start = j
            dmax = dmin = None

    # --- refine phase: recursively bisect partitions while it shrinks the
    # exact encoded size.  The split phase's Δ̃ metric is insensitive to the
    # slow drift of random-walk-like data (stable first-difference spread but
    # growing deviation from any one line), so it can grow one enormous
    # partition; the paper avoids this by seeding many concurrent starting
    # partitions.  Top-down bisection with exact widths recovers the same
    # effect; the merge phase below re-joins any over-splits.
    refined: list[int] = []
    for k, s in enumerate(starts):
        e = starts[k + 1] if k + 1 < len(starts) else n
        refined.extend(_bisect(v, s, e, exact_width, model_bits))
    starts = refined

    # --- merge phase: exact-width pairwise merges to fixpoint --------------
    bounds = starts + [n]
    widths = [exact_width(v[bounds[k] : bounds[k + 1]]) for k in range(len(starts))]
    for _ in range(max_merge_passes):
        merged_any = False
        k = 0
        while k + 1 < len(widths):
            a, b, c = bounds[k], bounds[k + 1], bounds[k + 2]
            w_m = exact_width(v[a:c])
            merged = model_bits + (c - a) * w_m
            separate = 2 * model_bits + (b - a) * widths[k] + (c - b) * widths[k + 1]
            if merged <= separate:
                del bounds[k + 1]
                widths[k : k + 2] = [w_m]
                merged_any = True
            else:
                k += 1
        if not merged_any:
            break
    return np.asarray(bounds[:-1], dtype=np.uint32)


def _bisect(
    v: np.ndarray,
    lo: int,
    hi: int,
    exact_width: Callable[[np.ndarray], int],
    model_bits: int,
) -> list[int]:
    """Recursively split ``[lo, hi)`` at the midpoint while the exact encoded
    size (model + deltas, in bits) decreases.  Returns partition starts."""
    if hi - lo < 2 * MIN_PARTITION:
        return [lo]
    mid = (lo + hi) // 2
    whole = model_bits + (hi - lo) * exact_width(v[lo:hi])
    halves = (
        2 * model_bits
        + (mid - lo) * exact_width(v[lo:mid])
        + (hi - mid) * exact_width(v[mid:hi])
    )
    if halves >= whole:
        return [lo]
    return _bisect(v, lo, mid, exact_width, model_bits) + _bisect(
        v, mid, hi, exact_width, model_bits
    )


def dp_optimal_partitions(
    values: Sequence[int],
    cost_bits: Callable[[np.ndarray], int],
    *,
    min_len: int = 1,
) -> np.ndarray:
    """Exact optimal partitioning by dynamic programming (test oracle only).

    ``cost_bits(sub)`` is the total encoded size in bits of one partition
    holding ``sub`` (model + deltas).  O(n²) subproblems, each cost call
    O(len); fine for the ≤ few-hundred-element inputs used in tests.
    """
    v = np.asarray(values, dtype=np.int64)
    n = len(v)
    INF = float("inf")
    best = [INF] * (n + 1)
    prev = [0] * (n + 1)
    best[0] = 0.0
    for j in range(1, n + 1):
        for i in range(max(0, j - 4096), j - min_len + 1):
            if best[i] == INF:
                continue
            c = best[i] + cost_bits(v[i:j])
            if c < best[j]:
                best[j], prev[j] = c, i
    cuts = []
    j = n
    while j > 0:
        cuts.append(prev[j])
        j = prev[j]
    return np.asarray(sorted(cuts), dtype=np.uint32)
