"""Synthetic stand-ins for the twelve §4.1 microbenchmark data sets.

The paper's data sets are real (SOSD, MovieLens, UCI-ML, Kaggle, …) and far
larger than laptop scale.  Each generator below reproduces the *serial
shape* the paper's Figure 9 shows for its namesake — sortedness, local
unevenness, piecewise linearity, repetition — because that shape, not the
absolute size, determines the relative behaviour of the codecs under test.
All generators are deterministic in ``seed``.  See DESIGN.md §2.

Integer sets return ``(values: int64 array, dtype_bits)``; ``dtype_bits``
(32 or 64, matching the paper) is the ratio denominator's value width.
"""
from __future__ import annotations

import numpy as np

__all__ = [
    "INTEGER_DATASETS",
    "STRING_DATASETS",
    "PAPER_SIZES",
    "load_int",
    "load_strings",
]

#: paper data-set sizes (value counts), used as weights for weighted averages.
PAPER_SIZES = {
    "linear": 200e6,
    "normal": 200e6,
    "poisson": 87e6,
    "ml": 14e6,
    "books": 200e6,
    "fb": 200e6,
    "wiki": 200e6,
    "movieid": 20e6,
    "house_price": 0.1e6,
}


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def gen_linear(n: int, seed: int = 11) -> tuple[np.ndarray, int]:
    """Clean sorted linear sequence (synthetic, 32-bit): the paper's "clean
    linear distribution" — a non-integer slope so deltas are ±1, not zero."""
    v = np.floor(7.3 * np.arange(n)).astype(np.int64)
    return v, 32


def _norm_ppf(p: np.ndarray) -> np.ndarray:
    """Acklam's rational approximation of the standard normal quantile
    function (scipy is unavailable offline); |error| < 1.2e-9."""
    a = [-3.969683028665376e+01, 2.209460984245205e+02, -2.759285104469687e+02,
         1.383577518672690e+02, -3.066479806614716e+01, 2.506628277459239e+00]
    b = [-5.447609879822406e+01, 1.615858368580409e+02, -1.556989798598866e+02,
         6.680131188771972e+01, -1.328068155288572e+01]
    c = [-7.784894002430293e-03, -3.223964580411365e-01, -2.400758277161838e+00,
         -2.549732539343734e+00, 4.374664141464968e+00, 2.938163982698783e+00]
    d = [7.784695709041462e-03, 3.224671290700398e-01, 2.445134137142996e+00,
         3.754408661907416e+00]
    p = np.asarray(p, dtype=np.float64)
    out = np.empty_like(p)
    lo, hi = 0.02425, 1 - 0.02425
    m = p < lo
    q = np.sqrt(-2 * np.log(p[m]))
    out[m] = (((((c[0] * q + c[1]) * q + c[2]) * q + c[3]) * q + c[4]) * q + c[5]) / (
        (((d[0] * q + d[1]) * q + d[2]) * q + d[3]) * q + 1
    )
    m = p > hi
    q = np.sqrt(-2 * np.log(1 - p[m]))
    out[m] = -(((((c[0] * q + c[1]) * q + c[2]) * q + c[3]) * q + c[4]) * q + c[5]) / (
        (((d[0] * q + d[1]) * q + d[2]) * q + d[3]) * q + 1
    )
    m = (p >= lo) & (p <= hi)
    q = p[m] - 0.5
    r = q * q
    out[m] = (((((a[0] * r + a[1]) * r + a[2]) * r + a[3]) * r + a[4]) * r + a[5]) * q / (
        ((((b[0] * r + b[1]) * r + b[2]) * r + b[3]) * r + b[4]) * r + 1
    )
    return out


def gen_normal(n: int, seed: int = 12) -> tuple[np.ndarray, int]:
    """Sorted draws from a normal distribution (synthetic, 32-bit).

    The paper sorts 200M draws; at that density the sequence is the smooth
    normal quantile curve plus vanishing order-statistic noise.  We emulate
    that high-density regime directly: quantile curve + small jitter."""
    g = _rng(seed)
    v = (_norm_ppf((np.arange(n) + 0.5) / n) * 2**27).astype(np.int64)
    v += g.integers(-3, 4, n)
    return np.sort(v) + 2**29, 32


def gen_poisson(n: int, seed: int = 13) -> tuple[np.ndarray, int]:
    """Event timestamps with Poisson arrivals collected from distributed
    sensors: globally linear-in-position, but per-sensor clock skew leaves
    local disorder, so the sequence is *not* fully sorted (the paper
    excludes Elias-Fano here)."""
    g = _rng(seed)
    base = np.cumsum(g.exponential(1000.0, n)).astype(np.int64) + int(1e15)
    skew = g.integers(-4000, 4000, n)  # per-event sensor clock skew
    return base + skew, 64


def gen_ml(n: int, seed: int = 14) -> tuple[np.ndarray, int]:
    """Sorted millisecond timestamps with bursty gaps (UCI-ML shape)."""
    g = _rng(seed)
    gaps = np.where(g.random(n) < 0.02, g.integers(10_000, 500_000, n), g.integers(0, 40, n))
    return np.cumsum(gaps).astype(np.int64) + int(1.5e12), 64


def gen_books(n: int, seed: int = 15) -> tuple[np.ndarray, int]:
    """Sorted popularity counts (SOSD books shape): a smooth convex
    curve — the local gap grows exponentially along the sequence — with
    small noise and occasional jumps into unpopular ranges."""
    g = _rng(seed)
    slope = 2.0 ** (10.0 * np.arange(n) / n)  # local density varies 1→1024
    gaps = np.rint(slope * g.lognormal(0, 0.3, n)).astype(np.int64)
    spikes = g.random(n) < 0.001
    gaps[spikes] += g.integers(5_000, 50_000, int(spikes.sum()))
    return np.cumsum(gaps), 32


def gen_fb(n: int, seed: int = 16) -> tuple[np.ndarray, int]:
    """Sorted user IDs: near-uniform with rare enormous outliers (SOSD fb)."""
    g = _rng(seed)
    v = np.sort(g.integers(0, 1 << 40, n))
    out = g.random(n) < 0.001
    v[out] += g.integers(1 << 50, 1 << 55, int(out.sum()))
    return np.sort(v), 64


def gen_wiki(n: int, seed: int = 17) -> tuple[np.ndarray, int]:
    """Sorted edit timestamps (seconds) with many repeats (SOSD wiki)."""
    g = _rng(seed)
    gaps = g.choice([0, 0, 0, 1, 1, 2, 3, 5], n)
    return np.cumsum(gaps).astype(np.int64) + 1_100_000_000, 64


def gen_movieid(n: int, seed: int = 18) -> tuple[np.ndarray, int]:
    """Concatenated per-user ascending runs of liked movie IDs — globally
    unsorted, strongly piecewise-linear (the paper's motivating Figure 1)."""
    g = _rng(seed)
    out = []
    total = 0
    while total < n:
        k = int(g.integers(20, 400))
        ids = np.sort(g.choice(27_000, size=min(k, 27_000), replace=False))
        out.append(ids)
        total += len(ids)
    return np.concatenate(out)[:n].astype(np.int64), 32


def gen_house_price(n: int, seed: int = 19) -> tuple[np.ndarray, int]:
    """Sorted US house prices: log-normal, rounded to popular increments —
    long plateaus of repeated values and abrupt jumps."""
    g = _rng(seed)
    raw = np.exp(g.normal(12.6, 0.55, n))
    step = np.where(raw < 300_000, 5_000, np.where(raw < 1e6, 25_000, 100_000))
    return np.sort((np.rint(raw / step) * step).astype(np.int64)), 32


INTEGER_DATASETS = {
    "linear": gen_linear,
    "normal": gen_normal,
    "poisson": gen_poisson,
    "ml": gen_ml,
    "books": gen_books,
    "fb": gen_fb,
    "wiki": gen_wiki,
    "movieid": gen_movieid,
    "house_price": gen_house_price,
}

#: data sets that are not fully sorted (Elias-Fano is skipped for these).
UNSORTED = {"poisson", "movieid"}


def load_int(name: str, n: int) -> tuple[np.ndarray, int]:
    """Generate integer data set ``name`` with ``n`` values."""
    return INTEGER_DATASETS[name](n)


# ---------------------------------------------------------------------------
# String data sets (§4.1: email, hex, word)
# ---------------------------------------------------------------------------

_HOSTS = ["com.gmail", "com.yahoo", "com.hotmail", "org.acm", "edu.tsinghua", "net.cool"]
_SYLLABLES = (
    "ba be bi bo bu ca ce ci co cu da de di do du fa fe fi fo fu ga ge gi go gu "
    "la le li lo lu ma me mi mo mu na ne ni no nu pa pe pi po pu ra re ri ro ru "
    "sa se si so su ta te ti to tu tion ing er ed ly al ment ness ful"
).split()


def gen_email(n: int = 3000, seed: int = 21) -> list[str]:
    """Host-reversed e-mail addresses, sorted (avg ≈15 bytes)."""
    g = _rng(seed)
    out = set()
    while len(out) < n:
        host = _HOSTS[int(g.integers(len(_HOSTS)))]
        user = "".join(g.choice(list("abcdefghijklmnopqrstuvwxyz"), int(g.integers(3, 9))))
        out.add(f"{host}.{user}")
    return sorted(out)[:n]


def gen_hex(n: int = 10000, seed: int = 22) -> list[str]:
    """Sorted fixed-width hexadecimal strings (8 chars)."""
    g = _rng(seed)
    vals = np.sort(g.choice(1 << 32, size=n, replace=False).astype(np.uint64))
    return [f"{int(v):08x}" for v in vals]


def gen_word(n: int = 20000, seed: int = 23) -> list[str]:
    """Sorted English-like words built from common syllables (avg ≈9 bytes)."""
    g = _rng(seed)
    out = set()
    while len(out) < n:
        k = int(g.integers(2, 6))
        out.add("".join(_SYLLABLES[int(i)] for i in g.integers(0, len(_SYLLABLES), k)))
    return sorted(out)[:n]


STRING_DATASETS = {"email": gen_email, "hex": gen_hex, "word": gen_word}


def load_strings(name: str, n: int) -> list[str]:
    return STRING_DATASETS[name](n)
