"""Delta Encoding baselines (§2, §3.2.2): store first differences per partition.

Per partition the header stores the first value (as ``θ0``) and the bias of
the stored differences (as ``θ1`` — legal since reconstruction is
``v_i = v_0 + i·bias + Σ stored_k``, a linear model plus a running sum).
Random access therefore requires decoding the partition *prefix* — the
O(partition) cost the paper shows is an order of magnitude slower than
LeCo/FOR.

``Delta-fix`` uses fixed-length partitions (searched); ``Delta-var`` is the
paper's improved variant driven by LeCo's variable-length Partitioner with
the exact incremental width metric from §3.2.2's Delta example.
"""
from __future__ import annotations

import numpy as np

from ..core.bitpack import bits_needed, pack, unpack
from ..core.format import EncodedPartition, EncodedSequence
from ..core.partitioner import fixed_partitions, search_fixed_length, var_partitions
from ..core.regressor import LinearModel

#: model cost in bits for a Delta partition: first value (64) + bias (64).
DELTA_MODEL_BITS = 128


def _delta_width(sub: np.ndarray) -> int:
    """Stored-difference width, per the paper's §3.2.2 definition
    ``Δ = ⌈log2(max dᵢ)⌉``: raw differences are stored (no trend/bias is
    subtracted — that would be LeCo's job, not Delta's); a negative bias is
    applied only when the input is locally unsorted, standing in for the
    sign handling signed diffs would otherwise need."""
    if len(sub) < 2:
        return 0
    d = np.diff(np.asarray(sub, dtype=np.int64))
    return bits_needed(int(d.max()) - min(0, int(d.min())))


def encode_partition_delta(values: np.ndarray) -> EncodedPartition:
    v = np.asarray(values, dtype=np.int64)
    if len(v) == 1:
        return EncodedPartition(LinearModel(0.0, 0.0), 0, 1, b"", int(v[0]))
    d = np.diff(v)
    dbias = min(0, int(d.min()))
    if abs(dbias) >= 2**53:
        raise OverflowError("difference bias exceeds float64 precision")
    width = bits_needed(int(d.max()) - dbias)
    payload = pack((d - dbias).astype(np.uint64), width)
    # v0 is stored in the exact int64 bias field (float θ0 would round it
    # beyond 2^53); the per-step difference bias rides in θ1 as before.
    return EncodedPartition(LinearModel(0.0, float(dbias)), width, len(v), payload, int(v[0]))


def _decode_partition(p: EncodedPartition, upto: int | None = None) -> np.ndarray:
    """Sequentially reconstruct the first ``upto`` values of a partition."""
    upto = p.n if upto is None else upto
    v0 = p.bias
    if upto <= 1:
        return np.array([v0], dtype=np.int64)[:upto]
    stored = (
        unpack(p.payload, p.width, p.n - 1)[: upto - 1].astype(np.int64)
        if p.width
        else np.zeros(upto - 1, dtype=np.int64)
    )
    d = stored + int(p.model.theta1)
    return np.concatenate(([v0], v0 + np.cumsum(d)))


class _DeltaBase:
    supports_random_access = False  # access is O(partition prefix)

    def decode(self, enc: EncodedSequence) -> np.ndarray:
        return np.concatenate([_decode_partition(p) for p in enc.partitions])

    def access(self, enc: EncodedSequence, i: int) -> int:
        k, off = enc.partition_of(i)
        return int(_decode_partition(enc.partitions[k], off + 1)[off])


class DeltaFix(_DeltaBase):
    """Delta Encoding over searched fixed-length partitions."""

    name = "Delta-fix"

    def __init__(self, partition_len: int | None = None):
        self.partition_len = partition_len

    @staticmethod
    def _cost(sample: np.ndarray, L: int) -> int:
        from ..core.leco import _bits_needed_vec

        v = np.asarray(sample, dtype=np.int64)
        m = len(v) // L
        size = 0
        if m:
            d = np.diff(v[: m * L].reshape(m, L), axis=1)
            ws = _bits_needed_vec(d.max(axis=1) - np.minimum(0, d.min(axis=1)))
            size += int(25 * m + (((L - 1) * ws + 7) // 8).sum())
        if len(v) % L:
            tail = v[m * L :]
            size += 25 + ((len(tail) - 1) * _delta_width(tail) + 7) // 8
        return size

    def encode(self, values: np.ndarray, *, dtype_bits: int = 64) -> EncodedSequence:
        v = np.asarray(values, dtype=np.int64)
        L = self.partition_len or search_fixed_length(v, self._cost)
        starts = fixed_partitions(len(v), L)
        parts = [encode_partition_delta(v[s : s + L]) for s in starts]
        return EncodedSequence(self.name, len(v), dtype_bits, L, starts, parts)


class DeltaVar(_DeltaBase):
    """Delta Encoding with LeCo's variable-length split/merge Partitioner."""

    name = "Delta-var"

    def __init__(self, tau: float = 0.1):
        self.tau = tau

    def encode(self, values: np.ndarray, *, dtype_bits: int = 64) -> EncodedSequence:
        v = np.asarray(values, dtype=np.int64)
        starts = var_partitions(
            v, tau=self.tau, model_bits=DELTA_MODEL_BITS, exact_width=_delta_width
        )
        bounds = np.append(starts, len(v)).astype(np.int64)
        parts = [encode_partition_delta(v[bounds[k] : bounds[k + 1]]) for k in range(len(starts))]
        return EncodedSequence(self.name, len(v), dtype_bits, None, starts, parts)
