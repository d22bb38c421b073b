"""Self-describing storage format for Model+Delta encodings (§3.3, Fig 7).

One :class:`EncodedSequence` holds a list of partitions; each partition is a
header (model parameters + delta bit-width) plus a bit-packed delta array.
Deltas are stored unsigned relative to an explicit integer bias in the
header (``v = floor(θ0 + θ1·i) + bias + delta``).  The paper instead stores
signed deltas of width φ; an explicit 8-byte bias per partition carries the
same information the in-band sign bits would, with exact integer arithmetic
even for values beyond float64 precision (e.g. 2⁵⁵-scale IDs).

Byte layout (``to_bytes``/``from_bytes``):

    magic(2) scheme_id(1) flags(1) n(8) dtype_bits(1) n_parts(4)
    [fixed_len(4)]                 # flags bit0: fixed-length partitions
    [starts: n_parts × uint32]     # otherwise, variable-length
    per partition:
        theta0(f64) theta1(f64) bias(i64) width(1) payload_len(4) payload(...)

The serialized length is what every compression-ratio measurement reports.
"""
from __future__ import annotations

import struct
from dataclasses import dataclass, field

import numpy as np

from .regressor import LinearModel

MAGIC = b"LC"
_SCHEMES = ["LeCo-fix", "LeCo-var", "FOR", "Delta-fix", "Delta-var", "LeCo-angle"]

_GLOBAL_HDR = struct.Struct("<2sBBqBI")
_PART_HDR = struct.Struct("<ddqBI")

#: per-partition header cost in bytes: θ0 + θ1 + bias + width byte.
PARTITION_HEADER_BYTES = 25


@dataclass
class EncodedPartition:
    """One partition: a linear model, a delta bit-width and packed deltas.

    For Delta encoding, ``bias`` holds the first value, ``model.theta1``
    the per-step bias of the stored differences, and the payload holds
    first differences rather than positional deltas; for FOR, ``bias`` is
    the frame minimum.  The scheme id tells the decoder which
    interpretation applies (all integer anchors live in the exact int64
    ``bias`` field because float64 rounds beyond 2^53).
    """

    model: LinearModel
    width: int
    n: int
    payload: bytes
    bias: int = 0

    def header_bytes(self) -> int:
        return PARTITION_HEADER_BYTES

    def nbytes(self) -> int:
        return self.header_bytes() + len(self.payload)


@dataclass
class EncodedSequence:
    """A compressed column chunk: global metadata + partitions."""

    scheme: str
    n: int
    dtype_bits: int
    fixed_len: int | None
    starts: np.ndarray  # uint32, start index of each partition
    partitions: list[EncodedPartition] = field(default_factory=list)

    def raw_bytes(self) -> int:
        """Uncompressed size, the ratio denominator (n × value width)."""
        return self.n * self.dtype_bits // 8

    def nbytes(self) -> int:
        """Exact serialized size in bytes (== ``len(self.to_bytes())``)."""
        size = _GLOBAL_HDR.size
        size += 4 if self.fixed_len is not None else 4 * len(self.partitions)
        size += sum(p.nbytes() + 4 for p in self.partitions)  # +payload_len u32
        return size

    def model_bytes(self) -> int:
        """Metadata/model share of the size (Fig 10 row-1 breakdown)."""
        return self.nbytes() - sum(len(p.payload) for p in self.partitions)

    def ratio(self) -> float:
        return self.nbytes() / self.raw_bytes()

    def partition_of(self, i: int) -> tuple[int, int]:
        """Return ``(partition_index, local_offset)`` for global position ``i``."""
        if self.fixed_len is not None:
            return i // self.fixed_len, i % self.fixed_len
        p = int(np.searchsorted(self.starts, i, side="right")) - 1
        return p, i - int(self.starts[p])

    # -- serialization ------------------------------------------------------
    def to_bytes(self) -> bytes:
        flags = 1 if self.fixed_len is not None else 0
        out = [
            _GLOBAL_HDR.pack(
                MAGIC, _SCHEMES.index(self.scheme), flags, self.n,
                self.dtype_bits, len(self.partitions),
            )
        ]
        if self.fixed_len is not None:
            out.append(struct.pack("<I", self.fixed_len))
        else:
            out.append(np.asarray(self.starts, dtype=np.uint32).tobytes())
        for p in self.partitions:
            out.append(
                _PART_HDR.pack(p.model.theta0, p.model.theta1, p.bias, p.width, len(p.payload))
            )
            out.append(p.payload)
        blob = b"".join(out)
        assert len(blob) == self.nbytes(), (len(blob), self.nbytes())
        return blob

    @classmethod
    def from_bytes(cls, blob: bytes) -> "EncodedSequence":
        magic, scheme_id, flags, n, dtype_bits, n_parts = _GLOBAL_HDR.unpack_from(blob, 0)
        if magic != MAGIC:
            raise ValueError("bad magic")
        off = _GLOBAL_HDR.size
        if flags & 1:
            (fixed_len,) = struct.unpack_from("<I", blob, off)
            off += 4
            starts = np.arange(n_parts, dtype=np.uint32) * np.uint32(fixed_len)
        else:
            fixed_len = None
            starts = np.frombuffer(blob, dtype=np.uint32, count=n_parts, offset=off).copy()
            off += 4 * n_parts
        parts: list[EncodedPartition] = []
        bounds = list(starts[1:]) + [n]
        for k in range(n_parts):
            t0, t1, bias, width, plen = _PART_HDR.unpack_from(blob, off)
            off += _PART_HDR.size
            payload = blob[off : off + plen]
            off += plen
            parts.append(
                EncodedPartition(
                    LinearModel(t0, t1), width, int(bounds[k]) - int(starts[k]), payload, bias
                )
            )
        return cls(_SCHEMES[scheme_id], n, dtype_bits, fixed_len, starts, parts)
