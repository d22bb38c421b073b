"""Parquet-like columnar file layout over the local filesystem (§5.1).

A "file" is a directory: one binary blob per (row group × column) plus a
``footer.json`` holding per-chunk zone maps (min/max), sizes and paths —
the metadata a Parquet footer provides for row-group skipping.  Optional
block compression (zlib, the offline stand-in for the paper's zstd — see
DESIGN.md §2) wraps each chunk blob.

The writer runs driver-side (it is I/O-bound plumbing); scans run in Spark
executors (see ``scan.py``), which is where the paper's measurements live.
"""
from __future__ import annotations

import json
import os
import zlib
from dataclasses import asdict, dataclass

import numpy as np
import pandas as pd

from .encodings import decode_chunk, encode_chunk


@dataclass
class ChunkMeta:
    """Footer entry for one column chunk."""

    rg_id: int
    column: str
    n: int
    vmin: int
    vmax: int
    nbytes: int
    file: str
    compressed: bool


def write_file(
    pdf: pd.DataFrame,
    path: str,
    encodings: dict[str, str],
    *,
    row_group_rows: int = 100_000,
    partition_len: int = 10_000,
    block_compression: str | None = None,
) -> list[ChunkMeta]:
    """Write ``pdf`` columns in ``encodings`` to ``path``; returns the footer."""
    if block_compression not in (None, "zlib"):
        raise ValueError("only zlib block compression is available offline")
    os.makedirs(path, exist_ok=True)
    metas: list[ChunkMeta] = []
    n = len(pdf)
    for rg_id, s in enumerate(range(0, n, row_group_rows)):
        for col, enc_name in encodings.items():
            v = pdf[col].to_numpy(dtype=np.int64)[s : s + row_group_rows]
            blob = encode_chunk(v, enc_name, partition_len)
            if block_compression:
                blob = zlib.compress(blob, 6)
            fname = f"rg{rg_id:05d}-{col}.bin"
            with open(os.path.join(path, fname), "wb") as f:
                f.write(blob)
            metas.append(
                ChunkMeta(
                    rg_id, col, len(v), int(v.min()), int(v.max()),
                    len(blob), fname, block_compression is not None,
                )
            )
    with open(os.path.join(path, "footer.json"), "w") as f:
        json.dump([asdict(m) for m in metas], f)
    return metas


def read_footer(path: str) -> list[ChunkMeta]:
    with open(os.path.join(path, "footer.json")) as f:
        return [ChunkMeta(**m) for m in json.load(f)]


def read_chunk(path: str, meta: ChunkMeta) -> tuple[bytes, int]:
    """Read a chunk blob (decompressing if needed); returns (blob, io_bytes)."""
    with open(os.path.join(path, meta.file), "rb") as f:
        raw = f.read()
    blob = zlib.decompress(raw) if meta.compressed else raw
    return blob, len(raw)


def file_bytes(path: str) -> int:
    """Total data size of the file (all chunk blobs, excluding the footer)."""
    return sum(m.nbytes for m in read_footer(path))


def read_column(path: str, column: str) -> np.ndarray:
    """Full decode of one column across all row groups (test helper)."""
    out = []
    for m in sorted(read_footer(path), key=lambda m: m.rg_id):
        if m.column == column:
            blob, _ = read_chunk(path, m)
            out.append(decode_chunk(blob))
    return np.concatenate(out)
