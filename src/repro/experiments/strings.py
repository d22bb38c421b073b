"""String benchmark (§4.6, Fig 13): LeCo string extension vs FSST.

Per data set (email, hex, word) we report (compression ratio, random
access latency) points for:

* LeCo with the exact character-set base and with the power-of-two base
  (the two per-plot LeCo points in Fig 13);
* FSST with offset delta-block sizes 0, 20, 40, 60, 80, 100 (the paper's
  "optimized FSST" sweep trading access speed for ratio).
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np

from ..baselines.fsst import FSSTLite, build_symbol_table
from ..core.string_codec import StringLeCo
from ..datasets import STRING_DATASETS

FSST_BLOCKS = (0, 20, 40, 60, 80, 100)


@dataclass
class StringRow:
    dataset: str
    method: str  # "LeCo(base=M)" / "LeCo(base=2^m)" / "FSST(block=B)"
    ratio: float
    access_us: float


def run_strings(
    *, n: int = 10_000, n_access: int = 1_000, datasets: list[str] | None = None, seed: int = 0
) -> list[StringRow]:
    g = np.random.default_rng(seed)
    rows: list[StringRow] = []
    for ds in datasets or list(STRING_DATASETS):
        strings = STRING_DATASETS[ds](n)
        pos = g.integers(0, len(strings), n_access)
        for pow2 in (False, True):
            codec = StringLeCo(partition_len=200, pow2_base=pow2)
            enc = codec.encode(strings)
            t0 = time.perf_counter()
            for i in pos:
                codec.access(enc, int(i))
            lat = (time.perf_counter() - t0) / len(pos) * 1e6
            rows.append(
                StringRow(ds, f"LeCo(base={'2^m' if pow2 else 'M'})", enc.ratio(), lat)
            )
        table = build_symbol_table(strings)
        for blk in FSST_BLOCKS:
            codec = FSSTLite(offset_block=blk)
            enc = codec.encode(strings, table=table)
            t0 = time.perf_counter()
            for i in pos:
                codec.access(enc, int(i))
            lat = (time.perf_counter() - t0) / len(pos) * 1e6
            rows.append(StringRow(ds, f"FSST(block={blk})", enc.ratio(), lat))
    return rows


def print_fig13(rows: list[StringRow]) -> str:
    lines = ["== Fig 13: string compression — ratio vs random access =="]
    for ds in dict.fromkeys(r.dataset for r in rows):
        lines.append(f"-- {ds} --")
        lines.append(f"{'method':18s} {'ratio':>8s} {'access_us':>10s}")
        for r in rows:
            if r.dataset == ds:
                lines.append(f"{r.method:18s} {r.ratio:>8.4f} {r.access_us:>10.2f}")
    return "\n".join(lines)
