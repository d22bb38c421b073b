"""Partitioner efficiency (§4.7): LeCo-var vs angle-based PLA (Fig 15/16).

* Fig 15: compression ratio of LeCo-var (default τ) vs LeCo-angle
  (default ε) vs LeCo-fix across data sets — the paper reports LeCo-angle
  9%–722% worse than LeCo-var, and worse than LeCo-fix on ``normal``.
* Fig 16: hyperparameter sensitivity on ``books`` — sweep ε ∈ [3, 13] bits
  for LeCo-angle and τ ∈ [0, 0.2] for LeCo-var; the paper shows the angle
  method swinging widely while τ is stable.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from ..core.leco import LeCoFix, LeCoVar
from ..core.pla import LeCoAngle
from ..datasets import load_int

FIG15_DATASETS = ("linear", "normal", "books", "fb", "wiki", "movieid", "house_price")


@dataclass
class PartitionerRow:
    dataset: str
    method: str
    param: float
    ratio: float
    n_partitions: int


def run_fig15(*, n: int = 60_000, datasets=FIG15_DATASETS) -> list[PartitionerRow]:
    rows: list[PartitionerRow] = []
    for ds in datasets:
        v, bits = load_int(ds, n)
        for method, codec, param in (
            ("LeCo-fix", LeCoFix(), 0.0),
            ("LeCo-var", LeCoVar(tau=0.1), 0.1),
            ("LeCo-angle", LeCoAngle(epsilon_bits=8), 8),
        ):
            enc = codec.encode(v, dtype_bits=bits)
            rows.append(PartitionerRow(ds, method, param, enc.ratio(), len(enc.partitions)))
    return rows


def run_fig16(
    *,
    n: int = 60_000,
    dataset: str = "books",
    eps_bits: tuple[int, ...] = (3, 5, 7, 9, 11, 13),
    taus: tuple[float, ...] = (0.0, 0.05, 0.1, 0.15, 0.2),
) -> list[PartitionerRow]:
    v, bits = load_int(dataset, n)
    rows: list[PartitionerRow] = []
    for e in eps_bits:
        enc = LeCoAngle(epsilon_bits=e).encode(v, dtype_bits=bits)
        rows.append(PartitionerRow(dataset, "LeCo-angle", e, enc.ratio(), len(enc.partitions)))
    for t in taus:
        enc = LeCoVar(tau=t).encode(v, dtype_bits=bits)
        rows.append(PartitionerRow(dataset, "LeCo-var", t, enc.ratio(), len(enc.partitions)))
    return rows


def print_fig15(rows: list[PartitionerRow]) -> str:
    lines = ["== Fig 15: LeCo-var vs LeCo-angle compression ratio =="]
    lines.append(f"{'dataset':12s} {'LeCo-fix':>10s} {'LeCo-var':>10s} {'LeCo-angle':>11s} {'angle/var':>10s}")
    by = {(r.dataset, r.method): r for r in rows}
    for ds in dict.fromkeys(r.dataset for r in rows):
        fx = by[(ds, "LeCo-fix")].ratio
        va = by[(ds, "LeCo-var")].ratio
        an = by[(ds, "LeCo-angle")].ratio
        lines.append(f"{ds:12s} {fx:>10.4f} {va:>10.4f} {an:>11.4f} {an / va:>9.2f}x")
    return "\n".join(lines)


def print_fig16(rows: list[PartitionerRow]) -> str:
    lines = ["== Fig 16: hyperparameter sweep on books =="]
    for method in ("LeCo-angle", "LeCo-var"):
        pts = [(r.param, r.ratio) for r in rows if r.method == method]
        cells = "  ".join(f"{p:g}->{x:.3f}" for p, x in pts)
        lines.append(f"{method:11s} {cells}")
    return "\n".join(lines)
