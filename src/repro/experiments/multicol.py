"""Multi-column benchmark (§4.5, Fig 12): per-table compression ratios.

Each table is sorted by its primary-key (first) column; every numeric
column is compressed with the five methods (FOR, Delta-fix, Delta-var,
LeCo-fix, LeCo-var) and the table ratio is total-compressed /
total-raw.  Also computed, as in the paper:

* **sortedness** per table — averaged over columns, using the portion of
  inverse pairs metric (Borroni): ``1 − 2·P(vᵢ > vⱼ | i < j)`` estimated
  by pair sampling, clipped to [0, 1];
* the **high-cardinality** variant (columns with NDV ≥ 10% of rows only),
  Fig 12's bottom-left panel.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from ..core.codec_api import registry
from ..datasets_tabular import TABLES, load_table

METHODS = ["FOR", "Delta-fix", "Delta-var", "LeCo-fix", "LeCo-var"]


def sortedness(v: np.ndarray, samples: int = 20_000, seed: int = 0) -> float:
    """Borroni-style inverse-pair sortedness in [0, 1] (1 = sorted)."""
    g = np.random.default_rng(seed)
    n = len(v)
    i = g.integers(0, n - 1, samples)
    j = g.integers(0, n - 1, samples)
    lo, hi = np.minimum(i, j), np.maximum(i, j)
    keep = lo != hi
    inv = float((v[lo[keep]] > v[hi[keep]]).mean())
    return float(np.clip(1 - 2 * inv, 0.0, 1.0))


@dataclass
class TableResult:
    table: str
    n_rows: int
    n_cols: int
    sortedness: float
    raw_bytes: int
    ratios: dict[str, float]  # method → all-columns ratio
    ratios_hicard: dict[str, float]  # method → NDV≥10% columns only


def run_multicol(*, n: int = 60_000, tables: list[str] | None = None) -> list[TableResult]:
    out: list[TableResult] = []
    for name in tables or list(TABLES):
        pdf = load_table(name, n)
        pk = pdf.columns[0]
        pdf = pdf.sort_values(pk).reset_index(drop=True)
        cols = {c: pdf[c].to_numpy(dtype=np.int64) for c in pdf.columns}
        hicard = {c for c, v in cols.items() if len(np.unique(v)) >= 0.1 * len(v)}
        raw = {c: len(v) * 8 for c, v in cols.items()}
        sizes: dict[str, dict[str, int]] = {m: {} for m in METHODS}
        for c, v in cols.items():
            for m in METHODS:
                sizes[m][c] = registry()[m].encode(v, dtype_bits=64).nbytes()
        total_raw = sum(raw.values())
        hc_raw = sum(raw[c] for c in hicard) or 1
        out.append(
            TableResult(
                name,
                len(pdf),
                len(cols),
                float(np.mean([sortedness(v) for v in cols.values()])),
                total_raw,
                {m: sum(sizes[m].values()) / total_raw for m in METHODS},
                {m: sum(sizes[m][c] for c in hicard) / hc_raw for m in METHODS},
            )
        )
    return out


def print_fig12(results: list[TableResult]) -> str:
    lines = ["== Fig 12: multi-column compression ratio (all numeric columns) =="]
    hdr = "table          sortedness " + " ".join(f"{m:>10s}" for m in METHODS) + "   LeCo-fix/FOR"
    lines.append(hdr)
    for r in results:
        cells = " ".join(f"{r.ratios[m]:>10.4f}" for m in METHODS)
        gain = r.ratios["FOR"] / r.ratios["LeCo-fix"]
        lines.append(f"{r.table:14s} {r.sortedness:>10.3f} {cells}   {gain:>10.2f}x")
    lines.append("")
    lines.append("== Fig 12 (bottom-left): high-cardinality (NDV >= 10%) columns only ==")
    lines.append(hdr)
    for r in results:
        cells = " ".join(f"{r.ratios_hicard[m]:>10.4f}" for m in METHODS)
        gain = r.ratios_hicard["FOR"] / max(r.ratios_hicard["LeCo-fix"], 1e-9)
        lines.append(f"{r.table:14s} {r.sortedness:>10.3f} {cells}   {gain:>10.2f}x")
    return "\n".join(lines)
