"""Common codec interface shared by LeCo and every baseline.

A codec turns an int64 numpy array into an opaque encoded object and back.
``encode`` → encoded object, ``decode`` → full array, ``access`` → one value
at a position (the random-access path the paper benchmarks).  ``nbytes`` of
the encoded object is the serialized size used for compression ratios.
"""
from __future__ import annotations

from typing import Any, Protocol, runtime_checkable

import numpy as np

__all__ = ["Codec", "registry", "get_codec"]


@runtime_checkable
class Codec(Protocol):
    """Protocol implemented by all integer codecs in this reproduction."""

    name: str
    #: False for schemes (Delta, rANS) that must decode a prefix to access.
    supports_random_access: bool

    def encode(self, values: np.ndarray, *, dtype_bits: int = 64) -> Any: ...

    def decode(self, enc: Any) -> np.ndarray: ...

    def access(self, enc: Any, i: int) -> int: ...


_REGISTRY: dict[str, "Codec"] = {}


def registry() -> dict[str, "Codec"]:
    """Name → codec instance for every registered scheme."""
    # Imported lazily to avoid circular imports at package init.
    if not _REGISTRY:
        from .leco import LeCoFix, LeCoVar
        from ..baselines.for_codec import FORCodec
        from ..baselines.delta_codec import DeltaFix, DeltaVar
        from ..baselines.elias_fano import EliasFano
        from ..baselines.rans import RANSCodec

        for c in (FORCodec(), EliasFano(), DeltaFix(), DeltaVar(), LeCoFix(), LeCoVar(), RANSCodec()):
            _REGISTRY[c.name] = c
    return _REGISTRY


def get_codec(name: str) -> "Codec":
    try:
        return registry()[name]
    except KeyError:
        raise KeyError(f"unknown codec {name!r}; known: {sorted(registry())}") from None
