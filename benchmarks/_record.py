"""Registry for reproduced paper-tables, printed by the conftest summary hook."""
from __future__ import annotations

TABLES: dict[str, str] = {}


def record(name: str, text: str) -> None:
    """Register a rendered paper-table for the end-of-run summary."""
    TABLES[name] = text
