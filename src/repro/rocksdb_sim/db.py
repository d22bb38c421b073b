"""Seek path + block cache for the RocksDB experiment (§5.2, Fig 20).

``DB.seek(key)`` follows RocksDB's read path: index-block search (the index
is pinned in cache, as in the paper's ``pin_l0_filter_and_index_blocks_in_
cache`` setting) → block-cache lookup → on miss, a real ``pread`` of the
4KB data block plus a modeled NVMe random-read latency (the paper uses
direct I/O on a local NVMe; the OS page cache would hide that here —
DESIGN.md §2) → binary search within the block.

The block cache is an LRU over parsed data blocks whose *capacity is
reduced by the pinned index size* — this is precisely the mechanism behind
Fig 20: a smaller compressed index leaves more cache for data blocks.
"""
from __future__ import annotations

import os
import time
from collections import OrderedDict
from dataclasses import dataclass, field

from .index import build_index
from .sstable import IndexEntry, block_get, parse_block


@dataclass
class SeekStats:
    queries: int = 0
    hits: int = 0
    misses: int = 0
    cpu_s: float = 0.0
    modeled_io_s: float = 0.0

    def total_s(self) -> float:
        return self.cpu_s + self.modeled_io_s

    def throughput(self) -> float:
        return self.queries / self.total_s() if self.total_s() else float("inf")


class DB:
    """A single-SSTable store with a pluggable index-block compression."""

    def __init__(
        self,
        path: str,
        entries: list[IndexEntry],
        *,
        index_kind: str = "leco",
        cache_bytes: int = 8 << 20,
        io_latency_s: float = 100e-6,
    ):
        self.fd = os.open(path, os.O_RDONLY)
        self.index = build_index(entries, index_kind)
        self.io_latency_s = io_latency_s
        #: the pinned index consumes cache capacity (Fig 20's core trade-off)
        self.cache_capacity = max(0, cache_bytes - self.index.nbytes())
        self.cache: OrderedDict[int, tuple[int, list]] = OrderedDict()
        self.cache_used = 0
        self.stats = SeekStats()

    def close(self) -> None:
        os.close(self.fd)

    def _fetch_block(self, offset: int, size: int) -> list:
        if offset in self.cache:
            self.cache.move_to_end(offset)
            self.stats.hits += 1
            return self.cache[offset][1]
        self.stats.misses += 1
        self.stats.modeled_io_s += self.io_latency_s
        blob = os.pread(self.fd, size, offset)
        entries = parse_block(blob)
        self.cache[offset] = (size, entries)
        self.cache_used += size
        while self.cache_used > self.cache_capacity and self.cache:
            _, (sz, _) = self.cache.popitem(last=False)
            self.cache_used -= sz
        return entries

    def seek(self, key: bytes) -> bytes | None:
        t0 = time.perf_counter()
        handle = self.index.seek(key)
        if handle is None:
            self.stats.cpu_s += time.perf_counter() - t0
            self.stats.queries += 1
            return None
        entries = self._fetch_block(*handle)
        out = block_get(entries, key)
        self.stats.cpu_s += time.perf_counter() - t0
        self.stats.queries += 1
        return out
