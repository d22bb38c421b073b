"""FSST-lite baseline tests (§4.6)."""
import numpy as np
import pytest

from repro.baselines.fsst import FSSTLite, build_symbol_table
from repro.datasets import STRING_DATASETS


@pytest.mark.parametrize("dataset", list(STRING_DATASETS))
@pytest.mark.parametrize("block", [0, 20, 100])
def test_roundtrip(dataset, block):
    strings = STRING_DATASETS[dataset](800)
    codec = FSSTLite(offset_block=block)
    enc = codec.encode(strings)
    assert codec.decode(enc) == strings


@pytest.mark.parametrize("block", [0, 40])
def test_random_access(block):
    strings = STRING_DATASETS["word"](600)
    codec = FSSTLite(offset_block=block)
    enc = codec.encode(strings)
    g = np.random.default_rng(1)
    for i in g.integers(0, len(strings), 25):
        assert codec.access(enc, int(i)) == strings[i]


def test_symbol_table_contains_frequent_substrings():
    strings = ["prefix_common_suffix"] * 200 + ["other"] * 5
    table = build_symbol_table(strings)
    assert any(len(s) >= 4 for s in table)
    joined = b"|".join(table)
    assert b"prefix" in joined or b"common" in joined or b"_suffix"[:6] in joined


def test_repetitive_corpus_compresses():
    strings = [f"the_quick_brown_fox_{i % 7}" for i in range(1000)]
    enc = FSSTLite(offset_block=100).encode(strings)
    assert enc.ratio() < 0.6


def test_escape_handles_unseen_bytes():
    table = build_symbol_table(["aaaa"] * 50)
    codec = FSSTLite(offset_block=0)
    enc = codec.encode(["aaaa", "zzzz", "a!@#"], table=table)
    assert codec.decode(enc) == ["aaaa", "zzzz", "a!@#"]


def test_offset_blocks_reduce_size():
    strings = STRING_DATASETS["hex"](2000)
    table = build_symbol_table(strings)
    plain = FSSTLite(offset_block=0).encode(strings, table=table)
    blocked = FSSTLite(offset_block=100).encode(strings, table=table)
    assert blocked.nbytes() < plain.nbytes()


def test_empty_string_member():
    codec = FSSTLite(offset_block=0)
    enc = codec.encode(["", "abc", ""])
    assert codec.decode(enc) == ["", "abc", ""]
    assert codec.access(enc, 0) == ""
