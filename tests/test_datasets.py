"""Data-set generator tests: shapes per §4.1/Fig 9 and determinism."""
import numpy as np
import pytest

from repro.datasets import (
    INTEGER_DATASETS,
    PAPER_SIZES,
    STRING_DATASETS,
    UNSORTED,
    load_int,
    load_strings,
)


@pytest.mark.parametrize("name", list(INTEGER_DATASETS))
def test_deterministic(name):
    a, bits_a = load_int(name, 2000)
    b, bits_b = load_int(name, 2000)
    assert np.array_equal(a, b) and bits_a == bits_b


@pytest.mark.parametrize("name", list(INTEGER_DATASETS))
def test_size_and_dtype(name):
    v, bits = load_int(name, 3000)
    assert len(v) == 3000
    assert bits in (32, 64)
    assert v.dtype == np.int64
    if bits == 32:
        assert v.max() < 2**31 and v.min() >= -(2**31)


@pytest.mark.parametrize("name", sorted(set(INTEGER_DATASETS) - UNSORTED))
def test_sorted_datasets_are_sorted(name):
    v, _ = load_int(name, 5000)
    assert (np.diff(v) >= 0).all(), f"{name} must be non-decreasing"


@pytest.mark.parametrize("name", sorted(UNSORTED))
def test_unsorted_datasets_have_inversions(name):
    v, _ = load_int(name, 5000)
    assert (np.diff(v) < 0).any(), f"{name} must not be fully sorted (per §4.3)"


def test_movieid_is_piecewise_increasing():
    v, _ = load_int("movieid", 5000)
    d = np.diff(v)
    # mostly ascending runs with occasional resets (Figure 1's shape)
    assert (d > 0).mean() > 0.9
    assert (d < 0).sum() > 3


def test_house_price_has_repeats():
    v, _ = load_int("house_price", 5000)
    assert (np.diff(v) == 0).mean() > 0.5  # long plateaus


def test_wiki_has_repeats():
    v, _ = load_int("wiki", 5000)
    assert (np.diff(v) == 0).mean() > 0.2


def test_fb_has_outliers():
    v, _ = load_int("fb", 20_000)
    assert v.max() > 2**50 and np.median(v) < 2**41


def test_linear_is_clean():
    v, _ = load_int("linear", 1000)
    d = np.diff(v)
    assert set(np.unique(d)) <= {7, 8}  # slope 7.3 floor pattern


def test_paper_sizes_cover_all_integer_datasets():
    assert set(PAPER_SIZES) == set(INTEGER_DATASETS)


@pytest.mark.parametrize("name", list(STRING_DATASETS))
def test_string_datasets(name):
    s = load_strings(name, 500)
    assert len(s) == 500
    assert all(isinstance(x, str) and x for x in s)
    assert s == sorted(s)  # generated sorted
    assert s == load_strings(name, 500)  # deterministic


def test_email_shape():
    s = load_strings("email", 300)
    assert 10 <= np.mean([len(x) for x in s]) <= 20
    assert all("." in x for x in s)


def test_hex_shape():
    s = load_strings("hex", 300)
    assert all(len(x) == 8 and set(x) <= set("0123456789abcdef") for x in s)
