"""Unit tests for Huffman coding and bit I/O (incl. hypothesis roundtrips)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.jpeg.huffman import (
    BitReader,
    BitWriter,
    HuffmanTable,
    build_optimal_table,
    extend,
    magnitude_bits,
    magnitude_category,
)


def _simple_table():
    # symbols 0,1 at length 2; 2 at length 3 — prefix-free, not all-ones.
    return HuffmanTable(bits=[0, 2, 1] + [0] * 13, values=[0, 1, 2])


def test_canonical_code_assignment():
    codes = {s: (c, l) for s, c, l in _simple_table().codes()}
    assert codes[0] == (0b00, 2)
    assert codes[1] == (0b01, 2)
    assert codes[2] == (0b100, 3)


def test_decoder_lut_consistent_with_encoder():
    t = _simple_table()
    syms, lens = t.decoder
    for s, c, l in t.codes():
        idx = c << (16 - l)
        assert syms[idx] == s
        assert lens[idx] == l


@pytest.mark.parametrize("seed", range(4))
def test_optimal_table_roundtrips_symbols(seed):
    rng = np.random.default_rng(seed)
    freqs = np.zeros(256, dtype=np.int64)
    alphabet = rng.choice(256, size=20, replace=False)
    freqs[alphabet] = rng.integers(1, 1000, size=20)
    t = build_optimal_table(freqs)
    assert sorted(t.values) == sorted(alphabet.tolist())
    w = BitWriter()
    msg = rng.choice(alphabet, size=500).tolist()
    for s in msg:
        w.write_code(t, int(s))
    r = BitReader(w.getvalue())
    assert [r.read_symbol(t) for _ in msg] == msg


def test_optimal_table_skewed_freqs_gives_short_code_to_common_symbol():
    freqs = np.zeros(256, dtype=np.int64)
    freqs[7] = 10000
    freqs[8] = 10
    freqs[9] = 10
    t = build_optimal_table(freqs)
    enc = t.encoder
    assert enc[7][1] <= enc[8][1]
    assert enc[7][1] <= enc[9][1]


def test_optimal_table_single_symbol():
    freqs = np.zeros(256, dtype=np.int64)
    freqs[42] = 5
    t = build_optimal_table(freqs)
    assert t.values == [42]
    code, length = t.encoder[42]
    assert 1 <= length <= 16


def test_no_all_ones_code():
    # The reserved-symbol trick must prevent any real symbol from
    # receiving the all-ones code of its length.
    rng = np.random.default_rng(0)
    freqs = rng.integers(1, 50, size=256)
    t = build_optimal_table(freqs)
    for s, c, l in t.codes():
        assert c != (1 << l) - 1


def test_max_code_length_16():
    # Exponential frequencies force deep trees; lengths must be folded.
    freqs = np.zeros(256, dtype=np.int64)
    for i in range(40):
        freqs[i] = 2**i if i < 30 else 2**30
    t = build_optimal_table(freqs)
    assert all(l <= 16 for _, _, l in t.codes())
    # Kraft inequality holds (decodable).
    assert sum(2.0 ** -l for _, _, l in t.codes()) <= 1.0


def test_bitwriter_stuffs_ff():
    w = BitWriter()
    w.write(0xFF, 8)
    out = w.getvalue()
    assert out == b"\xff\x00"


def test_bitreader_unstuffs_ff():
    r = BitReader(b"\xff\x00\xab")
    assert r.read(8) == 0xFF
    assert r.read(8) == 0xAB


def test_bitreader_eof():
    r = BitReader(b"\xaa")
    r.read(8)
    with pytest.raises(EOFError):
        r.read(1)


@given(st.lists(st.tuples(st.integers(0, 63), st.integers(1, 6)), min_size=1, max_size=200))
@settings(max_examples=50, deadline=None)
def test_bit_roundtrip_hypothesis(items):
    w = BitWriter()
    for v, n in items:
        w.write(v & ((1 << n) - 1), n)
    r = BitReader(w.getvalue())
    for v, n in items:
        assert r.read(n) == (v & ((1 << n) - 1))


@given(st.integers(-2047, 2047))
@settings(max_examples=200, deadline=None)
def test_magnitude_roundtrip(v):
    bits, size = magnitude_bits(v)
    assert extend(bits, size) == v
    assert size == magnitude_category(v)


def test_magnitude_categories():
    assert magnitude_category(0) == 0
    assert magnitude_category(1) == magnitude_category(-1) == 1
    assert magnitude_category(255) == 8
    assert magnitude_category(-1024) == 11
