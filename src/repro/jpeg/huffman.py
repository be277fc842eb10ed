"""JPEG Huffman coding: canonical tables, optimal table generation, bit I/O.

Tables are canonical per ITU-T T.81 Annex C: ``bits[1..16]`` counts of
codes per length plus ``values`` in code order. ``build_optimal_table``
is the libjpeg ``jpeg_gen_optimal_table`` algorithm (including the
reserved symbol that guarantees no code is all ones, and the >16-bit
length adjustment), which libjpeg forces on for progressive scans — we
use it for every scan so baseline/progressive sizes are comparable.

Bit I/O implements the entropy-coded segment rules: MSB-first bits,
0xFF byte stuffing on write, 1-padding at flush, unstuffing on read.
"""
from dataclasses import dataclass, field

import numpy as np

MAX_CODE_LEN = 16


@dataclass
class HuffmanTable:
    """A canonical JPEG Huffman table.

    ``bits[i]`` is the number of codes of length ``i+1`` (i in 0..15);
    ``values`` are the symbols in canonical order.
    """

    bits: list[int]
    values: list[int]
    _enc: dict[int, tuple[int, int]] = field(default=None, repr=False, compare=False)
    _dec: tuple[np.ndarray, np.ndarray] = field(default=None, repr=False, compare=False)

    def __post_init__(self):
        assert len(self.bits) == MAX_CODE_LEN
        assert sum(self.bits) == len(self.values)

    def codes(self) -> list[tuple[int, int, int]]:
        """List of (symbol, code, length) in canonical order."""
        out = []
        code = 0
        k = 0
        for length in range(1, MAX_CODE_LEN + 1):
            for _ in range(self.bits[length - 1]):
                out.append((self.values[k], code, length))
                code += 1
                k += 1
            code <<= 1
        return out

    @property
    def encoder(self) -> dict[int, tuple[int, int]]:
        """symbol -> (code, length)."""
        if self._enc is None:
            self._enc = {s: (c, l) for s, c, l in self.codes()}
        return self._enc

    @property
    def decoder(self) -> tuple[np.ndarray, np.ndarray]:
        """(symbols, lengths) lookup arrays indexed by the next 16 bits."""
        if self._dec is None:
            syms = np.full(1 << MAX_CODE_LEN, -1, dtype=np.int16)
            lens = np.zeros(1 << MAX_CODE_LEN, dtype=np.int8)
            for s, c, l in self.codes():
                lo = c << (MAX_CODE_LEN - l)
                hi = (c + 1) << (MAX_CODE_LEN - l)
                syms[lo:hi] = s
                lens[lo:hi] = l
            self._dec = (syms, lens)
        return self._dec


def build_optimal_table(freqs: np.ndarray) -> HuffmanTable:
    """Build an optimal length-limited table from symbol frequencies.

    ``freqs`` has 256 entries. Implements libjpeg's jpeg_gen_optimal_table:
    a 257th reserved symbol with frequency 1 guarantees that no real
    symbol is assigned the all-ones code, then code lengths longer than
    16 are folded down per the Annex K.2 adjustment.
    """
    freq = np.zeros(257, dtype=np.int64)
    freq[:256] = np.asarray(freqs, dtype=np.int64)
    freq[256] = 1  # reserved: ensures no real all-ones code
    codesize = np.zeros(257, dtype=np.int64)
    others = np.full(257, -1, dtype=np.int64)

    while True:
        # c1: least-frequency symbol (ties -> larger symbol, per libjpeg)
        c1, v = -1, np.inf
        for i in range(257):
            if 0 < freq[i] <= v:
                v, c1 = freq[i], i
        c2, v = -1, np.inf
        for i in range(257):
            if 0 < freq[i] <= v and i != c1:
                v, c2 = freq[i], i
        if c2 < 0:
            break
        freq[c1] += freq[c2]
        freq[c2] = 0
        codesize[c1] += 1
        while others[c1] >= 0:
            c1 = others[c1]
            codesize[c1] += 1
        others[c1] = c2
        codesize[c2] += 1
        while others[c2] >= 0:
            c2 = others[c2]
            codesize[c2] += 1

    bits = np.zeros(60, dtype=np.int64)  # generous headroom for long codes
    for i in range(257):
        if codesize[i]:
            bits[codesize[i]] += 1

    # Fold code lengths > 16 down (libjpeg's adjustment).
    i = len(bits) - 1
    while i > MAX_CODE_LEN:
        while bits[i] > 0:
            j = i - 2
            while bits[j] == 0:
                j -= 1
            bits[i] -= 2
            bits[i - 1] += 1
            bits[j + 1] += 2
            bits[j] -= 1
        i -= 1
    # Remove the reserved symbol's code from the longest used length.
    i = MAX_CODE_LEN
    while i > 0 and bits[i] == 0:
        i -= 1
    if i > 0:
        bits[i] -= 1

    # Symbols sorted by (code length, symbol value); drop the reserved one.
    order = sorted(
        (i for i in range(256) if codesize[i] > 0),
        key=lambda i: (codesize[i], i),
    )
    return HuffmanTable(bits=list(bits[1 : MAX_CODE_LEN + 1]), values=order)


class BitWriter:
    """MSB-first bit writer with JPEG 0xFF byte stuffing."""

    def __init__(self):
        self._buf = bytearray()
        self._acc = 0
        self._nbits = 0

    def write(self, value: int, nbits: int) -> None:
        if nbits == 0:
            return
        self._acc = (self._acc << nbits) | (value & ((1 << nbits) - 1))
        self._nbits += nbits
        while self._nbits >= 8:
            self._nbits -= 8
            byte = (self._acc >> self._nbits) & 0xFF
            self._buf.append(byte)
            if byte == 0xFF:
                self._buf.append(0x00)
        self._acc &= (1 << self._nbits) - 1

    def write_code(self, table: HuffmanTable, symbol: int) -> None:
        code, length = table.encoder[symbol]
        self.write(code, length)

    def getvalue(self) -> bytes:
        """Flush (pad last byte with 1s) and return the stuffed stream."""
        if self._nbits:
            pad = 8 - self._nbits
            self.write((1 << pad) - 1, pad)
        return bytes(self._buf)


class BitReader:
    """MSB-first bit reader over an entropy-coded (stuffed) segment.

    Raises EOFError when reading past the end; Huffman lookups pad with
    1-bits at the tail, matching the encoder's flush padding.
    """

    def __init__(self, data: bytes):
        # Unstuff: every 0xFF in real entropy data is followed by 0x00.
        self._data = data.replace(b"\xff\x00", b"\xff")
        self._pos = 0  # next byte index
        self._acc = 0
        self._nbits = 0

    def _fill(self, need: int) -> None:
        while self._nbits < need:
            if self._pos >= len(self._data):
                raise EOFError("entropy segment exhausted")
            self._acc = (self._acc << 8) | self._data[self._pos]
            self._pos += 1
            self._nbits += 8

    def read(self, nbits: int) -> int:
        if nbits == 0:
            return 0
        self._fill(nbits)
        self._nbits -= nbits
        val = (self._acc >> self._nbits) & ((1 << nbits) - 1)
        self._acc &= (1 << self._nbits) - 1
        return val

    def read_symbol(self, table: HuffmanTable) -> int:
        syms, lens = table.decoder
        # Peek up to 16 bits, padding with 1s at stream end (flush padding).
        avail = self._nbits + 8 * (len(self._data) - self._pos)
        if avail <= 0:
            raise EOFError("entropy segment exhausted")
        n = min(MAX_CODE_LEN, avail)
        self._fill(n)
        window = (self._acc >> (self._nbits - n)) & ((1 << n) - 1)
        idx = (window << (MAX_CODE_LEN - n)) | ((1 << (MAX_CODE_LEN - n)) - 1)
        length = int(lens[idx])
        sym = int(syms[idx])
        if sym < 0 or length > avail:
            raise EOFError("invalid/truncated Huffman code")
        self._nbits -= length
        self._acc &= (1 << self._nbits) - 1
        return sym


def magnitude_category(v: int) -> int:
    """JPEG magnitude category (number of extra bits) for a DC diff / AC coef."""
    return int(abs(v)).bit_length()


def magnitude_bits(v: int) -> tuple[int, int]:
    """(extra_bits_value, category) encoding of a signed value."""
    s = magnitude_category(v)
    if v >= 0:
        return v, s
    return v + (1 << s) - 1, s


def extend(bits_value: int, size: int) -> int:
    """Inverse of ``magnitude_bits``: sign-extend a received value."""
    if size == 0:
        return 0
    if bits_value < (1 << (size - 1)):
        return bits_value - (1 << size) + 1
    return bits_value
