"""Unified JPEG decoder for our baseline (SOF0) and progressive (SOF2) files.

Decodes marker segments, then entropy-decodes each scan into shared
per-component coefficient arrays. Truncated streams — the PCR case,
where only a prefix of the scans is present followed by EOI — decode
cleanly: missing scans simply leave their coefficient bands at zero,
and a scan cut mid-stream keeps whatever blocks completed (matching
"most JPEG decoders render the image with the available subset of
scans", paper Section 5).
"""
import struct

import numpy as np

from . import markers
from .codec import CoeffImage, Component, inverse
from .huffman import BitReader, HuffmanTable, extend
from .quant import UNZIGZAG


def _parse_dqt(payload: bytes, qtables: dict[int, np.ndarray]) -> None:
    i = 0
    while i < len(payload):
        pq, tq = payload[i] >> 4, payload[i] & 0xF
        assert pq == 0, "only 8-bit quant tables supported"
        zz = np.frombuffer(payload[i + 1 : i + 65], dtype=np.uint8).astype(np.int32)
        nat = np.zeros(64, dtype=np.int32)
        nat = zz[UNZIGZAG]
        qtables[tq] = nat.reshape(8, 8)
        i += 65


def _parse_dht(payload: bytes, tables: dict[tuple[int, int], HuffmanTable]) -> None:
    i = 0
    while i < len(payload):
        tc, th = payload[i] >> 4, payload[i] & 0xF
        bits = list(payload[i + 1 : i + 17])
        n = sum(bits)
        values = list(payload[i + 17 : i + 17 + n])
        tables[(tc, th)] = HuffmanTable(bits=bits, values=values)
        i += 17 + n


class _Frame:
    def __init__(self, payload: bytes, progressive: bool):
        self.progressive = progressive
        prec, self.height, self.width, nf = struct.unpack(">BHHB", payload[:6])
        assert prec == 8
        self.comp_ids: list[int] = []
        self.qtab_ids: list[int] = []
        for c in range(nf):
            cid, hv, tq = payload[6 + 3 * c : 9 + 3 * c]
            assert hv == 0x11, "only 4:4:4 (1x1 sampling) supported"
            self.comp_ids.append(cid)
            self.qtab_ids.append(tq)
        self.nby = -(-self.height // 8)
        self.nbx = -(-self.width // 8)
        self.n_blocks = self.nby * self.nbx
        self.coeffs = [
            np.zeros((self.n_blocks, 64), dtype=np.int32) for _ in range(nf)
        ]


def _decode_dc_scan(r: BitReader, frame: _Frame, comps: list[int],
                    dc_tabs: list[HuffmanTable]) -> None:
    preds = [0] * len(comps)
    for m in range(frame.n_blocks):
        for j, c in enumerate(comps):
            size = r.read_symbol(dc_tabs[j])
            diff = extend(r.read(size), size)
            preds[j] += diff
            frame.coeffs[c][m, 0] = preds[j]


def _decode_sequential_ac(r: BitReader, tab: HuffmanTable, out: np.ndarray) -> None:
    k = 1
    while k < 64:
        sym = r.read_symbol(tab)
        run, size = sym >> 4, sym & 0xF
        if size == 0:
            if run == 15:
                k += 16
                continue
            break  # EOB
        k += run
        out[k] = extend(r.read(size), size)
        k += 1


def _decode_progressive_ac_scan(r: BitReader, frame: _Frame, c: int,
                                ss: int, se: int, tab: HuffmanTable) -> None:
    eobrun = 0
    coeffs = frame.coeffs[c]
    for b in range(frame.n_blocks):
        if eobrun > 0:
            eobrun -= 1
            continue
        k = ss
        while k <= se:
            sym = r.read_symbol(tab)
            run, size = sym >> 4, sym & 0xF
            if size == 0:
                if run == 15:
                    k += 16
                    continue
                eobrun = (1 << run) + (r.read(run) if run else 0) - 1
                break
            k += run
            coeffs[b, k] = extend(r.read(size), size)
            k += 1


def decode_to_coeffs(data: bytes) -> CoeffImage:
    """Entropy-decode a JPEG byte stream to a quantized coefficient image."""
    qtables: dict[int, np.ndarray] = {}
    htables: dict[tuple[int, int], HuffmanTable] = {}
    frame: _Frame | None = None
    for seg in markers.parse(data):
        if seg.marker == markers.DQT:
            _parse_dqt(seg.payload, qtables)
        elif seg.marker == markers.DHT:
            _parse_dht(seg.payload, htables)
        elif seg.marker in (markers.SOF0, markers.SOF2):
            frame = _Frame(seg.payload, progressive=seg.marker == markers.SOF2)
        elif seg.marker == markers.SOS:
            assert frame is not None, "SOS before SOF"
            p = seg.payload
            ns = p[0]
            scan_comps, dc_ids, ac_ids = [], [], []
            for j in range(ns):
                cid, tda = p[1 + 2 * j : 3 + 2 * j]
                scan_comps.append(frame.comp_ids.index(cid))
                dc_ids.append(tda >> 4)
                ac_ids.append(tda & 0xF)
            ss, se, ahal = p[1 + 2 * ns : 4 + 2 * ns]
            r = BitReader(seg.entropy)
            try:
                if ss == 0 and (not frame.progressive) and se == 63:
                    # Baseline interleaved scan: DC + AC per block.
                    preds = [0] * ns
                    dts = [htables[(0, d)] for d in dc_ids]
                    ats = [htables[(1, a)] for a in ac_ids]
                    for m in range(frame.n_blocks):
                        for j, c in enumerate(scan_comps):
                            size = r.read_symbol(dts[j])
                            preds[j] += extend(r.read(size), size)
                            frame.coeffs[c][m, 0] = preds[j]
                            _decode_sequential_ac(r, ats[j], frame.coeffs[c][m])
                elif ss == 0 and se == 0:
                    _decode_dc_scan(
                        r, frame, scan_comps, [htables[(0, d)] for d in dc_ids]
                    )
                else:
                    assert ns == 1, "progressive AC scans are single-component"
                    _decode_progressive_ac_scan(
                        r, frame, scan_comps[0], ss, se, htables[(1, ac_ids[0])]
                    )
            except EOFError:
                pass  # truncated final scan: keep what decoded so far
    assert frame is not None, "no frame found"
    comps = [
        Component(frame.comp_ids[c], frame.qtab_ids[c], frame.coeffs[c],
                  frame.nby, frame.nbx)
        for c in range(len(frame.coeffs))
    ]
    n_qt = max(frame.qtab_ids) + 1
    return CoeffImage(
        frame.height, frame.width, comps, [qtables[i] for i in range(n_qt)]
    )


def decode(data: bytes) -> np.ndarray:
    """Decode a JPEG byte stream (possibly a truncated prefix) to pixels."""
    return inverse(decode_to_coeffs(data))
