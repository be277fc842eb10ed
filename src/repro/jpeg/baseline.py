"""Baseline sequential JPEG encoder (SOF0, one interleaved scan).

Entropy coding runs in two passes per scan: a symbol-gathering pass
(producing ``(symbol, extra_value, extra_bits)`` ops) drives optimal
Huffman table construction, then the ops are written out. This mirrors
libjpeg's ``-optimize`` path and keeps one table-building code path for
both baseline and progressive encoders.
"""
import struct

import numpy as np

from . import markers
from .codec import CoeffImage, forward
from .huffman import BitWriter, build_optimal_table, magnitude_bits
from .quant import ZIGZAG

Ops = list[tuple[int, int, int]]  # (huffman symbol, extra value, extra bit count)


def _dc_op(diff: int) -> tuple[int, int, int]:
    bits, size = magnitude_bits(diff)
    return size, bits, size


def sequential_scan_ops(ci: CoeffImage) -> tuple[list[Ops], list[Ops]]:
    """Per-component DC op streams and AC op streams, MCU order.

    Returns (dc_ops[comp], ac_ops[comp]) where ops are already in the
    order blocks are visited (raster MCU order, 4:4:4 so one block per
    component per MCU).
    """
    dc_ops: list[Ops] = [[] for _ in ci.components]
    ac_ops: list[Ops] = [[] for _ in ci.components]
    for c, comp in enumerate(ci.components):
        pred = 0
        for blk in comp.coeffs:
            dc_ops[c].append(_dc_op(int(blk[0]) - pred))
            pred = int(blk[0])
            ops: Ops = []
            run = 0
            for k in range(1, 64):
                v = int(blk[k])
                if v == 0:
                    run += 1
                    continue
                while run > 15:
                    ops.append((0xF0, 0, 0))
                    run -= 16
                bits, size = magnitude_bits(v)
                ops.append(((run << 4) | size, bits, size))
                run = 0
            if run > 0:
                ops.append((0x00, 0, 0))  # EOB
            ac_ops[c].append(ops)
    return dc_ops, ac_ops


def _dht_payload(table, tclass: int, tid: int) -> bytes:
    return bytes([tclass << 4 | tid]) + bytes(table.bits) + bytes(table.values)


def _count(op_lists) -> np.ndarray:
    f = np.zeros(256, dtype=np.int64)
    for ops in op_lists:
        if isinstance(ops, tuple):
            f[ops[0]] += 1
        else:
            for sym, _, _ in ops:
                f[sym] += 1
    return f


def _header(ci: CoeffImage, sof_marker: int) -> bytes:
    out = markers.seg(markers.SOI)
    out += markers.seg(markers.APP0, b"JFIF\x00\x01\x01\x00\x00\x01\x00\x01\x00\x00")
    for tid, qt in enumerate(ci.qtables):
        zz = qt.reshape(-1)[ZIGZAG]
        out += markers.seg(markers.DQT, bytes([tid]) + bytes(int(v) for v in zz))
    sof = struct.pack(">BHHB", 8, ci.height, ci.width, ci.n_components)
    for comp in ci.components:
        sof += bytes([comp.comp_id, 0x11, comp.qtab_id])
    out += markers.seg(sof_marker, sof)
    return out


def encode_baseline_from_coeffs(ci: CoeffImage) -> bytes:
    """Serialize a coefficient image as baseline sequential JPEG."""
    nc = ci.n_components
    dc_ops, ac_ops = sequential_scan_ops(ci)
    # Table ids: 0 = luma, 1 = chroma (components 2,3 share id 1).
    tids = [0 if c == 0 else 1 for c in range(nc)]
    dc_tabs, ac_tabs = {}, {}
    for tid in sorted(set(tids)):
        comps = [c for c in range(nc) if tids[c] == tid]
        dc_tabs[tid] = build_optimal_table(
            sum(_count(dc_ops[c]) for c in comps)
        )
        ac_tabs[tid] = build_optimal_table(
            sum(_count([op for blk in ac_ops[c] for op in blk]) for c in comps)
        )

    out = _header(ci, markers.SOF0)
    for tid in sorted(dc_tabs):
        out += markers.seg(
            markers.DHT,
            _dht_payload(dc_tabs[tid], 0, tid) + _dht_payload(ac_tabs[tid], 1, tid),
        )
    sos = bytes([nc])
    for c, comp in enumerate(ci.components):
        sos += bytes([comp.comp_id, tids[c] << 4 | tids[c]])
    sos += bytes([0, 63, 0])
    out += markers.seg(markers.SOS, sos)

    w = BitWriter()
    n_mcu = ci.components[0].coeffs.shape[0]
    for m in range(n_mcu):
        for c in range(nc):
            sym, bits, size = dc_ops[c][m]
            w.write_code(dc_tabs[tids[c]], sym)
            w.write(bits, size)
            for sym, bits, size in ac_ops[c][m]:
                w.write_code(ac_tabs[tids[c]], sym)
                w.write(bits, size)
    out += w.getvalue()
    out += markers.seg(markers.EOI)
    return out


def encode_baseline(img: np.ndarray, quality: int = 90) -> bytes:
    """Encode an RGB/grayscale uint8 image as baseline sequential JPEG."""
    return encode_baseline_from_coeffs(forward(img, quality))
