"""The Progressive Compressed Record (PCR) on-disk format (paper Fig 4).

A PCR packs N progressive JPEGs so that *scan group g* — the g-th scan
of every image — is contiguous. Reading the file prefix up to scan
group g's end offset yields every image at fidelity g with one
sequential read, which is the paper's core mechanism for trading
fidelity against bandwidth without duplicating data.

File layout (little-endian, "raw struct" form — the paper's SQLite/
RocksDB+Protobuf metadata role is played by this fixed header plus the
parquet sidecar written by ``repro.core.dataset``):

    magic  b"PCR1"
    u32    n_images
    u8     n_scan_groups (G)
    u64    group_end[G]          absolute end offset of each scan group
    i32    label[n_images]       per-sample metadata ("scan group 0")
    u32    header_len[n_images]  per-image JPEG header lengths
    u32    scan_len[G][n_images] per-image scan delta lengths
    bytes  jpeg headers (image order)      -- always read
    bytes  scan group 1 deltas (image order)
    ...
    bytes  scan group G deltas (image order)

Reassembling image i at fidelity g = header_i + deltas 1..g + EOI,
which our (truncation-tolerant) decoder renders — identical bytes to
``markers.truncate_to_scans`` on the original progressive file.
"""
import struct
from dataclasses import dataclass

import numpy as np

from repro.jpeg import markers

MAGIC = b"PCR1"


@dataclass
class PcrInfo:
    """Offsets/sizes of one PCR file, as recorded at write time."""

    path: str
    n_images: int
    n_scan_groups: int
    group_end: list[int]  # absolute file offset at which scan group g ends
    labels: list[int]
    header_lens: list[int]
    scan_lens: list[list[int]]  # [group][image]

    def prefix_bytes(self, g: int) -> int:
        """Bytes that must be read to access the dataset at fidelity g."""
        assert 1 <= g <= self.n_scan_groups
        return self.group_end[g - 1]


def write_pcr(path: str, images: list[tuple[bytes, int]]) -> PcrInfo:
    """Write progressive JPEGs (with labels) as one PCR file.

    ``images`` is a list of (progressive_jpeg_bytes, label). The encoder
    locates scan boundaries by scanning for JPEG markers (paper §5) and
    regroups the byte spans by scan index.
    """
    headers: list[bytes] = []
    scans: list[list[bytes]] = []  # [image][scan]
    labels: list[int] = []
    n_groups = None
    for data, label in images:
        (h0, h1), spans = markers.scan_spans(data)
        if n_groups is None:
            n_groups = len(spans)
        assert len(spans) == n_groups, "all images must share the scan script"
        headers.append(data[h0:h1])
        scans.append([data[s:e] for s, e in spans])
        labels.append(int(label))

    n = len(images)
    g = n_groups
    header_lens = [len(h) for h in headers]
    scan_lens = [[len(scans[i][j]) for i in range(n)] for j in range(g)]

    fixed = len(MAGIC) + 4 + 1 + 8 * g + 4 * n + 4 * n + 4 * g * n
    data_start = fixed + sum(header_lens)
    group_end = []
    off = data_start
    for j in range(g):
        off += sum(scan_lens[j])
        group_end.append(off)

    with open(path, "wb") as f:
        f.write(MAGIC)
        f.write(struct.pack("<IB", n, g))
        f.write(struct.pack(f"<{g}Q", *group_end))
        f.write(struct.pack(f"<{n}i", *labels))
        f.write(struct.pack(f"<{n}I", *header_lens))
        for j in range(g):
            f.write(struct.pack(f"<{n}I", *scan_lens[j]))
        for h in headers:
            f.write(h)
        for j in range(g):
            for i in range(n):
                f.write(scans[i][j])
    return PcrInfo(path, n, g, group_end, labels, header_lens, scan_lens)


def read_index(path: str) -> PcrInfo:
    """Read only the fixed index of a PCR file (the in-memory metadata)."""
    with open(path, "rb") as f:
        magic = f.read(4)
        assert magic == MAGIC, f"not a PCR file: {path}"
        n, g = struct.unpack("<IB", f.read(5))
        group_end = list(struct.unpack(f"<{g}Q", f.read(8 * g)))
        labels = list(struct.unpack(f"<{n}i", f.read(4 * n)))
        header_lens = list(struct.unpack(f"<{n}I", f.read(4 * n)))
        scan_lens = [
            list(struct.unpack(f"<{n}I", f.read(4 * n))) for _ in range(g)
        ]
    return PcrInfo(path, n, g, group_end, labels, header_lens, scan_lens)


def read_pcr(path: str, scan_group: int) -> list[tuple[int, bytes]]:
    """Read a PCR at fidelity ``scan_group``; returns [(label, jpeg_bytes)].

    Performs exactly one sequential read of the file prefix up to the
    requested scan group's end offset (the PCR access pattern), then
    reassembles each image's truncated progressive JPEG in memory.
    """
    info = read_index(path)
    g = max(1, min(scan_group, info.n_scan_groups))
    with open(path, "rb") as f:
        buf = f.read(info.prefix_bytes(g))  # single sequential read

    n = info.n_images
    fixed = (
        len(MAGIC) + 5 + 8 * info.n_scan_groups + 4 * n + 4 * n
        + 4 * info.n_scan_groups * n
    )
    h_off = np.concatenate([[0], np.cumsum(info.header_lens)]) + fixed
    out_parts: list[list[bytes]] = []
    for i in range(n):
        out_parts.append([buf[h_off[i] : h_off[i + 1]]])
    off = h_off[-1]
    for j in range(g):
        lens = info.scan_lens[j]
        offs = np.concatenate([[0], np.cumsum(lens)]) + off
        for i in range(n):
            out_parts[i].append(buf[offs[i] : offs[i + 1]])
        off = offs[-1]
    return [
        (info.labels[i], b"".join(out_parts[i]) + markers.EOI_BYTES)
        for i in range(n)
    ]
