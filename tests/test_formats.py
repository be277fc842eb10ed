"""Unit tests for the baseline record layouts (TFRecord, File-per-Image)."""
import os

import pytest

from repro.formats import fpi, tfrecord


@pytest.fixture()
def items():
    return [(bytes([i]) * (50 + i), i % 3) for i in range(10)]


def test_tfrecord_roundtrip(tmp_path, items):
    p = str(tmp_path / "x.tfrec")
    total = tfrecord.write_tfrecord(p, items)
    assert os.path.getsize(p) == total
    out = tfrecord.read_tfrecord(p)
    assert [(j, l) for j, l in zip((i[0] for i in items), (i[1] for i in items))] == [
        (j, l) for l, j in out
    ]


def test_tfrecord_framing_overhead(tmp_path, items):
    p = str(tmp_path / "x.tfrec")
    total = tfrecord.write_tfrecord(p, items)
    payload = sum(len(j) for j, _ in items)
    # 16 bytes framing + 8 bytes example header per record.
    assert total == payload + 24 * len(items)


def test_tfrecord_crc_detects_corruption(tmp_path, items):
    p = str(tmp_path / "x.tfrec")
    tfrecord.write_tfrecord(p, items)
    data = bytearray(open(p, "rb").read())
    data[20] ^= 0xFF
    open(p, "wb").write(bytes(data))
    with pytest.raises(AssertionError):
        tfrecord.read_tfrecord(p)


def test_fpi_roundtrip(tmp_path, items):
    d = str(tmp_path / "fpi")
    paths = fpi.write_fpi(d, items)
    assert len(paths) == len(items)
    out = fpi.read_fpi(d)
    assert [(l, j) for j, l in items] == out


def test_fpi_one_file_per_image(tmp_path, items):
    d = str(tmp_path / "fpi")
    fpi.write_fpi(d, items)
    jpgs = [f for f in os.listdir(d) if f.endswith(".jpg")]
    assert len(jpgs) == len(items)
