"""Quantization tables, IJG quality scaling, zigzag order, quality estimation.

The quality -> table mapping is the IJG (libjpeg) formula, so our
``quality`` parameter means the same thing as libjpeg's ``-quality`` and
ImageMagick's ``%Q`` estimate. ``estimate_quality`` inverts the mapping
from a scaled table, which is how we fill the "Quality" column of the
paper's Table 3 (the paper uses ``identify -format '%Q'``).
"""
import numpy as np

# Annex K.1 luminance / chrominance base tables (natural row-major order).
STD_LUMA_QT = np.array(
    [
        16, 11, 10, 16, 24, 40, 51, 61,
        12, 12, 14, 19, 26, 58, 60, 55,
        14, 13, 16, 24, 40, 57, 69, 56,
        14, 17, 22, 29, 51, 87, 80, 62,
        18, 22, 37, 56, 68, 109, 103, 77,
        24, 35, 55, 64, 81, 104, 113, 92,
        49, 64, 78, 87, 103, 121, 120, 101,
        72, 92, 95, 98, 112, 100, 103, 99,
    ],
    dtype=np.int32,
).reshape(8, 8)

STD_CHROMA_QT = np.array(
    [
        17, 18, 24, 47, 99, 99, 99, 99,
        18, 21, 26, 66, 99, 99, 99, 99,
        24, 26, 56, 99, 99, 99, 99, 99,
        47, 66, 99, 99, 99, 99, 99, 99,
        99, 99, 99, 99, 99, 99, 99, 99,
        99, 99, 99, 99, 99, 99, 99, 99,
        99, 99, 99, 99, 99, 99, 99, 99,
        99, 99, 99, 99, 99, 99, 99, 99,
    ],
    dtype=np.int32,
).reshape(8, 8)


def _zigzag_order() -> np.ndarray:
    """Indices such that ``flat_block[ZIGZAG] -> zigzag-ordered vector``."""
    # Odd anti-diagonals run top-right -> bottom-left (ascending i);
    # even ones run bottom-left -> top-right (ascending j).
    order = sorted(
        ((i, j) for i in range(8) for j in range(8)),
        key=lambda p: (p[0] + p[1], p[0] if (p[0] + p[1]) % 2 else p[1]),
    )
    return np.array([i * 8 + j for i, j in order], dtype=np.int64)


ZIGZAG = _zigzag_order()
# Inverse permutation: zigzag-ordered vector -> natural row-major order.
UNZIGZAG = np.argsort(ZIGZAG)


def scale_table(base: np.ndarray, quality: int) -> np.ndarray:
    """IJG quality scaling of a base quantization table (clamped to [1, 255])."""
    quality = int(np.clip(quality, 1, 100))
    scale = 5000 // quality if quality < 50 else 200 - 2 * quality
    t = (base.astype(np.int64) * scale + 50) // 100
    return np.clip(t, 1, 255).astype(np.int32)


def tables_for_quality(quality: int) -> tuple[np.ndarray, np.ndarray]:
    """(luma, chroma) quantization tables at the given IJG quality."""
    return scale_table(STD_LUMA_QT, quality), scale_table(STD_CHROMA_QT, quality)


def estimate_quality(luma_qt: np.ndarray) -> int:
    """Invert the IJG scaling to recover the quality setting from a table.

    Mirrors what ``identify -format '%Q'`` does in spirit: find the
    quality whose scaled standard table best matches the observed one
    (exact for tables we produced ourselves, since scaling is injective
    enough over 1..100 for the standard base table).
    """
    best_q, best_err = 1, np.inf
    obs = luma_qt.astype(np.int64)
    for q in range(1, 101):
        err = np.abs(scale_table(STD_LUMA_QT, q).astype(np.int64) - obs).sum()
        if err < best_err:
            best_q, best_err = q, err
    return best_q
