"""8x8 type-II DCT used by JPEG, vectorized over stacks of blocks.

JPEG's FDCT/IDCT pair is the orthonormal 2-D DCT on 8x8 blocks. We
implement it as two matrix multiplies with the orthonormal DCT-II basis
``D`` (``forward = D B D^T``, ``inverse = D^T C D``), which numpy executes
as batched GEMMs over an ``(..., 8, 8)`` stack — no Python-level loops.
"""
import numpy as np

N = 8


def _basis() -> np.ndarray:
    """Orthonormal 8-point DCT-II basis matrix ``D`` (rows = frequencies)."""
    k = np.arange(N).reshape(-1, 1)
    n = np.arange(N).reshape(1, -1)
    d = np.sqrt(2.0 / N) * np.cos((2 * n + 1) * k * np.pi / (2 * N))
    d[0, :] /= np.sqrt(2.0)
    return d


_D = _basis()
_DT = _D.T


def fdct2(blocks: np.ndarray) -> np.ndarray:
    """Forward 2-D DCT of an ``(..., 8, 8)`` stack of blocks (float64)."""
    return _D @ blocks @ _DT


def idct2(coeffs: np.ndarray) -> np.ndarray:
    """Inverse 2-D DCT of an ``(..., 8, 8)`` stack of coefficient blocks."""
    return _DT @ coeffs @ _D
