"""Unit tests for color conversion, blocking, and forward/inverse transform."""
import numpy as np
import pytest

from repro.jpeg.codec import (
    blocks_to_plane,
    forward,
    inverse,
    plane_to_blocks,
    rgb_to_ycbcr,
    ycbcr_to_rgb,
)


def _test_image(h=40, w=56, seed=0):
    rng = np.random.default_rng(seed)
    yy, xx = np.mgrid[0:h, 0:w]
    g = 128 + 50 * np.sin(xx / 9) + 30 * np.cos(yy / 7) + 8 * rng.standard_normal((h, w))
    rgb = np.stack([g, 0.9 * g + 10, 0.8 * g + 25], axis=-1)
    return np.clip(rgb, 0, 255).astype(np.uint8)


def test_ycbcr_roundtrip():
    img = _test_image()
    back = ycbcr_to_rgb(rgb_to_ycbcr(img))
    assert np.abs(back.astype(int) - img.astype(int)).max() <= 1


def test_ycbcr_gray_pixel_maps_to_zero_chroma():
    px = np.full((1, 1, 3), 77, dtype=np.uint8)
    ycc = rgb_to_ycbcr(px)
    assert np.isclose(ycc[0, 0, 0], 77, atol=0.5)
    assert np.allclose(ycc[0, 0, 1:], 128, atol=0.5)


@pytest.mark.parametrize("h,w", [(8, 8), (16, 24), (17, 9), (1, 1), (23, 64)])
def test_blocking_roundtrip(h, w):
    rng = np.random.default_rng(0)
    p = rng.uniform(0, 255, (h, w))
    blocks, nby, nbx = plane_to_blocks(p)
    assert blocks.shape == (nby * nbx, 8, 8)
    assert nby == -(-h // 8) and nbx == -(-w // 8)
    assert np.allclose(blocks_to_plane(blocks, nby, nbx, h, w), p)


def test_forward_shapes_color():
    ci = forward(_test_image(), 90)
    assert ci.n_components == 3
    assert len(ci.qtables) == 2
    for comp in ci.components:
        assert comp.coeffs.shape == (comp.nby * comp.nbx, 64)
        assert comp.coeffs.dtype == np.int32


def test_forward_shapes_gray():
    ci = forward(_test_image()[..., 0], 90)
    assert ci.n_components == 1
    assert len(ci.qtables) == 1


@pytest.mark.parametrize("quality,psnr_min", [(50, 24), (75, 26), (90, 29), (95, 32)])
def test_transform_roundtrip_psnr(quality, psnr_min):
    img = _test_image()
    dec = inverse(forward(img, quality))
    mse = np.mean((dec.astype(float) - img.astype(float)) ** 2)
    psnr = 10 * np.log10(255**2 / mse)
    assert psnr > psnr_min


def test_higher_quality_never_worse():
    img = _test_image(seed=3)
    errs = []
    for q in [30, 60, 90]:
        dec = inverse(forward(img, q))
        errs.append(np.mean((dec.astype(float) - img.astype(float)) ** 2))
    assert errs[0] >= errs[1] >= errs[2]


def test_flat_image_is_near_lossless():
    img = np.full((16, 16, 3), 100, dtype=np.uint8)
    dec = inverse(forward(img, 75))
    assert np.abs(dec.astype(int) - 100).max() <= 2
