"""Unit tests for features, the softmax model, gradsim, and the autotuner."""
import numpy as np
import pytest

from repro.train.autotune import autotune_train, static_train
from repro.train.features import (
    BAND_OF_FEATURE,
    N_BAND_FEATURES,
    N_FEATURES,
    N_PIXEL_FEATURES,
    extract_features,
    feature_mask,
)
from repro.train.gradsim import cosine_similarity, gradient_similarity, similarity_by_scan
from repro.train.model import SoftmaxModel, softmax, standardize, train_sgd


def _img(seed=0):
    rng = np.random.default_rng(seed)
    yy, xx = np.mgrid[0:64, 0:64]
    g = 128 + 40 * np.sin(xx / 7) + 10 * rng.standard_normal((64, 64))
    return np.clip(g, 0, 255).astype(np.uint8)


# ---------- features ----------

def test_feature_dimensions():
    f = extract_features(_img())
    assert f.shape == (N_FEATURES,)
    assert N_FEATURES == N_PIXEL_FEATURES + N_BAND_FEATURES
    assert len(BAND_OF_FEATURE) == N_BAND_FEATURES


def test_features_deterministic():
    assert np.array_equal(extract_features(_img()), extract_features(_img()))


def test_feature_masks():
    r = feature_mask("resnet_lite")
    s = feature_mask("shufflenet_lite")
    assert r.all()
    assert s.sum() < r.sum()
    assert s[N_PIXEL_FEATURES:].all()  # band features always visible
    assert s[:N_PIXEL_FEATURES].sum() == 16  # coarse 4x4 pixel grid
    with pytest.raises(ValueError):
        feature_mask("alexnet")


def test_band_features_respond_to_truncation():
    # Dropping high scans must zero the high-band features (up to quant).
    from repro.jpeg import encode_progressive, decode, truncate_to_scans

    img = _img(3)
    p = encode_progressive(img, 95)
    f_full = extract_features(decode(p))
    f_s1 = extract_features(decode(truncate_to_scans(p, 1)))
    hi = N_PIXEL_FEATURES + np.nonzero(BAND_OF_FEATURE >= 4)[0]
    assert f_s1[hi].sum() < 0.25 * f_full[hi].sum()
    # Low-frequency pixel features survive.
    lo = slice(0, N_PIXEL_FEATURES)
    assert np.abs(f_s1[lo] - f_full[lo]).mean() < 0.05


# ---------- model ----------

def test_softmax_rows_sum_to_one():
    z = np.random.default_rng(0).standard_normal((5, 4))
    p = softmax(z)
    assert np.allclose(p.sum(axis=1), 1.0)
    assert (p > 0).all()


def test_gradient_matches_finite_differences():
    rng = np.random.default_rng(0)
    X = rng.standard_normal((20, 6))
    y = rng.integers(0, 3, 20)
    m = SoftmaxModel(6, 3, l2=1e-3, seed=1)
    dW, db = m.gradient(X, y)
    eps = 1e-6
    for idx in [(0, 0), (2, 1), (5, 2)]:
        m.W[idx] += eps
        up = m.loss(X, y)
        m.W[idx] -= 2 * eps
        dn = m.loss(X, y)
        m.W[idx] += eps
        assert dW[idx] == pytest.approx((up - dn) / (2 * eps), rel=1e-4, abs=1e-7)
    for j in range(3):
        m.b[j] += eps
        up = m.loss(X, y)
        m.b[j] -= 2 * eps
        dn = m.loss(X, y)
        m.b[j] += eps
        assert db[j] == pytest.approx((up - dn) / (2 * eps), rel=1e-4, abs=1e-7)


def test_training_learns_separable_data():
    rng = np.random.default_rng(0)
    X = rng.standard_normal((300, 5))
    y = (X[:, 0] + X[:, 1] > 0).astype(int)
    m = SoftmaxModel(5, 2, seed=0)
    train_sgd(m, X, y, epochs=30, lr=0.5)
    assert m.accuracy(X, y) > 0.9


def test_lr_drops_applied():
    rng = np.random.default_rng(0)
    X = rng.standard_normal((50, 3))
    y = rng.integers(0, 2, 50)
    m = SoftmaxModel(3, 2, seed=0)
    out = train_sgd(m, X, y, epochs=4, lr=0.1, lr_drops=(2,),
                    eval_fn=lambda mm, e: e)
    assert out == [0, 1, 2, 3]


def test_standardize_roundtrip():
    rng = np.random.default_rng(0)
    X = rng.standard_normal((40, 4)) * 5 + 3
    Xs, mu, sd = standardize(X)
    assert np.allclose(Xs.mean(axis=0), 0, atol=1e-9)
    assert np.allclose(Xs.std(axis=0), 1, atol=1e-6)
    X2, _, _ = standardize(X, mu, sd)
    assert np.allclose(Xs, X2)


# ---------- gradient similarity ----------

def test_cosine_similarity_basics():
    a = np.array([1.0, 0.0])
    assert cosine_similarity(a, a) == pytest.approx(1.0)
    assert cosine_similarity(a, -a) == pytest.approx(-1.0)
    assert cosine_similarity(a, np.array([0.0, 1.0])) == pytest.approx(0.0)
    assert cosine_similarity(a, np.zeros(2)) == 0.0


def test_gradient_similarity_identical_data_is_one():
    rng = np.random.default_rng(0)
    X = rng.standard_normal((64, 8))
    y = rng.integers(0, 3, 64)
    m = SoftmaxModel(8, 3, seed=0)
    assert gradient_similarity(m, X, X.copy(), y) == pytest.approx(1.0)


def test_gradient_similarity_decreases_with_corruption():
    rng = np.random.default_rng(0)
    X = rng.standard_normal((128, 8))
    y = (X[:, 0] > 0).astype(int)
    m = SoftmaxModel(8, 2, seed=0)
    train_sgd(m, X, y, epochs=5, lr=0.3)
    sims = []
    for sigma in [0.0, 0.5, 3.0]:
        Xc = X + rng.standard_normal(X.shape) * sigma
        sims.append(gradient_similarity(m, X, Xc, y))
    assert sims[0] == pytest.approx(1.0)
    assert sims[0] > sims[1] > sims[2]


def test_similarity_by_scan_keys():
    rng = np.random.default_rng(0)
    X = rng.standard_normal((32, 4))
    y = rng.integers(0, 2, 32)
    m = SoftmaxModel(4, 2, seed=0)
    out = similarity_by_scan(m, {1: X * 0.2, 5: X + 0.1, 10: X}, y)
    assert set(out) == {1, 5, 10}
    assert out[10] == pytest.approx(1.0)


# ---------- autotuner ----------

def _scan_family(seed=0, n=400, d=12):
    """Synthetic multi-fidelity data: lower scans lose feature detail."""
    rng = np.random.default_rng(seed)
    X = rng.standard_normal((n, d))
    y = (X[:, :4].sum(axis=1) > 0).astype(int)
    by_scan = {}
    for g, keep in [(1, 2), (2, 4), (5, 8), (10, d)]:
        Xg = X.copy()
        Xg[:, keep:] = 0.0
        by_scan[g] = Xg
    return by_scan, y


def test_autotuner_starts_at_full_fidelity():
    by_scan, y = _scan_family()
    res = autotune_train(by_scan, y, by_scan[10][:50], y[:50], 2, epochs=6,
                         warmup_epochs=5, tune_every=20)
    assert res.scan_per_epoch[:5] == [10] * 5


def test_autotuner_picks_cheapest_acceptable_scan():
    by_scan, y = _scan_family()
    res = autotune_train(by_scan, y, by_scan[10][:50], y[:50], 2, epochs=10,
                         warmup_epochs=2, tune_every=20, threshold=0.8)
    chosen = res.scan_per_epoch[-1]
    assert chosen < 10  # something cheaper than full fidelity is fine
    assert res.similarity_log, "tuner must have probed"
    probe = res.similarity_log[0]
    assert probe[f"scan_{chosen}"] >= 0.8


def test_autotuner_threshold_one_keeps_full_fidelity():
    by_scan, y = _scan_family()
    res = autotune_train(by_scan, y, by_scan[10][:50], y[:50], 2, epochs=8,
                         warmup_epochs=2, tune_every=20, threshold=1.01)
    assert set(res.scan_per_epoch) == {10}


def test_static_train_returns_accuracy_curve():
    by_scan, y = _scan_family()
    accs = static_train(by_scan[10], y, by_scan[10][:50], y[:50], 2, epochs=8)
    assert len(accs) == 8
    assert accs[-1] > 0.8
