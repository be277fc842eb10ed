"""Tests for distributed gradient computation and end-to-end training."""
import numpy as np
import pytest

from repro.core.dataset import collect_features, features_to_arrays, load_features
from repro.train.features import feature_mask
from repro.train.model import SoftmaxModel, standardize, train_sgd
from repro.train.spark_train import distributed_gradient


def test_distributed_gradient_equals_local(spark, celeba_dir):
    feats = load_features(spark, celeba_dir, 5).repartition(4)
    pdf = feats.orderBy("record", "pos").toPandas()
    X = np.stack(pdf["features"].to_numpy())
    y = pdf["label"].to_numpy().astype(np.int64)
    m = SoftmaxModel(X.shape[1], 2, l2=1e-3, seed=0)
    dW_d, db_d = distributed_gradient(feats, m)
    dW_l, db_l = m.gradient(X, y)
    assert np.allclose(dW_d, dW_l, atol=1e-10)
    assert np.allclose(db_d, db_l, atol=1e-10)


def test_distributed_gradient_with_mask(spark, celeba_dir):
    mask = feature_mask("shufflenet_lite")
    feats = load_features(spark, celeba_dir, 5).repartition(3)
    pdf = feats.toPandas()
    X = np.stack(pdf["features"].to_numpy())[:, mask]
    y = pdf["label"].to_numpy().astype(np.int64)
    m = SoftmaxModel(int(mask.sum()), 2, seed=1)
    dW_d, db_d = distributed_gradient(feats, m, feature_mask=mask)
    dW_l, db_l = m.gradient(X, y)
    assert np.allclose(dW_d, dW_l, atol=1e-10)
    assert np.allclose(db_d, db_l, atol=1e-10)


def test_training_beats_chance_full_fidelity(spark, celeba_dir):
    pdf = collect_features(spark, celeba_dir, 10)
    Xtr, ytr, Xte, yte = features_to_arrays(pdf)
    Xtr, mu, sd = standardize(Xtr)
    Xte, _, _ = standardize(Xte, mu, sd)
    m = SoftmaxModel(Xtr.shape[1], 2, seed=0)
    train_sgd(m, Xtr, ytr, epochs=30, lr=0.3)
    assert m.accuracy(Xte, yte) > 0.75


def test_fine_task_degrades_at_scan1_coarse_does_not(spark, cars_dir):
    """The paper's §6.3 mechanism on the cars dataset: label coarsening
    closes the accuracy gap between scan groups."""
    accs = {}
    for label_col in ["label", "make"]:
        for g in [1, 10]:
            pdf = collect_features(spark, cars_dir, g)
            Xtr, ytr, Xte, yte = features_to_arrays(pdf, label_col)
            nc = int(max(ytr.max(), yte.max()) + 1)
            Xtr, mu, sd = standardize(Xtr, min_std=0.05)
            Xte, _, _ = standardize(Xte, mu, sd)
            m = SoftmaxModel(Xtr.shape[1], nc, seed=0)
            train_sgd(m, Xtr, ytr, epochs=40, lr=0.3, lr_drops=(25, 35))
            accs[(label_col, g)] = m.accuracy(Xte, yte)
    gap_fine = accs[("label", 10)] - accs[("label", 1)]
    gap_coarse = accs[("make", 10)] - accs[("make", 1)]
    assert gap_fine > 0.1, accs
    assert gap_coarse < gap_fine, accs
