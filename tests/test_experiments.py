"""Tests for the experiment harness functions over a prebuilt dataset.

These exercise the same code paths as jobs/ but against the session
fixtures (no full-scale dataset builds), asserting the *shape*
properties that EXPERIMENTS.md records.
"""
import numpy as np
import pytest

from repro.core import harness
from repro.core.dataset import read_metadata
from repro.train import experiments as tx


def _patch_harness(monkeypatch, name, out_dir):
    # Route harness.get_or_build to the existing session fixture dir.
    monkeypatch.setattr(
        harness, "get_or_build", lambda spark, n, sf=1.0: out_dir
    )


def test_seconds_per_epoch_monotone(spark, celeba_dir, monkeypatch):
    _patch_harness(monkeypatch, "celeba_lite", celeba_dir)
    spe = tx.seconds_per_epoch(spark, "celeba_lite", 0.25, "resnet_lite")
    times = [spe[g] for g in range(1, 11)]
    assert times == sorted(times)
    # Scan 10 is IO bound by 2x in the reference regime.
    assert times[-1] > 1.5 * times[0]


def test_load_scan_data_shapes(spark, celeba_dir, monkeypatch):
    _patch_harness(monkeypatch, "celeba_lite", celeba_dir)
    data = tx.load_scan_data(spark, "celeba_lite", 0.25, scans=(1, 10))
    assert set(data.X_by_scan) == {1, 10}
    assert data.X_by_scan[1].shape == data.X_by_scan[10].shape
    assert data.n_classes == 2
    assert len(data.y) == len(data.X_by_scan[1])
    assert len(data.yte) == len(data.Xte_by_scan[1])


def test_load_scan_data_standardized_per_scan(spark, celeba_dir, monkeypatch):
    _patch_harness(monkeypatch, "celeba_lite", celeba_dir)
    data = tx.load_scan_data(spark, "celeba_lite", 0.25, scans=(1, 10))
    for g in (1, 10):
        X = data.X_by_scan[g]
        assert np.abs(X.mean(axis=0)).max() < 1e-6
        assert np.abs(X).max() < 25  # min_std floor prevents blowups


def test_accuracy_curves_full_fidelity_learns(spark, celeba_dir, monkeypatch):
    _patch_harness(monkeypatch, "celeba_lite", celeba_dir)
    data = tx.load_scan_data(spark, "celeba_lite", 0.25, scans=(10,))
    curves = tx.accuracy_curves(data, epochs=20)
    assert len(curves[10]) == 20
    assert curves[10][-1] > 0.7


def test_fig7_table_columns(spark, celeba_dir, monkeypatch):
    _patch_harness(monkeypatch, "celeba_lite", celeba_dir)
    t = tx.fig7_time_to_accuracy(
        spark, "celeba_lite", 0.25, models=("resnet_lite",), scans=(1, 10)
    )
    assert set(t.columns) >= {
        "dataset", "model", "scan", "final_acc", "epoch_s", "time_to_target_s"
    }
    assert len(t) == 2
    # Higher scans cost more per epoch.
    t = t.sort_values("scan")
    assert t["epoch_s"].is_monotonic_increasing


def test_fig16_low_bandwidth_amplifies_scan_benefit(spark, celeba_dir, monkeypatch):
    _patch_harness(monkeypatch, "celeba_lite", celeba_dir)
    t = tx.fig16_bandwidth_sweep(
        spark, "celeba_lite", 0.25, models=("resnet_lite",),
        bandwidth_fracs=(0.1, 2.0), scans=(1, 10), target_frac=0.5,
    )
    lo = t[t["bandwidth_MiB_s"] == t["bandwidth_MiB_s"].min()]
    hi = t[t["bandwidth_MiB_s"] == t["bandwidth_MiB_s"].max()]

    def ratio(sub):
        s1 = sub[sub["scan"] == 1]["time_to_target_s"].iloc[0]
        s10 = sub[sub["scan"] == 10]["time_to_target_s"].iloc[0]
        return s10 / s1

    # Scan 1's advantage is larger at low bandwidth (paper Fig 16).
    assert ratio(lo) >= ratio(hi) - 1e-9


def test_fig6_similarity_ordered_by_fidelity(spark, celeba_dir, monkeypatch):
    _patch_harness(monkeypatch, "celeba_lite", celeba_dir)
    t = tx.fig6_gradient_similarity(
        spark, "celeba_lite", 0.25, scans=(1, 5, 10), checkpoints=(3,),
        probe_size=64,
    )
    row = t.iloc[0]
    assert row["scan_10"] == pytest.approx(1.0)
    assert row["scan_1"] <= row["scan_5"] + 0.05
