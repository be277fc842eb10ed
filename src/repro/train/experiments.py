"""Training-side experiment harnesses (Figs 6/7/9/10/11/14/16 as tables).

Features are extracted once per (dataset, scan) through the Spark PCR
loader and cached in-process; training sweeps are then cheap numpy SGD.
Wall-clock *cluster* time is simulated with the iosim pipeline model
using the paper's own hardware constants (see harness docstring) — the
paper's evaluation axis is time-to-accuracy, i.e. accuracy curves
composed with per-epoch I/O time.
"""
from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core import harness
from repro.core.analysis import scan_size_stats
from repro.core.dataset import collect_features, features_to_arrays, read_metadata
from repro.iosim.pipeline import epoch_time
from repro.iosim.storage import MiB
from repro.synth_images import SPECS, n_images
from repro.train.autotune import autotune_train, static_train
from repro.train.features import feature_mask
from repro.train.gradsim import similarity_by_scan
from repro.train.model import SoftmaxModel, standardize, train_sgd

DEFAULT_SCANS = (1, 2, 5, 10)
EPOCHS = 40
LR = 0.3
LR_DROPS = (25, 35)  # paper drops at 30/60 of 90; scaled to 40 epochs

_FEATURE_CACHE: dict = {}


@dataclass
class ScanData:
    """Aligned train/test arrays for every scan group of one dataset."""

    X_by_scan: dict[int, np.ndarray]
    Xte_by_scan: dict[int, np.ndarray]
    y: np.ndarray
    yte: np.ndarray
    n_classes: int


def load_scan_data(spark: SparkSession, dataset: str, sf: float = 1.0,
                   scans=DEFAULT_SCANS, label_col: str = "label",
                   model: str = "resnet_lite") -> ScanData:
    """Features at each scan group, standardized per scan group.

    Per-scan train statistics are the substrate's batch-norm analogue: a
    CNN normalizes whatever distribution it is fed, so each fidelity's
    features get their own (mean, std). ``min_std`` floors the scale so
    bands that truncation zeroes don't become amplified noise. Informative
    shared coordinates end up near-identical across scans, which is what
    makes gradient comparisons between fidelities meaningful (§4.3).
    """
    out = harness.get_or_build(spark, dataset, sf)
    mask = feature_mask(model)
    raw = {}
    for g in sorted(set(scans) | {10}):
        key = (out, g)
        if key not in _FEATURE_CACHE:
            _FEATURE_CACHE[key] = collect_features(spark, out, g)
        raw[g] = _FEATURE_CACHE[key]
    X_by_scan, Xte_by_scan = {}, {}
    y = yte = None
    for g in scans:
        Xtr, ytr, Xte, yte_g = features_to_arrays(raw[g], label_col)
        X_by_scan[g], mu, sd = standardize(Xtr[:, mask], min_std=0.05)
        Xte_by_scan[g], _, _ = standardize(Xte[:, mask], mu, sd)
        y, yte = ytr, yte_g
    return ScanData(X_by_scan, Xte_by_scan, y, yte,
                    int(max(y.max(), yte.max()) + 1))


def accuracy_curves(data: ScanData, seed: int = 0,
                    epochs: int = EPOCHS) -> dict[int, list[float]]:
    """Test-accuracy-per-epoch for a model trained at each scan group."""
    return {
        g: static_train(
            data.X_by_scan[g], data.y, data.Xte_by_scan[g], data.yte,
            data.n_classes, epochs=epochs, lr=LR, lr_drops=LR_DROPS, seed=seed,
        )
        for g in data.X_by_scan
    }


def seconds_per_epoch(spark: SparkSession, dataset: str, sf: float,
                      model: str, bandwidth: float | None = None) -> dict[int, float]:
    """Simulated cluster epoch time per scan group (Little's-law model)."""
    out = harness.get_or_build(spark, dataset, sf)
    meta = read_metadata(spark, out)
    if bandwidth is None:
        bandwidth = harness.reference_bandwidth(meta)
    stats = scan_size_stats(meta).iloc[0]
    n = n_images(SPECS[dataset], sf)
    rate = harness.cluster_rate(model)
    return {
        g: epoch_time(n, bandwidth, float(stats[f"mean_cum_{g}"]), rate)
        for g in range(1, 11)
    }


def fig7_time_to_accuracy(spark: SparkSession, dataset: str, sf: float = 1.0,
                          models=("resnet_lite", "shufflenet_lite"),
                          scans=DEFAULT_SCANS, label_col: str = "label",
                          target_frac: float = 0.95) -> pd.DataFrame:
    """Figs 7/9/10/11/27/28 as a table: final accuracy + simulated
    time-to-target per scan group and model.

    Target = ``target_frac`` x the scan-10 final accuracy of that model.
    """
    rows = []
    for model in models:
        data = load_scan_data(spark, dataset, sf, scans, label_col, model)
        curves = accuracy_curves(data)
        spe = seconds_per_epoch(spark, dataset, sf, model)
        target = target_frac * curves[10][-1]
        for g in scans:
            accs = curves[g]
            tta = None
            for e, a in enumerate(accs):
                if a >= target:
                    tta = (e + 1) * spe[g]
                    break
            rows.append(
                {
                    "dataset": dataset,
                    "model": model,
                    "scan": g,
                    "final_acc": accs[-1],
                    "epoch_s": spe[g],
                    "total_time_s": EPOCHS * spe[g],
                    "time_to_target_s": tta,
                }
            )
    return pd.DataFrame(rows)


def fig6_gradient_similarity(spark: SparkSession, dataset: str = "ham_lite",
                             sf: float = 1.0, scans=DEFAULT_SCANS,
                             checkpoints=(5, 15, 25, 35),
                             model: str = "resnet_lite",
                             probe_size: int = 2560, seed: int = 0) -> pd.DataFrame:
    """Fig 6: gradient cosine similarity per scan across training.

    Trains on full fidelity; at each checkpoint epoch the model is
    frozen and each scan group's gradient is scored against scan 10's.
    """
    data = load_scan_data(spark, dataset, sf, scans, model=model)
    m = SoftmaxModel(data.X_by_scan[10].shape[1], data.n_classes, seed=seed)
    rng = np.random.default_rng(seed)
    rows = []

    def probe(model_, epoch):
        if epoch + 1 in checkpoints:
            idx = rng.choice(len(data.y), size=min(probe_size, len(data.y)),
                             replace=False)
            sims = similarity_by_scan(
                model_, {g: X[idx] for g, X in data.X_by_scan.items()},
                data.y[idx],
            )
            rows.append({"epoch": epoch + 1,
                         **{f"scan_{g}": s for g, s in sims.items()}})

    train_sgd(m, data.X_by_scan[10], data.y, epochs=max(checkpoints), lr=LR,
              lr_drops=LR_DROPS, seed=seed, eval_fn=probe)
    return pd.DataFrame(rows)


def fig14_autotune(spark: SparkSession, dataset: str = "imagenet_lite",
                   sf: float = 1.0, model: str = "resnet_lite",
                   threshold: float = 0.8, epochs: int = EPOCHS,
                   tune_every: int = 10, seed: int = 0) -> pd.DataFrame:
    """Fig 14/26: autotuned training vs static scan 5 / scan 10 / TFRecord.

    Reports final accuracy and total simulated time; the autotuner's
    per-epoch scan choice prices each epoch at that scan's I/O time.
    """
    data = load_scan_data(spark, dataset, sf, DEFAULT_SCANS, model=model)
    spe = seconds_per_epoch(spark, dataset, sf, model)
    res = autotune_train(
        data.X_by_scan, data.y, data.Xte_by_scan[10], data.yte,
        data.n_classes, epochs=epochs, threshold=threshold,
        warmup_epochs=5, tune_every=tune_every, seed=seed, lr=LR,
        lr_drops=LR_DROPS,
    )
    rows = [
        {
            "config": f"autotune(thr={threshold})",
            "final_acc": res.acc_per_epoch[-1],
            "total_time_s": sum(spe[g] for g in res.scan_per_epoch),
            "scans_used": "->".join(
                str(g) for g in dict.fromkeys(res.scan_per_epoch)
            ),
        }
    ]
    for g in (5, 10):
        accs = static_train(
            data.X_by_scan[g], data.y, data.Xte_by_scan[g], data.yte,
            data.n_classes, epochs=epochs, lr=LR, lr_drops=LR_DROPS, seed=seed,
        )
        rows.append(
            {
                "config": f"static scan {g}",
                "final_acc": accs[-1],
                "total_time_s": epochs * spe[g],
                "scans_used": str(g),
            }
        )
    # TFRecord baseline: scan-10 accuracy at baseline mean size.
    out = harness.get_or_build(spark, dataset, sf)
    meta = read_metadata(spark, out)
    stats = scan_size_stats(meta).iloc[0]
    W = harness.reference_bandwidth(meta)
    tf_epoch = epoch_time(
        n_images(SPECS[dataset], sf), W,
        float(stats["mean_baseline"]) + 24, harness.cluster_rate(model),
    )
    rows.append(
        {
            "config": "tfrecord",
            "final_acc": rows[2]["final_acc"],
            "total_time_s": epochs * tf_epoch,
            "scans_used": "baseline",
        }
    )
    return pd.DataFrame(rows)


def fig16_bandwidth_sweep(spark: SparkSession, dataset: str = "imagenet_lite",
                          sf: float = 1.0,
                          models=("resnet_lite", "shufflenet_lite"),
                          bandwidth_fracs=(0.05, 0.125, 0.25, 0.5, 1.25),
                          scans=DEFAULT_SCANS,
                          target_frac: float = 0.95) -> pd.DataFrame:
    """Fig 16: time-to-target accuracy across cluster bandwidths.

    Bandwidths are expressed as fractions of the Figure-5 reference
    bandwidth (the paper sweeps 20..500 MiB/s around its ~400 MiB/s
    cluster; same relative range).
    """
    out = harness.get_or_build(spark, dataset, sf)
    meta = read_metadata(spark, out)
    W_ref = harness.reference_bandwidth(meta)
    rows = []
    for model in models:
        data = load_scan_data(spark, dataset, sf, scans, model=model)
        curves = accuracy_curves(data)
        target = target_frac * curves[10][-1]
        for frac in bandwidth_fracs:
            W = frac * W_ref
            spe = seconds_per_epoch(spark, dataset, sf, model, bandwidth=W)
            for g in scans:
                tta = None
                for e, a in enumerate(curves[g]):
                    if a >= target:
                        tta = (e + 1) * spe[g]
                        break
                rows.append(
                    {
                        "model": model,
                        "bandwidth_MiB_s": W / MiB,
                        "scan": g,
                        "time_to_target_s": tta,
                        "final_acc": curves[g][-1],
                    }
                )
    return pd.DataFrame(rows)
