"""Benchmarks for Figs 7/14: feature loading, SGD epochs, Spark gradient."""
import numpy as np

from repro.core.dataset import collect_features, features_to_arrays, load_features
from repro.train.model import SoftmaxModel, standardize, train_sgd
from repro.train.spark_train import distributed_gradient


def test_bench_load_features_scan5(benchmark, spark, bench_dir):
    def run():
        return collect_features(spark, bench_dir, 5)

    pdf = benchmark.pedantic(run, rounds=3, iterations=1)
    assert len(pdf) > 0


def test_bench_train_sgd(benchmark, spark, bench_dir):
    pdf = collect_features(spark, bench_dir, 5)
    Xtr, ytr, Xte, yte = features_to_arrays(pdf)
    Xtr, mu, sd = standardize(Xtr)

    def run():
        m = SoftmaxModel(Xtr.shape[1], 2, seed=0)
        train_sgd(m, Xtr, ytr, epochs=10, lr=0.3)
        return m

    m = benchmark(run)
    assert m.accuracy(Xtr, ytr) > 0.5


def test_bench_distributed_gradient(benchmark, spark, bench_dir):
    feats = load_features(spark, bench_dir, 5).cache()
    feats.count()
    m = SoftmaxModel(len(feats.first()["features"]), 2, seed=0)

    def run():
        return distributed_gradient(feats, m)

    dW, db = benchmark.pedantic(run, rounds=3, iterations=1)
    assert np.isfinite(dW).all()
