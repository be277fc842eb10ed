"""Distributed gradient computation over a Spark feature DataFrame.

The data-parallel step of the paper's training (each worker computes
gradients over its shard; synchronization averages them): executors
compute per-partition gradient sums via ``mapInPandas``, the driver
combines. Tests assert bit-level agreement with the single-node
gradient, the property that makes distributed SGD equivalent.
"""
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.train.model import SoftmaxModel, softmax


def distributed_gradient(feat_df: DataFrame, model: SoftmaxModel,
                         feature_mask: np.ndarray | None = None,
                         label_col: str = "label") -> tuple[np.ndarray, np.ndarray]:
    """Exact (dW, db) of mean cross-entropy + L2 over all rows of ``feat_df``.

    ``feat_df`` needs ``features`` (array<double>) and the label column.
    Per-partition *sums* are computed in executors; the driver divides
    by the global count and adds the L2 term, so the result equals the
    single-node ``model.gradient`` on the concatenated data.
    """
    spark = feat_df.sparkSession
    W_b = spark.sparkContext.broadcast(model.W)
    b_b = spark.sparkContext.broadcast(model.b)
    mask_b = spark.sparkContext.broadcast(feature_mask)
    n_f, n_c = model.W.shape

    def part(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        gW = np.zeros((n_f, n_c))
        gb = np.zeros(n_c)
        count = 0
        for b in batches:
            if len(b) == 0:
                continue
            X = np.stack(b["features"].to_numpy())
            if mask_b.value is not None:
                X = X[:, mask_b.value]
            y = b[label_col].to_numpy().astype(np.int64)
            p = softmax(X @ W_b.value + b_b.value)
            p[np.arange(len(y)), y] -= 1.0
            gW += X.T @ p
            gb += p.sum(axis=0)
            count += len(y)
        yield pd.DataFrame(
            {"grad": [np.concatenate([gW.reshape(-1), gb]).tolist()],
             "count": [count]}
        )

    parts = feat_df.select("features", label_col).mapInPandas(
        part, schema="grad array<double>, count long"
    ).collect()
    total = sum(r["count"] for r in parts)
    g = np.sum([np.array(r["grad"]) for r in parts], axis=0) / max(total, 1)
    gW = g[: n_f * n_c].reshape(n_f, n_c) + model.l2 * model.W
    gb = g[n_f * n_c :]
    return gW, gb
