"""Analysis over PCR metadata: Table 1 ratios, Fig 8 sizes, speedups.

All aggregations run through Spark SQL over the metadata sidecar (and
are oracle-checked against DuckDB in tests). ``cumulative_bytes(g)``
counts header + scans 1..g per image — the exact bytes the PCR loader
reads for that image at fidelity g.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.jpeg import N_SCANS


def with_cumulative(meta: DataFrame) -> DataFrame:
    """Add ``cum_g_bytes`` columns: bytes read per image at fidelity g."""
    out = meta
    expr = F.col("header_bytes")
    for g in range(1, N_SCANS + 1):
        expr = expr + F.col(f"scan_{g}_bytes")
        out = out.withColumn(f"cum_{g}_bytes", expr)
    return out


def scan_size_stats(meta: DataFrame) -> pd.DataFrame:
    """Mean per-image bytes at each fidelity + full/baseline means (Fig 8)."""
    cum = with_cumulative(meta)
    aggs = [F.avg(f"cum_{g}_bytes").alias(f"mean_cum_{g}") for g in range(1, N_SCANS + 1)]
    aggs += [
        F.avg("baseline_bytes").alias("mean_baseline"),
        F.avg("progressive_bytes").alias("mean_progressive"),
        F.count("*").alias("n_images"),
    ]
    return cum.agg(*aggs).toPandas()


def size_reduction_table(meta: DataFrame, scans=(1, 2, 5, 10)) -> dict:
    """One Table-1 row: reduction factor per scan + mean image size.

    Reduction factor for scan g = mean full-fidelity bytes / mean bytes
    read at fidelity g (so scan 10 is 1x by construction).
    """
    stats = scan_size_stats(meta).iloc[0]
    full = stats[f"mean_cum_{N_SCANS}"]
    row = {
        f"scan_{g}": float(full / stats[f"mean_cum_{g}"]) for g in scans
    }
    row["mean_size_bytes"] = float(full)
    return row


def speedup_table(meta: DataFrame, compute_rate: float, bandwidth: float,
                  scans=tuple(range(1, N_SCANS + 1))) -> pd.DataFrame:
    """Predicted throughput per scan group (Fig 5 'Predicted' series).

    Applies Lemma A.2/A.4: X_g = min(compute_rate, W / E[s(x, g)]).
    """
    stats = scan_size_stats(meta).iloc[0]
    rows = []
    for g in scans:
        mean_bytes = stats[f"mean_cum_{g}"]
        xg = bandwidth / mean_bytes
        rows.append(
            {
                "scan": g,
                "mean_bytes": float(mean_bytes),
                "data_rate": float(xg),
                "predicted_rate": float(min(compute_rate, xg)),
            }
        )
    return pd.DataFrame(rows)


def scan_size_distribution(meta: DataFrame) -> pd.DataFrame:
    """Per-scan cumulative size quartiles (the Fig 8 interquartile view)."""
    cum = with_cumulative(meta)
    rows = []
    for g in range(1, N_SCANS + 1):
        q = cum.select(
            F.percentile_approx(f"cum_{g}_bytes", [0.25, 0.5, 0.75]).alias("q")
        ).collect()[0]["q"]
        rows.append({"scan": g, "p25": q[0], "p50": q[1], "p75": q[2]})
    return pd.DataFrame(rows)
