"""Tests for the analysis module (Table 1 / Fig 5 / Fig 8 machinery)."""
import pytest
from pyspark.sql import functions as F

from repro.core.analysis import (
    scan_size_distribution,
    scan_size_stats,
    size_reduction_table,
    speedup_table,
    with_cumulative,
)
from repro.core.dataset import read_metadata
from repro.iosim.storage import MiB
from repro.jpeg import N_SCANS
from repro.oracle import assert_equivalent


def test_cumulative_columns_monotone(spark, celeba_dir):
    cum = with_cumulative(read_metadata(spark, celeba_dir))
    bad = cum.filter(
        " OR ".join(
            f"cum_{g}_bytes > cum_{g + 1}_bytes" for g in range(1, N_SCANS)
        )
    )
    assert bad.count() == 0


def test_cumulative_oracle(spark, celeba_dir):
    meta = read_metadata(spark, celeba_dir)
    cum = with_cumulative(meta).select("record", "pos", "cum_3_bytes")
    scans = " + ".join(f"scan_{g}_bytes" for g in range(1, 4))
    assert_equivalent(
        cum,
        f"SELECT record, pos, header_bytes + {scans} AS cum_3_bytes FROM meta",
        meta=meta,
    )


def test_full_cumulative_accounts_whole_progressive_file(spark, celeba_dir):
    # header + all scans + EOI marker == progressive file size.
    cum = with_cumulative(read_metadata(spark, celeba_dir))
    bad = cum.filter(
        F.col(f"cum_{N_SCANS}_bytes") + 2 != F.col("progressive_bytes")
    )
    assert bad.count() == 0


def test_size_reduction_table_shape(spark, celeba_dir):
    row = size_reduction_table(read_metadata(spark, celeba_dir))
    assert row["scan_10"] == pytest.approx(1.0)
    assert row["scan_1"] > row["scan_2"] > row["scan_5"] > 1.0
    assert row["mean_size_bytes"] > 0


def test_scan_size_stats_oracle(spark, celeba_dir):
    meta = read_metadata(spark, celeba_dir)
    got = with_cumulative(meta).agg(
        F.avg("cum_1_bytes").alias("m1"), F.avg("baseline_bytes").alias("mb")
    )
    assert_equivalent(
        got,
        "SELECT avg(header_bytes + scan_1_bytes) AS m1, avg(baseline_bytes) AS mb FROM meta",
        meta=meta,
    )


def test_speedup_table_min_rule(spark, celeba_dir):
    meta = read_metadata(spark, celeba_dir)
    t = speedup_table(meta, compute_rate=450.0, bandwidth=1 * MiB)
    assert (t["predicted_rate"] <= 450.0 + 1e-9).all()
    # Lower scans -> higher predicted rate while IO bound.
    assert t.sort_values("scan")["predicted_rate"].is_monotonic_decreasing


def test_speedup_table_compute_bound_saturates(spark, celeba_dir):
    meta = read_metadata(spark, celeba_dir)
    t = speedup_table(meta, compute_rate=450.0, bandwidth=10_000 * MiB)
    assert t["predicted_rate"].to_numpy() == pytest.approx(450.0)


def test_scan_size_distribution_monotone_medians(spark, celeba_dir):
    d = scan_size_distribution(read_metadata(spark, celeba_dir))
    med = d.sort_values("scan")["p50"].to_numpy()
    assert (med[1:] >= med[:-1]).all()
    assert (d["p25"] <= d["p75"]).all()


def test_stats_single_row(spark, celeba_dir):
    s = scan_size_stats(read_metadata(spark, celeba_dir))
    assert len(s) == 1
    assert s.iloc[0]["n_images"] > 0
