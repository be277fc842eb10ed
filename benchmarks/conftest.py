"""Benchmark fixtures: one small PCR dataset shared across benchmarks.

``REPRO_BENCH_SF`` scales the benchmark dataset (default 0.5).
"""
import os

import pytest


@pytest.fixture(scope="session")
def bench_sf() -> float:
    return float(os.environ.get("REPRO_BENCH_SF", "0.5"))


@pytest.fixture(scope="session")
def bench_dir(spark, tmp_path_factory, bench_sf):
    from repro.core.dataset import build_pcr_dataset

    out = str(tmp_path_factory.mktemp("bench") / "celeba_lite")
    build_pcr_dataset(spark, "celeba_lite", out, sf=bench_sf)
    return out


@pytest.fixture(scope="session")
def bench_meta(spark, bench_dir):
    from repro.core.dataset import read_metadata

    return read_metadata(spark, bench_dir).cache()
