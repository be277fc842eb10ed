"""Shared fixtures: a small PCR dataset built once per test session."""
import pytest


@pytest.fixture(scope="session")
def celeba_dir(spark, tmp_path_factory):
    """celeba_lite at sf=0.25 (72 images, 2 records) encoded to PCR+TFRecord."""
    from repro.core.dataset import build_pcr_dataset

    out = str(tmp_path_factory.mktemp("data") / "celeba_lite")
    build_pcr_dataset(spark, "celeba_lite", out, sf=0.25)
    return out


@pytest.fixture(scope="session")
def cars_dir(spark, tmp_path_factory):
    """cars_lite at full scale (240 images) — the fine-grained 20-class
    task needs the full per-class sample count to show scan sensitivity."""
    from repro.core.dataset import build_pcr_dataset

    out = str(tmp_path_factory.mktemp("data") / "cars_lite")
    build_pcr_dataset(spark, "cars_lite", out, sf=1.0)
    return out
